package repro.mr

import org.apache.spark.sql.Dataset
import repro.core.{GMM, Points, RadiusSearch, WeightedPoint}
import repro.data.DataPoint

/** 2-round MapReduce algorithms for k-center with z outliers (Sec. 3.2 and
  * 3.2.1).
  *
  * Round 1: partition S into ℓ subsets; on each, GMM builds a coreset T_i
  * (size τ = μ(k+z) deterministic / τ = μ(k+6z/ℓ) randomized in the
  * experiments, or the ε̂-stopping rule with base k+z resp. k+z'), and every
  * coreset point gets the *weight* of the input points it proxies.
  *
  * Round 2: the single reducer (driver) gathers T = ∪T_i and runs the
  * (1+δ)-tolerant radius search driving OUTLIERSCLUSTER (core.RadiusSearch).
  * (3+ε)-approximate (Theorem 2 / Corollary 3); deterministic μ = 1
  * reproduces MalkomesEtAl [26].
  */
object MROutliers {

  sealed trait CoresetSpec
  /** Fixed per-partition coreset size τ (experiments). */
  final case class FixedSize(tau: Int) extends CoresetSpec
  /** ε̂-stopping rule with base kBase = k+z (det.) or k+z' (randomized). */
  final case class Precision(hatEps: Double, kBase: Int) extends CoresetSpec

  final case class Result(
      centers: Array[Array[Double]],
      searchRadius: Double,
      coresetUnionSize: Int,
      round1Millis: Long,
      round2Millis: Long,
  )

  /** Round-1 kernel: weighted GMM coreset of one partition (public so tests
    * can probe round 1 in isolation).
    */
  def weightedPartitionCoreset(points: Array[Array[Double]], spec: CoresetSpec,
                                           seed: Long): Array[WeightedPoint] = {
    if (points.isEmpty) return Array.empty
    val firstIdx = math.floorMod(seed, points.length.toLong).toInt
    val trace = spec match {
      case FixedSize(tau)          => GMM.coresetBySize(points, tau, firstIdx)
      case Precision(hatEps, base) => GMM.coresetByEpsilon(points, base, hatEps, firstIdx)
    }
    GMM.weigh(points, trace.centers)
  }

  /** The generic 2-round run: caller picks partitioning and coreset spec. */
  def run(ds: Dataset[DataPoint], k: Int, z: Int, ell: Int, spec: CoresetSpec,
          partitioning: Partitioning, hatEps: Double = 0.05, seed: Long = 42L): Result = {
    import ds.sparkSession.implicits._
    val t0 = System.nanoTime()
    val union: Array[WeightedPoint] = partitioning(ds, ell, seed)
      .mapPartitions { it =>
        val pts = it.map(_.vec).toArray
        weightedPartitionCoreset(pts, spec, seed).iterator
      }
      .collect()
    require(union.nonEmpty, "empty input dataset")
    val t1 = System.nanoTime()
    val sr = RadiusSearch.search(union, k, z.toLong, hatEps, seed)
    val t2 = System.nanoTime()
    Result(sr.clustering.centers, sr.radius, union.length,
           (t1 - t0) / 1000000, (t2 - t1) / 1000000)
  }

  /** Deterministic algorithm (Sec. 3.2), experiment parametrization:
    * per-partition coreset size τ = μ(k+z).
    */
  def runDeterministic(ds: Dataset[DataPoint], k: Int, z: Int, ell: Int, mu: Int,
                       partitioning: Partitioning = Partitioning.Arbitrary,
                       hatEps: Double = 0.05, seed: Long = 42L): Result =
    run(ds, k, z, ell, FixedSize(mu * (k + z)), partitioning, hatEps, seed)

  /** Randomized algorithm (Sec. 3.2.1), experiment parametrization: random
    * partitioning and τ = μ(k + 6z/ℓ) — Lemma 7's bound on outliers per
    * partition (log factor dropped, as in the paper's experiments).
    */
  def runRandomized(ds: Dataset[DataPoint], k: Int, z: Int, ell: Int, mu: Int,
                    hatEps: Double = 0.05, seed: Long = 42L): Result = {
    val tau = mu * (k + (6 * z + ell - 1) / ell)
    run(ds, k, z, ell, FixedSize(tau), Partitioning.Random, hatEps, seed)
  }

  /** Objective value r_{T,Z_T}(S): max distance to centers after discarding
    * the z farthest points — evaluated distributively.
    */
  def radiusWithOutliers(ds: Dataset[DataPoint], centers: Array[Array[Double]], z: Int): Double = {
    val bc = ds.sparkSession.sparkContext.broadcast(centers)
    val top = ds.rdd.map(p => Points.sqDistToSet(p.vec, bc.value)).top(z + 1)
    if (top.isEmpty) 0.0 else math.sqrt(top.min)
  }
}
