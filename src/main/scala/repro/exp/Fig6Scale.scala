package repro.exp

import org.apache.spark.sql.SparkSession
import repro.data.Datasets
import repro.mr.MROutliers

/** Experiment of Fig. 6: scalability with input size of the randomized
  * MapReduce algorithm for k-center with z outliers — SMOTE-like inflated
  * instances h times the base size (paper: h ∈ {25,50,100} on a cluster; we
  * use h ∈ {1,4,16} on one machine, DESIGN.md §4), k = 20, z = 200, ℓ = 16,
  * coresets of size 8·(k + 6z/ℓ).
  *
  * The paper's claim — total time linear in n — holds at 10⁹-point scale
  * where round 1 dominates. At our scale the n-independent round 2 (radius
  * search on the fixed-size coreset union) is a large constant floor, so we
  * report the rounds separately: round 1 carries the n-dependence.
  */
object Fig6Scale {

  final case class Row(dataset: String, h: Int, n: Long,
                       coresetMs: Long, clusterMs: Long, totalMs: Long)

  val hs: Seq[Int] = Seq(1, 4, 16)
  val Ell = 16
  val Mu = 8

  def run(spark: SparkSession, cfg: ExpConfig): Seq[Row] = {
    val (k, z) = (cfg.kOutliers, cfg.zOutliers)
    for (spec <- cfg.specs; h <- hs) yield {
      val base = Datasets.localPoints(spec, cfg.nFor(spec), cfg.seed)
      val inflated = Datasets.inflateDS(spark, base, cfg.nFor(spec).toLong * h,
                                        cfg.seed + h, numPartitions = Ell)
      val ds = Datasets.withOutliersDS(spark, inflated, z, cfg.seed).cache()
      val n = ds.count()
      val times = for (rep <- 1 to cfg.reps) yield {
        val res = MROutliers.runRandomized(ds, k, z, Ell, Mu, seed = cfg.seed + 7L * rep)
        (res.round1Millis, res.round2Millis)
      }
      ds.unpersist()
      val c1 = times.map(_._1).sum / times.size
      val c2 = times.map(_._2).sum / times.size
      Row(spec.name, h, n, c1, c2, c1 + c2)
    }
  }

  def render(rows: Seq[Row]): String =
    Tables.render("Fig. 6 — Scalability vs input size (randomized MR, outliers)",
      Seq("dataset", "h", "n", "coreset_ms", "cluster_ms", "total_ms"),
      rows.map(r => Seq(r.dataset, r.h.toString, r.n.toString,
                        r.coresetMs.toString, r.clusterMs.toString, r.totalMs.toString)))
}
