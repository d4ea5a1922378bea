package repro.core

import scala.util.Random

/** Second-round radius search (Sec. 3.2): estimate the minimum r such that
  * OUTLIERSCLUSTER(T, k, r, ε̂) leaves uncovered weight ≤ z, within
  * multiplicative tolerance (1+δ), δ = ε̂/(3+4ε̂).
  *
  * The paper binary-searches the O(|T|²) pairwise distances combined with a
  * (1+δ)-geometric search, using streaming median-finding to avoid storing
  * the distances. We keep the same probe structure but bound memory by
  * binary-searching a uniform *sample* of pairwise distances and then
  * refining geometrically inside the bracketing gap — the returned radius is
  * still within (1+δ) of the smallest feasible one, which is all Theorem 2's
  * proof uses (deviation documented in DESIGN.md §4).
  */
object RadiusSearch {

  /** Cap on sampled candidate distances; 2·10⁵ doubles is ~1.6 MB. */
  private val MaxCandidates = 200_000

  final case class SearchResult(
      radius: Double,
      clustering: OutliersCluster.Result,
      probes: Int,
  )

  /** Sorted distinct candidate radii: all pairwise distances when |T| is
    * small, else a uniform random sample of pairs.
    */
  private[core] def candidateDistances(vecs: Array[Array[Double]], seed: Long): Array[Double] = {
    val n = vecs.length
    val nPairs = n.toLong * (n - 1) / 2
    val ds =
      if (nPairs <= MaxCandidates) {
        val buf = new Array[Double](nPairs.toInt)
        var p = 0
        var i = 0
        while (i < n) {
          var j = i + 1
          while (j < n) { buf(p) = Points.dist(vecs(i), vecs(j)); p += 1; j += 1 }
          i += 1
        }
        buf
      } else {
        val rnd = new Random(seed)
        Array.fill(MaxCandidates) {
          var i = rnd.nextInt(n)
          var j = rnd.nextInt(n)
          while (j == i) { j = rnd.nextInt(n); i = rnd.nextInt(n) }
          Points.dist(vecs(i), vecs(j))
        }
      }
    val sorted = ds.distinct.sorted
    if (sorted.isEmpty) Array(0.0) else sorted
  }

  /** Find r̃_min and return the clustering OUTLIERSCLUSTER(T, k, r̃_min, ε̂). */
  def search(t: Array[WeightedPoint], k: Int, z: Long, hatEps: Double, seed: Long = 42L): SearchResult = {
    require(t.nonEmpty, "radius search needs a non-empty coreset")
    var probes = 0
    def feasible(r: Double): Option[OutliersCluster.Result] = {
      probes += 1
      val res = OutliersCluster.run(t, k, r, hatEps)
      if (res.uncoveredWeight <= z) Some(res) else None
    }

    feasible(0.0) match {
      case Some(res0) => return SearchResult(0.0, res0, probes)
      case None       => ()
    }

    val cand = candidateDistances(t.map(_.vec), seed)
    // Binary search the smallest feasible candidate. Feasibility is treated
    // as monotone in r (standard for this greedy; the geometric refinement
    // below re-verifies the returned radius).
    var lo = 0
    var hi = cand.length - 1
    var best: OutliersCluster.Result = null
    var bestR = cand(hi)
    while (lo <= hi) {
      val mid = (lo + hi) >>> 1
      feasible(cand(mid)) match {
        case Some(res) => best = res; bestR = cand(mid); hi = mid - 1
        case None      => lo = mid + 1
      }
    }
    if (best == null) {
      // The max sampled distance was infeasible (possible when candidates are
      // sampled); grow geometrically until feasible.
      var r = cand.last
      var res: Option[OutliersCluster.Result] = None
      while (res.isEmpty) { r *= 2.0; res = feasible(r) }
      best = res.get; bestR = r
    }

    // Geometric refinement inside the bracketing gap (floor, bestR]: bisect
    // in log-space until bestR is within (1+δ) of the infeasible floor, so
    // the returned radius is a (1+δ)-approximation of the minimal feasible
    // one even when sampled candidates leave a wide gap.
    val delta = if (hatEps > 0) hatEps / (3.0 + 4.0 * hatEps) else 0.01
    val floor = if (lo > 0 && lo - 1 < cand.length) cand(math.max(0, lo - 1)) else 0.0
    var loR = if (floor > 0) floor else bestR * 1e-9
    var steps = 0
    while (bestR / loR > 1.0 + delta && steps < 100) {
      val mid = math.sqrt(loR * bestR)
      feasible(mid) match {
        case Some(res) => best = res; bestR = mid
        case None      => loR = mid
      }
      steps += 1
    }
    SearchResult(bestR, best, probes)
  }
}
