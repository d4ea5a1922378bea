package repro.core

/** Brute-force exact k-center (with and without outliers) for tiny inputs.
  *
  * Only used as test ground truth: the paper estimates approximation ratios
  * against the best radius ever found (the problems are NP-hard), but on
  * ≤ ~15 points we can afford the exact optimum r*_k(S) / r*_{k,z}(S) to
  * verify the theoretical guarantees (2-approx for GMM, 3-approx for
  * CharikarEtAl, Lemma 5, …).
  */
object ExactKCenter {

  private def combinations(n: Int, k: Int): Iterator[Array[Int]] =
    (0 until n).combinations(k).map(_.toArray)

  /** Optimal radius r*_k(S). Cost: C(n,k)·n·k — keep n tiny. */
  def optimalRadius(points: Array[Array[Double]], k: Int): Double = {
    require(points.nonEmpty && k >= 1)
    if (k >= points.length) return 0.0
    combinations(points.length, k).map { idx =>
      val centers = idx.map(points)
      Points.radius(points, centers)
    }.min
  }

  /** Optimal radius r*_{k,z}(S) for the formulation with z outliers. */
  def optimalRadiusWithOutliers(points: Array[Array[Double]], k: Int, z: Int): Double = {
    require(points.nonEmpty && k >= 1 && z >= 0)
    if (k + z >= points.length) return 0.0
    combinations(points.length, k).map { idx =>
      val centers = idx.map(points)
      Points.radiusWithOutliers(points, centers, z)
    }.min
  }
}
