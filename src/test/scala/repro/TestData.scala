package repro

import scala.util.Random

/** Deterministic random instances for the unit tests. */
object TestData {

  /** n uniform points in [0, box]^dim. */
  def uniform(n: Int, dim: Int, seed: Long, box: Double = 10.0): Array[Array[Double]] = {
    val rnd = new Random(seed)
    Array.fill(n)(Array.fill(dim)(rnd.nextDouble() * box))
  }

  /** Well-separated Gaussian blobs: `c` cluster centers on a coarse grid,
    * `perCluster` points each with the given std. Returns (points, centers).
    */
  def blobs(c: Int, perCluster: Int, dim: Int, seed: Long,
            sep: Double = 100.0, std: Double = 1.0): (Array[Array[Double]], Array[Array[Double]]) = {
    val rnd = new Random(seed)
    val centers = Array.tabulate(c) { i =>
      Array.tabulate(dim)(j => (if (j == 0) i * sep else 0.0) + rnd.nextDouble())
    }
    val pts = centers.flatMap(ctr => Array.fill(perCluster)(ctr.map(_ + rnd.nextGaussian() * std)))
    (rnd.shuffle(pts.toSeq).toArray, centers)
  }

  /** Run `body` for `trials` seeds — a poor man's property test that stays
    * inside plain ScalaTest (no scalatestplus bridge offline).
    */
  def forSeeds(trials: Int, seed0: Long = 7L)(body: Long => Unit): Unit =
    (0 until trials).foreach(t => body(seed0 + t * 1315423911L))

  /** Like [[forSeeds]] but collects the per-seed results. */
  def forSeedsCollect[T](trials: Int, seed0: Long = 7L)(body: Long => T): Seq[T] =
    (0 until trials).map(t => body(seed0 + t * 1315423911L))
}
