package repro.streaming

import repro.core.Points
import scala.collection.mutable.ArrayBuffer

/** BASESTREAM: the (2+ε)-approximation Streaming k-center baseline of
  * McCutchen & Khuller [27] (Fig. 3), rebuilt from the algorithmic idea
  * (DESIGN.md §4): m parallel instances with geometrically staggered radius
  * guesses covering a factor-2 range, r_j = r0·2^{j/m}.
  *
  * Each instance keeps ≤ k centers for its guess r: a point farther than 2r
  * from all centers becomes a center; an overflow (k+1 centers) falsifies the
  * guess — the instance restarts at guess 2r, re-inserting its old centers
  * (the standard doubling restart, which preserves coverage 2r_old + 2r_new).
  * The answer is the alive instance with the smallest guess; its radius is
  * ≤ 2(1+ε)·r*_k with (1+ε) = 2^{1/m}. Space: m·k centers, matching the
  * m·k space accounting of Fig. 3.
  */
final class BaseStream(k: Int, m: Int) {
  require(k >= 1 && m >= 1)
  val space: Int = m * k

  private final class Instance(var r: Double) {
    val centers = new ArrayBuffer[Array[Double]](k + 1)
    def insert(p: Array[Double]): Unit = {
      val twoRSq = { val d = 2.0 * r; d * d }
      if (centers.isEmpty || Points.sqDistToSet(p, centers.toArray) > twoRSq) {
        centers += p
        if (centers.length > k) { // guess falsified: double and re-insert
          val old = centers.toArray
          centers.clear()
          r *= 2.0
          old.foreach(insert)
        }
      }
    }
  }

  private val initBuf = new ArrayBuffer[Array[Double]](k + 1)
  private var instances: Array[Instance] = _
  private var processed = 0L

  def pointsProcessed: Long = processed

  def update(p: Array[Double]): Unit = {
    processed += 1
    if (instances == null) {
      initBuf += p
      if (initBuf.length == k + 1) {
        // r0 = half the min pairwise distance of the first k+1 points: a
        // valid lower bound on r*_k (two of them share an optimal center).
        var minD = Double.MaxValue
        for (i <- initBuf.indices; j <- (i + 1) until initBuf.length) {
          val d = Points.dist(initBuf(i), initBuf(j))
          if (d < minD && d > 0) minD = d
        }
        if (minD == Double.MaxValue) minD = 1e-12 // all-duplicate prefix
        val r0 = minD / 2.0
        instances = Array.tabulate(m)(j => new Instance(r0 * math.pow(2.0, j.toDouble / m)))
        initBuf.foreach(q => instances.foreach(_.insert(q)))
      }
      return
    }
    var j = 0
    while (j < m) { instances(j).insert(p); j += 1 }
  }

  /** Centers of the instance with the smallest surviving guess. */
  def result(): Array[Array[Double]] = {
    if (instances == null) return initBuf.toArray
    instances.minBy(_.r).centers.toArray
  }
}
