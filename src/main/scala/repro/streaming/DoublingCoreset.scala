package repro.streaming

import repro.core.{Points, WeightedPoint}
import scala.collection.mutable.ArrayBuffer

/** Weighted variant of the doubling algorithm of Charikar et al. [15]
  * (Sec. 4): a 1-pass construction of a τ-point weighted coreset.
  *
  * State: a weighted center set T (|T| ≤ τ) and a lower bound φ ≤ r*_τ(S),
  * maintaining the paper's invariants
  *  (a) |T| ≤ τ,
  *  (b) every two centers are > 4φ apart,
  *  (c) every processed point is within 8φ of its (implicit) proxy,
  *  (d) w_t counts the points whose proxy is t,
  *  (e) φ ≤ r*_τ(S).
  *
  * Initialization buffers the first τ+1 points (weight 1 each), sets φ to
  * half their minimum pairwise distance, then applies the merge rule until
  * invariants (a)–(b) hold — exactly as prescribed in the paper.
  *
  * Update rule: a point within 8φ of T increments its closest center's
  * weight; a farther point becomes a new center (weight 1), and if |T| = τ+1
  * the merge rule (φ ← 2φ; greedily merge centers ≤ 4φ apart, summing
  * weights) repeats until |T| ≤ τ.
  *
  * When `weighted = false` (the k-center-without-outliers use, where weights
  * are never read) the update rule early-exits on the first center within
  * 8φ instead of finding the closest — same center set, ~2× throughput.
  */
final class DoublingCoreset(tau: Int, weighted: Boolean = true) {
  require(tau >= 1, s"tau must be >= 1, got $tau")

  private val init = new ArrayBuffer[Array[Double]](tau + 1)
  private var vecs = new ArrayBuffer[Array[Double]]()
  private var ws   = new ArrayBuffer[Long]()
  private var initialized = false
  private var phiV = 0.0
  private var processed = 0L

  /** Current lower bound φ (0 while still buffering the first τ+1 points). */
  def phi: Double = phiV
  def pointsProcessed: Long = processed
  def size: Int = if (initialized) vecs.length else init.length

  private def minPairwise(ps: scala.collection.IndexedSeq[Array[Double]]): Double = {
    var best = Double.MaxValue
    var i = 0
    while (i < ps.length) {
      var j = i + 1
      while (j < ps.length) {
        val d = Points.dist(ps(i), ps(j))
        if (d < best) best = d
        j += 1
      }
      i += 1
    }
    best
  }

  /** One application of the merge rule: φ ← 2φ, then greedily merge every
    * center within 4φ of an earlier surviving center (transferring weight —
    * conceptually re-pointing the proxy function).
    */
  private def mergeRule(): Unit = {
    phiV *= 2.0
    val sep = 4.0 * phiV
    val sepSq = sep * sep
    val nv = new ArrayBuffer[Array[Double]](vecs.length)
    val nw = new ArrayBuffer[Long](ws.length)
    var i = 0
    while (i < vecs.length) {
      val v = vecs(i)
      var merged = false
      var j = 0
      while (!merged && j < nv.length) {
        if (Points.sqDist(v, nv(j)) <= sepSq) { nw(j) += ws(i); merged = true }
        j += 1
      }
      if (!merged) { nv += v; nw += ws(i) }
      i += 1
    }
    vecs = nv
    ws = nw
  }

  def update(p: Array[Double]): Unit = {
    processed += 1
    if (!initialized) {
      init += p
      if (init.length == tau + 1) {
        vecs = init.clone()
        ws = ArrayBuffer.fill(init.length)(1L)
        phiV = minPairwise(init) / 2.0
        if (phiV <= 0) phiV = java.lang.Double.MIN_NORMAL // duplicate points in the prefix
        // Merge at end of initialization, before any further point.
        mergeRule()
        while (vecs.length > tau) mergeRule()
        initialized = true
      }
      return
    }
    val limSq = { val d = 8.0 * phiV; d * d }
    var best = Double.MaxValue
    var bi = -1
    var i = 0
    while (i < vecs.length && (weighted || best > limSq)) {
      val d = Points.sqDist(p, vecs(i))
      if (d < best) { best = d; bi = i }
      i += 1
    }
    if (best <= limSq) ws(bi) += 1L
    else {
      vecs += p
      ws += 1L
      while (vecs.length > tau) mergeRule()
    }
  }

  /** The weighted coreset after the pass. Streams shorter than τ+1 points
    * simply return the buffered prefix with unit weights.
    */
  def result(): Array[WeightedPoint] =
    if (initialized) vecs.indices.map(i => WeightedPoint(vecs(i), ws(i))).toArray
    else init.map(WeightedPoint(_, 1L)).toArray
}
