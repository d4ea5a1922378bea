package repro.core

/** Metric-space kernels shared by every algorithm in the reproduction.
  *
  * Points are dense `Array[Double]` vectors under the Euclidean distance, as
  * in the paper's experiments (Higgs/Power are 7-dimensional, Wiki is
  * 50-dimensional). All inner loops work on squared distances to avoid
  * `sqrt` until a radius is actually reported.
  */
object Points {

  /** Squared Euclidean distance between two equal-length vectors. */
  def sqDist(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0
    var i = 0
    val n = a.length
    while (i < n) { val d = a(i) - b(i); s += d * d; i += 1 }
    s
  }

  /** Euclidean distance between two equal-length vectors. */
  def dist(a: Array[Double], b: Array[Double]): Double = math.sqrt(sqDist(a, b))

  /** Distance from a point to a finite set of centers: d(s, X) = min_x d(s,x). */
  def distToSet(p: Array[Double], centers: Array[Array[Double]]): Double =
    math.sqrt(sqDistToSet(p, centers))

  /** Squared distance from a point to its closest center. */
  def sqDistToSet(p: Array[Double], centers: Array[Array[Double]]): Double = {
    var best = Double.MaxValue
    var i = 0
    while (i < centers.length) {
      val d = sqDist(p, centers(i))
      if (d < best) best = d
      i += 1
    }
    best
  }

  /** Index of the closest center to `p` (first on ties); -1 on empty set. */
  def closestIndex(p: Array[Double], centers: Array[Array[Double]]): Int = {
    var best = Double.MaxValue
    var bi   = -1
    var i = 0
    while (i < centers.length) {
      val d = sqDist(p, centers(i))
      if (d < best) { best = d; bi = i }
      i += 1
    }
    bi
  }

  /** Radius of `points` w.r.t. centers `t`: r_T(S) = max_s d(s, T). */
  def radius(points: IterableOnce[Array[Double]], t: Array[Array[Double]]): Double = {
    var worst = 0.0
    val it = points.iterator
    while (it.hasNext) {
      val d = sqDistToSet(it.next(), t)
      if (d > worst) worst = d
    }
    math.sqrt(worst)
  }

  /** Radius of `points` w.r.t. `t` after discarding the `z` farthest points
    * (the objective r_{T,Z_T}(S) of the k-center problem with z outliers).
    */
  def radiusWithOutliers(points: Iterable[Array[Double]], t: Array[Array[Double]], z: Int): Double = {
    // Keep the z+1 largest squared distances in a min-heap; the smallest of
    // those survivors is the radius once the z largest are discarded.
    val heap = new java.util.PriorityQueue[java.lang.Double](math.max(1, z + 1))
    val it = points.iterator
    while (it.hasNext) {
      val d = sqDistToSet(it.next(), t)
      if (heap.size < z + 1) heap.add(d)
      else if (d > heap.peek()) { heap.poll(); heap.add(d) }
    }
    if (heap.isEmpty) 0.0 else math.sqrt(heap.peek())
  }
}

/** A coreset point: the vector plus the number of input points it proxies.
  * Weight 1 coresets degenerate to plain point sets (k-center without
  * outliers never reads the weight).
  */
final case class WeightedPoint(vec: Array[Double], weight: Long) extends Serializable
