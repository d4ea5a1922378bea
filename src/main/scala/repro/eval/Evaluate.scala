package repro.eval

import org.apache.spark.sql.Dataset
import repro.core.Points
import repro.data.DataPoint

/** Shared measurement helpers for the experiment harness: radius objectives
  * (local and distributed), wall-clock timing, and the paper's empirical
  * approximation-ratio convention (radius / best radius ever found for the
  * same dataset and parameters — Sec. 5, "Experimental setting").
  */
object Evaluate {

  /** r_T(S) on a Spark dataset (k-center objective). */
  def radiusDS(ds: Dataset[DataPoint], centers: Array[Array[Double]]): Double = {
    require(centers.nonEmpty)
    val bc = ds.sparkSession.sparkContext.broadcast(centers)
    math.sqrt(ds.rdd.map(p => Points.sqDistToSet(p.vec, bc.value)).max())
  }

  /** r_{T,Z_T}(S) on a Spark dataset (z farthest points discarded). */
  def radiusWithOutliersDS(ds: Dataset[DataPoint], centers: Array[Array[Double]], z: Int): Double = {
    require(centers.nonEmpty)
    val bc = ds.sparkSession.sparkContext.broadcast(centers)
    val top = ds.rdd.map(p => Points.sqDistToSet(p.vec, bc.value)).top(z + 1)
    if (top.isEmpty) 0.0 else math.sqrt(top.min)
  }

  /** Local r_T(S). */
  def radiusLocal(points: Array[Array[Double]], centers: Array[Array[Double]]): Double =
    Points.radius(points, centers)

  /** Local r_{T,Z_T}(S). */
  def radiusWithOutliersLocal(points: Array[Array[Double]], centers: Array[Array[Double]], z: Int): Double =
    Points.radiusWithOutliers(points, centers, z)

  /** Wall-clock a thunk: (result, elapsed millis). */
  def timed[T](f: => T): (T, Long) = {
    val t0 = System.nanoTime()
    val r = f
    (r, (System.nanoTime() - t0) / 1000000)
  }

  /** Best (smallest) radius observed per key — the denominator of the
    * paper's empirical approximation ratio ("the best radius ever found
    * across all experiments with the same dataset and parameter
    * configuration", Sec. 5).
    */
  def bestByKey(radiiByKey: Seq[(String, Double)]): Map[String, Double] =
    radiiByKey.groupMapReduce(_._1)(_._2)(math.min)
}
