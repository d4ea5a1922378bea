package repro.eval

import org.apache.spark.sql.DataFrame
import repro.core.{GMM, Points, WeightedPoint}
import repro.data.DataPoint
import repro.mr.MROutliers
import repro.{Oracle, SparkSpec, TestData}

/** Cross-checks the radius-evaluation queries against DuckDB via the Oracle:
  * a broken distance kernel or a wrong aggregation shows up as a result
  * mismatch, not just "it ran".
  */
class EvaluateSpec extends SparkSpec {

  private def pointsDF(pts: Array[Array[Double]]): DataFrame = {
    import spark.implicits._
    pts.toSeq.zipWithIndex.map { case (v, i) => (i.toLong, v(0), v(1), v(2)) }
      .toDF("id", "x1", "x2", "x3")
  }

  private def centersDF(cs: Array[Array[Double]]): DataFrame = {
    import spark.implicits._
    cs.toSeq.zipWithIndex.map { case (v, i) => (i.toLong, v(0), v(1), v(2)) }
      .toDF("cid", "c1", "c2", "c3")
  }

  /** Radius as a pure SQL query (runs identically on Spark and DuckDB). */
  private val radiusSql =
    """SELECT max(mind) AS radius FROM (
      |  SELECT p.id AS id,
      |         min(sqrt((cast(p.x1 as double) - cast(c.c1 as double)) * (cast(p.x1 as double) - cast(c.c1 as double))
      |                + (cast(p.x2 as double) - cast(c.c2 as double)) * (cast(p.x2 as double) - cast(c.c2 as double))
      |                + (cast(p.x3 as double) - cast(c.c3 as double)) * (cast(p.x3 as double) - cast(c.c3 as double)))) AS mind
      |  FROM points p CROSS JOIN centers c GROUP BY p.id
      |) t""".stripMargin

  test("Spark SQL radius query is DuckDB-equivalent (Oracle)") {
    val pts = TestData.uniform(120, 3, 1L)
    val cs = GMM.run(pts, 4)
    val pDF = pointsDF(pts); val cDF = centersDF(cs)
    pDF.createOrReplaceTempView("points")
    cDF.createOrReplaceTempView("centers")
    val sparkDf = spark.sql(radiusSql)
    Oracle.assertEquivalent(sparkDf, radiusSql, "points" -> pDF, "centers" -> cDF)
  }

  test("Evaluate.radiusDS matches the SQL radius") {
    import spark.implicits._
    val pts = TestData.uniform(150, 3, 2L)
    val cs = GMM.run(pts, 5)
    val ds = spark.createDataset(pts.toSeq.zipWithIndex.map { case (v, i) =>
      DataPoint(i.toLong, v, isOutlier = false)
    })
    pointsDF(pts).createOrReplaceTempView("points")
    centersDF(cs).createOrReplaceTempView("centers")
    val viaSql = spark.sql(radiusSql).collect().head.getDouble(0)
    assert(math.abs(Evaluate.radiusDS(ds, cs) - viaSql) < 1e-9)
  }

  test("per-point min-distance assignment is DuckDB-equivalent (Oracle)") {
    val pts = TestData.uniform(60, 3, 3L)
    val cs = GMM.run(pts, 3)
    val pDF = pointsDF(pts); val cDF = centersDF(cs)
    pDF.createOrReplaceTempView("points")
    cDF.createOrReplaceTempView("centers")
    val sql =
      """SELECT p.id AS id,
        |       min(sqrt((cast(p.x1 as double) - cast(c.c1 as double)) * (cast(p.x1 as double) - cast(c.c1 as double))
        |              + (cast(p.x2 as double) - cast(c.c2 as double)) * (cast(p.x2 as double) - cast(c.c2 as double))
        |              + (cast(p.x3 as double) - cast(c.c3 as double)) * (cast(p.x3 as double) - cast(c.c3 as double)))) AS mind
        |FROM points p CROSS JOIN centers c GROUP BY p.id""".stripMargin
    Oracle.assertEquivalent(spark.sql(sql), sql, "points" -> pDF, "centers" -> cDF)
  }

  test("coreset weight conservation is DuckDB-equivalent (Oracle)") {
    import spark.implicits._
    val pts = TestData.uniform(500, 3, 4L)
    val coreset: Array[WeightedPoint] =
      MROutliers.weightedPartitionCoreset(pts, MROutliers.FixedSize(25), 7L)
    val wDF = coreset.toSeq.zipWithIndex.map { case (wp, i) => (i.toLong, wp.weight) }
      .toDF("tid", "w")
    wDF.createOrReplaceTempView("coreset")
    val sql = "SELECT sum(cast(w as bigint)) AS total FROM coreset"
    Oracle.assertEquivalent(spark.sql(sql), sql, "coreset" -> wDF)
    assert(spark.sql(sql).collect().head.getLong(0) == 500L)
  }

  test("radiusWithOutliersDS drops the z farthest (vs SQL order-by)") {
    import repro.data.DataPoint
    import spark.implicits._
    val pts = TestData.uniform(100, 3, 5L)
    val cs = GMM.run(pts, 3)
    val ds = spark.createDataset(pts.toSeq.zipWithIndex.map { case (v, i) =>
      DataPoint(i.toLong, v, isOutlier = false)
    })
    val dists = pts.map(Points.distToSet(_, cs)).sorted
    for (z <- Seq(0, 3, 9)) {
      val expected = dists(dists.length - 1 - z)
      assert(math.abs(Evaluate.radiusWithOutliersDS(ds, cs, z) - expected) < 1e-9, s"z=$z")
    }
  }

  test("bestByKey returns the per-key minimum") {
    val best = Evaluate.bestByKey(Seq("a" -> 3.0, "a" -> 1.5, "b" -> 2.0))
    assert(best == Map("a" -> 1.5, "b" -> 2.0))
  }

  test("timed measures and returns the thunk result") {
    val (v, ms) = Evaluate.timed { Thread.sleep(15); 42 }
    assert(v == 42 && ms >= 10)
  }
}
