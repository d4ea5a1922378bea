package repro.mr

import repro.data.DataPoint
import repro.{SparkSpec, TestData}

class PartitioningSpec extends SparkSpec {

  private def toDS(n: Int, outlierFrom: Int = Int.MaxValue) = {
    import spark.implicits._
    val pts = TestData.uniform(n, 2, 1L)
    spark.createDataset(pts.toSeq.zipWithIndex.map { case (v, i) =>
      DataPoint(i.toLong, v, i >= outlierFrom)
    })
  }

  test("Arbitrary produces the requested number of partitions") {
    val parts = Partitioning.Arbitrary(toDS(200), 8, 1L)
    assert(parts.rdd.getNumPartitions == 8)
  }

  test("Arbitrary spreads rows roughly evenly") {
    val sizes = Partitioning.Arbitrary(toDS(400), 4, 1L)
      .rdd.mapPartitions(it => Iterator(it.size)).collect()
    assert(sizes.sum == 400)
    assert(sizes.forall(s => s > 50 && s < 150), sizes.mkString(","))
  }

  test("Random produces the requested number of partitions and loses nothing") {
    val parts = Partitioning.Random(toDS(300), 6, 2L)
    assert(parts.rdd.getNumPartitions == 6)
    assert(parts.count() == 300)
  }

  test("Random assignment is roughly balanced") {
    val sizes = Partitioning.Random(toDS(4000), 4, 3L)
      .rdd.mapPartitions(it => Iterator(it.size)).collect()
    assert(sizes.sum == 4000)
    assert(sizes.forall(s => s > 600 && s < 1400), sizes.mkString(","))
  }

  test("AdversarialOutliers puts every outlier in one partition") {
    val ds = toDS(200, outlierFrom = 180) // 20 outliers
    val parts = Partitioning.AdversarialOutliers(ds, 4, 4L)
    val outlierParts = parts.rdd
      .mapPartitionsWithIndex((i, it) => Iterator(i -> it.count(_.isOutlier)))
      .collect().filter(_._2 > 0)
    assert(outlierParts.length == 1, outlierParts.mkString(","))
    assert(outlierParts.head._2 == 20)
    assert(parts.count() == 200)
  }

  test("AdversarialOutliers still spreads non-outliers across partitions") {
    val ds = toDS(400, outlierFrom = 390)
    val parts = Partitioning.AdversarialOutliers(ds, 4, 5L)
    val nonEmpty = parts.rdd.mapPartitions(it => Iterator(it.size)).collect().count(_ > 0)
    assert(nonEmpty >= 3)
  }
}
