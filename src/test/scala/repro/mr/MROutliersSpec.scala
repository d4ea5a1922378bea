package repro.mr

import repro.core.{ExactKCenter, Points}
import repro.data.{DataPoint, Datasets}
import repro.eval.Evaluate
import repro.{SparkSpec, TestData}

class MROutliersSpec extends SparkSpec {

  private def toDS(pts: Array[Array[Double]], flags: Array[Boolean] = Array.empty) = {
    import spark.implicits._
    spark.createDataset(pts.toSeq.zipWithIndex.map { case (v, i) =>
      DataPoint(i.toLong, v, if (flags.nonEmpty) flags(i) else false)
    })
  }

  test("returns at most k centers") {
    val ds = toDS(TestData.uniform(400, 3, 1L))
    val res = MROutliers.runDeterministic(ds, 4, 10, ell = 4, mu = 1)
    assert(res.centers.length <= 4)
  }

  test("deterministic coreset union is ell * mu * (k+z) on large partitions") {
    val ds = toDS(TestData.uniform(2000, 2, 2L))
    val res = MROutliers.runDeterministic(ds, 3, 7, ell = 4, mu = 2)
    assert(res.coresetUnionSize == 4 * 2 * 10)
  }

  test("randomized coreset union uses tau = mu*(k + ceil(6z/ell))") {
    val ds = toDS(TestData.uniform(2000, 2, 3L))
    val res = MROutliers.runRandomized(ds, 3, 8, ell = 4, mu = 1)
    assert(res.coresetUnionSize == 4 * (3 + 12)) // ceil(48/4)=12
  }

  test("weights of the union coreset sum to |S|") {
    val pts = TestData.uniform(900, 3, 4L)
    // Inspect round 1 directly through the kernel.
    val w = MROutliers.weightedPartitionCoreset(pts, MROutliers.FixedSize(30), 5L)
    assert(w.map(_.weight).sum == 900L)
  }

  test("planted blobs + planted outliers: radius at cluster scale (deterministic)") {
    val (clean, _) = TestData.blobs(3, 100, 2, 5L, sep = 600.0, std = 1.0)
    val (pts, flags) = Datasets.withOutliers(clean, 5, 5L)
    val ds = toDS(pts, flags).cache()
    val res = MROutliers.runDeterministic(ds, 3, 5, ell = 4, mu = 4)
    val r = Evaluate.radiusWithOutliersDS(ds, res.centers, 5)
    ds.unpersist()
    assert(r < 50.0, s"radius=$r")
  }

  test("planted blobs + planted outliers: radius at cluster scale (randomized)") {
    val (clean, _) = TestData.blobs(3, 100, 2, 6L, sep = 600.0, std = 1.0)
    val (pts, flags) = Datasets.withOutliers(clean, 5, 6L)
    val ds = toDS(pts, flags).cache()
    val res = MROutliers.runRandomized(ds, 3, 5, ell = 4, mu = 4)
    val r = Evaluate.radiusWithOutliersDS(ds, res.centers, 5)
    ds.unpersist()
    assert(r < 50.0, s"radius=$r")
  }

  test("adversarial partitioning with mu=1 degrades, larger mu recovers (Fig. 4 story)") {
    val (clean, _) = TestData.blobs(4, 150, 2, 7L, sep = 300.0, std = 2.0)
    val (pts, flags) = Datasets.withOutliers(clean, 20, 7L)
    val ds = toDS(pts, flags).cache()
    def radiusFor(mu: Int): Double = {
      val rs = TestData.forSeedsCollect(3) { s =>
        val res = MROutliers.runDeterministic(ds, 4, 20, ell = 4, mu = mu,
          partitioning = Partitioning.AdversarialOutliers, seed = s)
        Evaluate.radiusWithOutliersDS(ds, res.centers, 20)
      }
      rs.sum / rs.size
    }
    val r1 = radiusFor(1)
    val r8 = radiusFor(8)
    ds.unpersist()
    assert(r8 <= r1 + 1e-9, s"mu=1 -> $r1, mu=8 -> $r8")
  }

  test("approximation vs exact optimum on a tiny instance (3+eps shape)") {
    TestData.forSeeds(4) { s =>
      val pts = TestData.uniform(14, 2, s)
      val ds = toDS(pts)
      val (k, z) = (2, 2)
      val res = MROutliers.runDeterministic(ds, k, z, ell = 2, mu = 2, seed = s)
      val r = Points.radiusWithOutliers(pts, res.centers, z)
      val opt = ExactKCenter.optimalRadiusWithOutliers(pts, k, z)
      // Proxy slack on top of (3+4e)(1+d): generous factor-6 guard.
      assert(r <= 6.0 * opt + 1e-9, s"seed=$s r=$r opt=$opt")
    }
  }

  test("searchRadius leaves uncovered weight <= z on the coreset") {
    val pts = TestData.uniform(500, 3, 8L)
    val ds = toDS(pts)
    val res = MROutliers.runDeterministic(ds, 3, 12, ell = 2, mu = 2)
    assert(res.searchRadius >= 0 && res.centers.nonEmpty)
  }

  test("radiusWithOutliers helper agrees with local computation") {
    val pts = TestData.uniform(300, 3, 9L)
    val ds = toDS(pts)
    val centers = pts.take(3)
    for (z <- Seq(0, 5, 20)) {
      val viaSpark = MROutliers.radiusWithOutliers(ds, centers, z)
      val local = Points.radiusWithOutliers(pts, centers, z)
      assert(math.abs(viaSpark - local) < 1e-9, s"z=$z")
    }
  }

  test("ell = 1 matches the sequential coreset algorithm's quality") {
    val (clean, _) = TestData.blobs(3, 80, 2, 10L, sep = 500.0, std = 1.0)
    val (pts, flags) = Datasets.withOutliers(clean, 4, 10L)
    val ds = toDS(pts, flags)
    val res = MROutliers.runDeterministic(ds, 3, 4, ell = 1, mu = 4, seed = 3L)
    val rMr = Points.radiusWithOutliers(pts, res.centers, 4)
    assert(rMr < 50.0)
  }
}
