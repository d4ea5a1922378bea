package repro.core

import repro.{SparkSpec, TestData}

class SeqCoresetOutliersSpec extends SparkSpec {

  test("fixed-size run uses exactly tau coreset points") {
    val pts = TestData.uniform(200, 3, 1L)
    val res = SeqCoresetOutliers.runFixedSize(pts, 3, 5, tau = 24)
    assert(res.coresetSize == 24)
  }

  test("returns at most k centers") {
    TestData.forSeeds(5) { s =>
      val pts = TestData.uniform(100, 3, s)
      val res = SeqCoresetOutliers.runFixedSize(pts, 4, 6, tau = 40)
      assert(res.centers.length <= 4)
    }
  }

  test("solution quality close to CharikarEtAl on clustered data (Fig. 8 shape)") {
    val (pts0, _) = TestData.blobs(4, 60, 3, 5L, sep = 200.0, std = 1.0)
    val pts = pts0 ++ Array(Array(1e5, 0.0, 0.0), Array(-1e5, 0.0, 0.0))
    val z = 2; val k = 4
    val ours = SeqCoresetOutliers.runFixedSize(pts, k, z, tau = 8 * (k + z))
    val base = CharikarEtAl.run(pts, k, z)
    val rOurs = Points.radiusWithOutliers(pts, ours.centers, z)
    val rBase = Points.radiusWithOutliers(pts, base.centers, z)
    assert(rOurs <= 2.0 * rBase + 1e-9, s"ours=$rOurs base=$rBase")
    assert(rOurs < 20.0) // cluster scale, outliers discarded
  }

  test("larger mu does not hurt quality on average") {
    val (pts, _) = TestData.blobs(5, 40, 3, 9L, sep = 300.0, std = 2.0)
    val k = 5; val z = 4
    val radii = Seq(1, 8).map { mu =>
      val rs = TestData.forSeedsCollect(5) { s =>
        val res = SeqCoresetOutliers.runFixedSize(pts, k, z, mu * (k + z), seed = s)
        Points.radiusWithOutliers(pts, res.centers, z)
      }
      rs.sum / rs.size
    }
    assert(radii(1) <= radii(0) * 1.25 + 1e-9, s"mu=1 avg ${radii(0)} vs mu=8 avg ${radii(1)}")
  }

  test("epsilon-driven run meets the stopping rule and covers") {
    val pts = TestData.uniform(300, 2, 3L)
    val res = SeqCoresetOutliers.runByEpsilon(pts, 3, 5, hatEps = 0.5)
    assert(res.coresetSize >= 8) // at least k+z
    assert(res.centers.nonEmpty)
  }

  test("timings are recorded") {
    val pts = TestData.uniform(100, 2, 4L)
    val res = SeqCoresetOutliers.runFixedSize(pts, 2, 3, tau = 20)
    assert(res.coresetMillis >= 0 && res.searchMillis >= 0)
  }
}
