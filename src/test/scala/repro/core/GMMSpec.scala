package repro.core

import repro.{SparkSpec, TestData}

class GMMSpec extends SparkSpec {

  test("run returns exactly k distinct centers") {
    TestData.forSeeds(10) { s =>
      val pts = TestData.uniform(50, 3, s)
      val cs = GMM.run(pts, 7)
      assert(cs.length == 7)
      assert(cs.map(_.toSeq).distinct.length == 7)
    }
  }

  test("run with k >= n returns all points") {
    val pts = TestData.uniform(5, 2, 1L)
    assert(GMM.run(pts, 10).length == 5)
  }

  test("centers are a subset of the input") {
    val pts = TestData.uniform(40, 3, 2L)
    val inSet = pts.map(_.toSeq).toSet
    assert(GMM.run(pts, 6).forall(c => inSet(c.toSeq)))
  }

  test("radiusAfter is non-increasing (the paper's incremental property)") {
    TestData.forSeeds(10) { s =>
      val pts = TestData.uniform(60, 4, s)
      val tr = GMM.coresetBySize(pts, 20)
      tr.radiusAfter.sliding(2).foreach { case Array(a, b) => assert(b <= a + 1e-12) }
    }
  }

  test("trace radii equal recomputed prefix radii") {
    val pts = TestData.uniform(30, 3, 9L)
    val tr = GMM.coresetBySize(pts, 10)
    for (j <- 1 to 10) {
      val r = Points.radius(pts, tr.prefix(j))
      assert(math.abs(r - tr.radiusAfter(j - 1)) < 1e-9, s"prefix $j")
    }
  }

  test("GMM is a 2-approximation of the exact optimum (Lemma 1 with X = S)") {
    TestData.forSeeds(15) { s =>
      val pts = TestData.uniform(12, 2, s)
      for (k <- Seq(2, 3)) {
        val r = Points.radius(pts, GMM.run(pts, k))
        val opt = ExactKCenter.optimalRadius(pts, k)
        assert(r <= 2.0 * opt + 1e-9, s"k=$k seed=$s: gmm=$r opt=$opt")
      }
    }
  }

  test("Lemma 1: GMM on a subset has radius <= 2 r*_k(S)") {
    TestData.forSeeds(10) { s =>
      val pts = TestData.uniform(14, 2, s)
      val sub = pts.take(8)
      val k = 3
      val rSub = Points.radius(sub, GMM.run(sub, k))
      assert(rSub <= 2.0 * ExactKCenter.optimalRadius(pts, k) + 1e-9)
    }
  }

  test("GMM recovers well-separated blobs exactly (one center per blob)") {
    val (pts, centers) = TestData.blobs(5, 40, 3, 11L, sep = 1000.0, std = 0.5)
    val cs = GMM.run(pts, 5)
    // Every returned center lies in a distinct blob.
    val assign = cs.map(c => Points.closestIndex(c, centers))
    assert(assign.distinct.length == 5)
    assert(Points.radius(pts, cs) < 10.0) // ~ blob diameter, << separation
  }

  test("coresetBySize returns exactly tau centers") {
    val pts = TestData.uniform(100, 3, 4L)
    for (tau <- Seq(1, 5, 17, 99)) assert(GMM.coresetBySize(pts, tau).size == tau)
  }

  test("coresetBySize caps at n when tau > n") {
    val pts = TestData.uniform(8, 2, 4L)
    assert(GMM.coresetBySize(pts, 50).size == 8)
  }

  test("coresetByEpsilon meets the stopping rule r(T^tau) <= eps/2 r(T^k)") {
    TestData.forSeeds(8) { s =>
      val pts = TestData.uniform(200, 3, s)
      val k = 5
      val eps = 0.5
      val tr = GMM.coresetByEpsilon(pts, k, eps)
      assert(tr.size >= k)
      val rK = tr.radiusAfter(k - 1)
      val rTau = tr.radiusAfter(tr.size - 1)
      assert(rTau <= (eps / 2) * rK + 1e-12 || tr.size == pts.length)
    }
  }

  test("coresetByEpsilon with smaller eps yields a larger coreset") {
    val pts = TestData.uniform(500, 3, 6L)
    val big = GMM.coresetByEpsilon(pts, 5, 0.2).size
    val small = GMM.coresetByEpsilon(pts, 5, 0.9).size
    assert(big >= small)
  }

  test("coresetByEpsilon proxy distance bound (Lemma 2 style)") {
    // d(s, coreset) <= eps * r*_k(S) needs r(T^k) <= 2 r*_k; on the full set
    // this holds, so check d(s,T) <= eps * 2 * r*_k proxy via the trace radii.
    val pts = TestData.uniform(300, 2, 8L)
    val eps = 0.4
    val tr = GMM.coresetByEpsilon(pts, 4, eps)
    val rCore = Points.radius(pts, tr.centers)
    assert(rCore <= eps * tr.radiusAfter(3) + 1e-12)
  }

  test("coresetByEpsilon rejects eps outside (0,1]") {
    val pts = TestData.uniform(10, 2, 1L)
    intercept[IllegalArgumentException](GMM.coresetByEpsilon(pts, 2, 0.0))
    intercept[IllegalArgumentException](GMM.coresetByEpsilon(pts, 2, 1.5))
  }

  test("runWhile on empty input throws") {
    intercept[IllegalArgumentException](GMM.run(Array.empty[Array[Double]], 3))
  }

  test("firstIdx changes the traversal but not the 2-approx guarantee") {
    val pts = TestData.uniform(15, 2, 12L)
    val opt = ExactKCenter.optimalRadius(pts, 3)
    for (f <- 0 until 15) {
      val r = Points.radius(pts, GMM.run(pts, 3, f))
      assert(r <= 2 * opt + 1e-9, s"firstIdx=$f")
    }
  }

  test("weigh conserves total weight = |S|") {
    TestData.forSeeds(10) { s =>
      val pts = TestData.uniform(77, 3, s)
      val core = GMM.coresetBySize(pts, 9).centers
      val w = GMM.weigh(pts, core)
      assert(w.map(_.weight).sum == 77L)
      assert(w.forall(_.weight >= 1L)) // each coreset point is its own proxy
    }
  }

  test("weigh assigns each point to its closest coreset point") {
    val pts = Array(Array(0.0), Array(0.1), Array(10.0), Array(10.2), Array(10.3))
    val core = Array(Array(0.0), Array(10.0))
    val w = GMM.weigh(pts, core)
    assert(w.map(_.weight).toSeq == Seq(2L, 3L))
  }
}
