package repro.streaming

import repro.core.{ExactKCenter, Points}
import repro.{SparkSpec, TestData}

class DoublingCoresetSpec extends SparkSpec {

  test("size never exceeds tau (invariant a)") {
    TestData.forSeeds(10) { s =>
      val pts = TestData.uniform(500, 3, s)
      val dc = new DoublingCoreset(12)
      pts.foreach { p => dc.update(p); assert(dc.size <= 13) } // +1 transiently impossible post-update
      assert(dc.result().length <= 12)
    }
  }

  test("weights sum to the number of processed points (invariant d)") {
    TestData.forSeeds(10) { s =>
      val pts = TestData.uniform(400, 2, s)
      val dc = new DoublingCoreset(9)
      pts.foreach(dc.update)
      assert(dc.result().map(_.weight).sum == 400L)
      assert(dc.pointsProcessed == 400L)
    }
  }

  test("centers are pairwise > 4*phi apart (invariant b)") {
    TestData.forSeeds(10) { s =>
      val pts = TestData.uniform(600, 3, s)
      val dc = new DoublingCoreset(10)
      pts.foreach(dc.update)
      val t = dc.result().map(_.vec)
      val phi = dc.phi
      for (i <- t.indices; j <- (i + 1) until t.length)
        assert(Points.dist(t(i), t(j)) > 4 * phi - 1e-9, s"seed=$s pair ($i,$j)")
    }
  }

  test("every processed point is within 8*phi of the coreset (invariant c corollary)") {
    TestData.forSeeds(10) { s =>
      val pts = TestData.uniform(500, 2, s)
      val dc = new DoublingCoreset(15)
      pts.foreach(dc.update)
      val t = dc.result().map(_.vec)
      pts.foreach(p => assert(Points.distToSet(p, t) <= 8 * dc.phi + 1e-9))
    }
  }

  test("phi lower-bounds 2*r*_tau(S) (invariant e, with the init doubling slack)") {
    // The paper's prescribed end-of-initialization merge doubles phi from
    // d_min/2 to d_min, which is only guaranteed <= 2*r*_tau of the prefix;
    // later merges preserve that factor. Check the honest bound.
    TestData.forSeeds(8) { s =>
      val pts = TestData.uniform(12, 2, s)
      val tau = 3
      val dc = new DoublingCoreset(tau)
      pts.foreach(dc.update)
      if (dc.phi > 0)
        assert(dc.phi <= 2 * ExactKCenter.optimalRadius(pts, tau) + 1e-9, s"seed=$s")
    }
  }

  test("short streams (< tau+1 points) return the points verbatim") {
    val pts = TestData.uniform(5, 2, 1L)
    val dc = new DoublingCoreset(10)
    pts.foreach(dc.update)
    val res = dc.result()
    assert(res.length == 5 && res.forall(_.weight == 1L))
  }

  test("handles duplicate points in the initial prefix") {
    val p = Array(1.0, 1.0)
    val dc = new DoublingCoreset(3)
    (0 until 10).foreach(_ => dc.update(p.clone()))
    val res = dc.result()
    assert(res.map(_.weight).sum == 10L)
    assert(res.length == 1)
  }

  test("stream of two tight blobs collapses to two heavy centers") {
    val (pts, _) = TestData.blobs(2, 100, 2, 4L, sep = 1e6, std = 1e-3)
    val dc = new DoublingCoreset(4)
    pts.foreach(dc.update)
    val res = dc.result()
    assert(res.length <= 4)
    assert(res.map(_.weight).sum == 200L)
    // The two blobs cannot merge: separation dwarfs any reachable phi here.
    val big = res.filter(_.weight >= 50L)
    assert(big.length == 2, res.map(_.weight).mkString(","))
  }

  test("coreset radius is within 8*phi of optimum scale (quality sanity)") {
    TestData.forSeeds(5) { s =>
      val pts = TestData.uniform(1000, 3, s)
      val tau = 30
      val dc = new DoublingCoreset(tau)
      pts.foreach(dc.update)
      val r = Points.radius(pts, dc.result().map(_.vec))
      assert(r <= 8 * dc.phi + 1e-9)
    }
  }

  test("order matters but invariants hold under any order") {
    val pts = TestData.uniform(300, 2, 6L)
    for (shuffleSeed <- Seq(1L, 2L, 3L)) {
      val stream = new scala.util.Random(shuffleSeed).shuffle(pts.toSeq).toArray
      val dc = new DoublingCoreset(8)
      stream.foreach(dc.update)
      assert(dc.result().length <= 8)
      assert(dc.result().map(_.weight).sum == 300L)
    }
  }

  test("rejects tau < 1") {
    intercept[IllegalArgumentException](new DoublingCoreset(0))
  }
}
