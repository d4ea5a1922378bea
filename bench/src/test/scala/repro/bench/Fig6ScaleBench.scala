package repro.bench

import repro.SparkSpec
import repro.exp.{ExpConfig, Fig6Scale}

/** Reproduces Fig. 6: scalability with input size of the randomized MR
  * algorithm for k-center with z outliers. Paper shape: running time linear
  * in n. At our scale the n-independent round 2 is a constant floor, so the
  * linearity claim is checked on round 1 (the n-dependent part) and
  * at-most-linear growth on the total.
  */
class Fig6ScaleBench extends SparkSpec {

  test("Fig. 6 table") {
    val rows = Fig6Scale.run(spark, ExpConfig.bench)
    println(Fig6Scale.render(rows))

    rows.groupBy(_.dataset).foreach { case (ds, rs) =>
      val byH = rs.sortBy(_.h)
      val nRatio = byH.last.n.toDouble / byH.head.n
      // Round 1 grows with n (direction) but at most linearly (+ scheduling
      // slack): the paper's linear-scaling claim on the n-dependent work.
      val c1 = byH.head.coresetMs.toDouble
      val c16 = byH.last.coresetMs.toDouble
      assert(c16 >= c1, s"$ds: round1 did not grow with n: $c1 -> $c16")
      assert(c16 <= c1 * nRatio * 2 + 2000, s"$ds: round1 superlinear: $c1 -> $c16 (n x$nRatio)")
      // Total never grows faster than n.
      val t1 = byH.head.totalMs.toDouble
      val t16 = byH.last.totalMs.toDouble
      assert(t16 <= t1 * nRatio * 2 + 2000, s"$ds: total superlinear: $t1 -> $t16")
    }
  }
}
