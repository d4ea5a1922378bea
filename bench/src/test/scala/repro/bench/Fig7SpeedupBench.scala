package repro.bench

import repro.SparkSpec
import repro.exp.{ExpConfig, Fig7Speedup}

/** Reproduces Fig. 7: scalability with parallelism ℓ of the randomized MR
  * algorithm at a fixed coreset-union size 8(16k+6z). Paper shape: the
  * round-2 (OutliersCluster) time is constant in ℓ; the round-1 coreset time
  * dominates at small ℓ and improves superlinearly (per-partition work
  * ∝ 1/ℓ²), flattening at high ℓ due to scheduling overhead.
  */
class Fig7SpeedupBench extends SparkSpec {

  test("Fig. 7 table") {
    val rows = Fig7Speedup.run(spark, ExpConfig.bench)
    println(Fig7Speedup.render(rows))

    rows.groupBy(_.dataset).foreach { case (ds, rs) =>
      val byEll = rs.sortBy(_.ell)
      // Coreset construction gets significantly faster from ell=1 to ell=16.
      val c1 = byEll.head.coresetMs.toDouble
      val c16 = byEll.last.coresetMs.toDouble
      assert(c16 < c1, s"$ds coreset time did not improve: $c1 -> $c16")
      // Round 2 is ell-independent: constant within generous noise bounds.
      val r2 = byEll.map(_.clusterMs.toDouble)
      assert(r2.max <= r2.min * 4 + 1500, s"$ds round2 times: $r2")
    }
  }
}
