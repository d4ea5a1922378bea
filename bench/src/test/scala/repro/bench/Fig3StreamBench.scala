package repro.bench

import repro.SparkSpec
import repro.exp.{ExpConfig, Fig3Stream}

/** Reproduces Fig. 3: Streaming k-center (no outliers) — CORESETSTREAM vs
  * BASESTREAM, ratio and throughput vs space. Paper shape: comparable
  * approximation quality; BASESTREAM uses space slightly better while
  * CORESETSTREAM often has higher throughput.
  */
class Fig3StreamBench extends SparkSpec {

  test("Fig. 3 table") {
    val rows = Fig3Stream.run(ExpConfig.bench)
    println(Fig3Stream.render(rows))

    assert(rows.forall(_.ratio >= 1.0 - 1e-9))
    // Quality improves (or holds) with more space for each algorithm.
    for (ds <- rows.map(_.dataset).distinct; algo <- Seq("CoresetStream", "BaseStream")) {
      val sweep = rows.filter(r => r.dataset == ds && r.algo == algo).sortBy(_.param)
      assert(sweep.last.ratio <= sweep.head.ratio * 1.1 + 1e-9,
             s"$ds $algo: ${sweep.map(_.ratio)}")
    }
    // Both algorithms land in the same quality regime (paper: comparable).
    val cAvg = avg(rows.filter(_.algo == "CoresetStream").map(_.ratio))
    val bAvg = avg(rows.filter(_.algo == "BaseStream").map(_.ratio))
    assert(cAvg < bAvg * 2.0 && bAvg < cAvg * 2.0, s"coreset=$cAvg base=$bAvg")
  }

  private def avg(xs: Seq[Double]): Double = xs.sum / xs.size
}
