package repro.bench

import repro.SparkSpec
import repro.exp.{ExpConfig, Fig8Sequential}

/** Reproduces Fig. 8: sequential algorithms for k-center with z outliers on
  * 10⁴-point samples (time in log scale in the paper). Paper shape: coreset
  * runs are ~an order of magnitude faster than CHARIKARETAL; μ=1
  * (MALKOMESETAL) is fast but much worse in radius; μ ≥ 2 approaches
  * CHARIKARETAL's radius while keeping the speedup.
  */
class Fig8SequentialBench extends SparkSpec {

  test("Fig. 8 table") {
    val cfg = ExpConfig.bench
    val rows = Fig8Sequential.run(cfg, sampleN = 10000)
    println(Fig8Sequential.render(rows))

    rows.groupBy(_.dataset).foreach { case (ds, rs) =>
      val charikar = rs.find(_.algo == "CharikarEtAl").get
      val coresets = rs.filter(_.algo != "CharikarEtAl")
      // Every coreset run is faster than CharikarEtAl; best one by >= 3x.
      coresets.foreach(c => assert(c.timeMs < charikar.timeMs, s"$ds ${c.algo}"))
      assert(coresets.map(_.timeMs).min * 3 <= charikar.timeMs,
             s"$ds speedup too small: ${coresets.map(_.timeMs)} vs ${charikar.timeMs}")
      // mu=8 radius within 25% of CharikarEtAl (paper: essentially equal).
      val mu8 = rs.find(_.algo == "Coreset(mu=8)").get
      assert(mu8.radius <= charikar.radius * 1.25 + 1e-9,
             s"$ds radius: mu8=${mu8.radius} charikar=${charikar.radius}")
    }
  }
}
