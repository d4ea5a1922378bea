package repro.bench

import repro.SparkSpec
import repro.exp.{ExpConfig, Fig5StreamOutliers}

/** Reproduces Fig. 5: Streaming k-center with z outliers — CORESETOUTLIERS
  * vs BASEOUTLIERS, ratio and throughput vs space. Paper shape:
  * CoresetOutliers reaches better (or equal) quality with far less space and
  * an order of magnitude higher throughput at a fixed quality level.
  */
class Fig5StreamOutliersBench extends SparkSpec {

  test("Fig. 5 table") {
    val rows = Fig5StreamOutliers.run(ExpConfig.bench)
    println(Fig5StreamOutliers.render(rows))

    assert(rows.forall(_.ratio >= 1.0 - 1e-9))
    for (ds <- rows.map(_.dataset).distinct) {
      val c = rows.filter(r => r.dataset == ds && r.algo == "CoresetOutliers").sortBy(_.param)
      val b = rows.filter(r => r.dataset == ds && r.algo == "BaseOutliers").sortBy(_.param)
      // CoresetOutliers uses at least an order of magnitude less space.
      c.zip(b).foreach { case (cr, br) => assert(cr.space * 10 <= br.space) }
      // Quality at the largest coreset approaches the best found (paper:
      // "approaching the best quality ever attained").
      assert(c.last.ratio <= 1.6, s"$ds coreset ratio sweep: ${c.map(_.ratio)}")
      // At comparable quality, CoresetOutliers throughput dominates: compare
      // best quality rows of each algorithm.
      val cBest = c.minBy(_.ratio); val bBest = b.minBy(_.ratio)
      assert(cBest.throughputKpts > bBest.throughputKpts,
             s"$ds throughput: coreset=${cBest.throughputKpts} base=${bBest.throughputKpts}")
    }
  }
}
