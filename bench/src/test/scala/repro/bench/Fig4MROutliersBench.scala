package repro.bench

import repro.SparkSpec
import repro.exp.{ExpConfig, Fig4MROutliers}

/** Reproduces Fig. 4: MapReduce k-center with z outliers, deterministic
  * (adversarial partitioning) vs randomized, ratio and time vs μ. Paper
  * shape: quality improves with μ; deterministic μ=1 ([26] baseline) is the
  * worst because the all-outliers partition starves non-outlier coverage;
  * the randomized algorithm reaches comparable quality with much smaller
  * coresets and far lower round-2 time.
  */
class Fig4MROutliersBench extends SparkSpec {

  test("Fig. 4 table") {
    val rows = Fig4MROutliers.run(spark, ExpConfig.bench)
    println(Fig4MROutliers.render(rows))

    // Direction-level shape checks, averaged across datasets: the synthetic
    // stand-ins reproduce the paper's trends but with muted magnitude (see
    // EXPERIMENTS.md — the large adversarial gap at mu=1 rides on
    // partition-exclusive tail structure of the real datasets).
    def avg(algo: String, mu: Int): Double = {
      val rs = rows.filter(r => r.algo == algo && r.mu == mu)
      rs.map(_.ratio).sum / rs.size
    }
    // Quality does not degrade as mu grows (det sweeps toward ratio ~1).
    assert(avg("deterministic", 8) <= avg("deterministic", 1) * 1.03 + 1e-9,
           s"det avg ratio mu=1 ${avg("deterministic", 1)} vs mu=8 ${avg("deterministic", 8)}")
    for (ds <- rows.map(_.dataset).distinct) {
      val det = rows.filter(r => r.dataset == ds && r.algo == "deterministic").sortBy(_.mu)
      val rnd = rows.filter(r => r.dataset == ds && r.algo == "randomized").sortBy(_.mu)
      // Randomized coresets are substantially smaller at every mu (z >> k).
      det.zip(rnd).foreach { case (d, r) =>
        assert(r.coresetUnion < d.coresetUnion, s"$ds mu=${d.mu}")
      }
      // ... and the randomized run is much faster at the largest mu (the
      // round-2 cost on the smaller union is the paper's Sec. 3.2.1 point).
      assert(rnd.last.timeMs <= det.last.timeMs,
             s"$ds mu=8 time: rnd=${rnd.last.timeMs} det=${det.last.timeMs}")
    }
  }
}
