package repro.bench

import repro.SparkSpec
import repro.exp.{ExpConfig, Fig2KCenter}

/** Reproduces Fig. 2: MapReduce k-center approximation ratio vs coreset size
  * μk (μ ∈ {1,2,4,8}) and parallelism ℓ ∈ {2,4,8,16}. Paper shape: ratio
  * decreases with μ (μ=1, the [26] baseline, is the worst) and mildly with ℓ.
  */
class Fig2KCenterBench extends SparkSpec {

  test("Fig. 2 table") {
    val rows = Fig2KCenter.run(spark, ExpConfig.bench)
    println(Fig2KCenter.render(rows))

    for (ds <- rows.map(_.dataset).distinct; ell <- Fig2KCenter.ells) {
      val byMu = rows.filter(r => r.dataset == ds && r.ell == ell).sortBy(_.mu)
      // Shape: mu=8 at least as good as mu=1 (within noise).
      assert(byMu.last.ratio <= byMu.head.ratio * 1.05 + 1e-9,
             s"$ds ell=$ell: ${byMu.map(r => r.mu -> Tables(r.ratio))}")
    }
    // Global shape: the mu=1 baseline is never the best on average.
    val mu1 = rows.filter(_.mu == 1).map(_.ratio).sum / rows.count(_.mu == 1)
    val mu8 = rows.filter(_.mu == 8).map(_.ratio).sum / rows.count(_.mu == 8)
    assert(mu8 <= mu1 + 1e-9, s"avg ratio mu=8 ($mu8) should not exceed mu=1 ($mu1)")
  }

  private def Tables(d: Double): String = f"$d%.3f"
}
