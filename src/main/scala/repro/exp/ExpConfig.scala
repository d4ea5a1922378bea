package repro.exp

import repro.data.Datasets
import repro.data.Datasets.Spec

/** Shared experiment configuration: which synthetic stand-in datasets run at
  * which sizes, and the outlier parameters of Sec. 5.2 (k = 20, z = 200).
  *
  * `bench` mirrors the paper's setup at single-machine scale (DESIGN.md §4);
  * `smoke` is a tiny configuration used by the integration tests so every
  * harness code path is exercised inside `sbt test`.
  */
final case class ExpConfig(
    sizes: Map[String, Int],
    kOutliers: Int,
    zOutliers: Int,
    reps: Int,
    seed: Long,
) {
  def nFor(spec: Spec): Int = sizes(spec.name)
  def specs: Seq[Spec] = Datasets.all.filter(s => sizes.contains(s.name))
}

object ExpConfig {
  /** Bench scale: large enough for stable shapes, small enough for minutes. */
  val bench: ExpConfig = ExpConfig(
    sizes = Map("higgsLike" -> 60000, "powerLike" -> 40000, "wikiLike" -> 15000),
    kOutliers = 20, zOutliers = 200, reps = 3, seed = 1234L)

  /** Smoke scale for integration tests. */
  val smoke: ExpConfig = ExpConfig(
    sizes = Map("higgsLike" -> 1500, "powerLike" -> 1200),
    kOutliers = 5, zOutliers = 20, reps = 1, seed = 99L)
}
