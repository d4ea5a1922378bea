package repro.streaming

import repro.core.GMM

/** CORESETSTREAM (Sec. 4, closing remark; Fig. 3): the paper's coreset-based
  * 1-pass Streaming algorithm for k-center *without* outliers — a
  * [[DoublingCoreset]] of τ = μ·k points (weights unused), followed by GMM
  * extracting the final k centers at stream end. (2+ε)-approximate for
  * τ = k(1/ε)^D; the experiments parametrize by space μ·k directly.
  */
final class CoresetStream(k: Int, mu: Int) {
  require(k >= 1 && mu >= 1)
  val space: Int = mu * k
  private val coreset = new DoublingCoreset(space, weighted = false)

  def update(p: Array[Double]): Unit = coreset.update(p)

  /** Final k centers (GMM on the coreset). */
  def result(): Array[Array[Double]] = {
    val t = coreset.result().map(_.vec)
    if (t.length <= k) t else GMM.run(t, k)
  }
}
