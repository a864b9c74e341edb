package repro.core

import repro.sim.{Decision, Placement, Probe}

/** The reactive knob switcher (paper §4.2).
  *
  * Three steps per segment:
  *  1. classify the current content category from the reported quality of
  *     the configuration that just ran (Eq. 5 — one KMeans dimension);
  *  2. look the category up in the knob plan → target histogram α_c;
  *  3. pick the config maximizing plan adherence, `argmax α_c[i] − α̂_c[i]`
  *     (Eq. 6), where α̂_c tracks what was actually used; then the cheapest
  *     placement that does not overflow the buffer, recursively degrading to
  *     the next-less-qualitative config when no placement fits.
  */
final class KnobSwitcher(cats: ContentCategories, qualHat: Array[Array[Double]],
                         placements: Vector[Placement]) {
  private val nConfigs = qualHat(0).length

  private var plan: KnobPlan = _
  private val usedCounts = Array.ofDim[Double](cats.n, nConfigs)
  private val usedTotals = Array.ofDim[Double](cats.n)
  private var curCategory: Int = 0
  private var lastChosenCategory: Int = 0

  def setPlan(p: KnobPlan): Unit = { plan = p }
  def currentCategory: Int = curCategory

  /** α̂_c[k]: observed usage frequency of config k on category c. */
  def usedFrac(c: Int, k: Int): Double =
    if (usedTotals(c) <= 0) 0.0 else usedCounts(c)(k) / usedTotals(c)

  /** Quality rank of configs on the current category, best first — the
    * "next less qualitative" order for the degradation fallback.
    */
  private def qualityOrder(c: Int): Seq[Int] =
    (0 until nConfigs).sortBy(k => -qualHat(c)(k))

  def choose(probe: Probe): Decision = {
    require(plan != null, "knob plan not set")
    val c = curCategory
    lastChosenCategory = c
    // Eq. 6: maximize plan-adherence deficit.
    val kNext = (0 until nConfigs).maxBy(k => plan.alpha(c)(k) - usedFrac(c, k))

    // Fallback chain: kNext, then configs of decreasing expected quality.
    val order = kNext +: qualityOrder(c).filterNot(_ == kNext)
    for (k <- order; p <- placements.sortBy(probe.cloudCost(k, _)))
      if (probe.feasible(k, p)) return Decision(k, p)

    // Nothing fits (should not happen when the cheapest config is
    // provisioned to run in real time): cheapest config, max offload.
    val cheapest = (0 until nConfigs).minBy(probe.work)
    Decision(cheapest, placements.maxBy(_.cloudFrac))
  }

  /** Update α̂ and re-classify the content category from the REPORTED
    * quality (certainty) of the config that just ran (Eq. 5).
    */
  def observe(cfgIdx: Int, reportedQual: Double): Unit = {
    usedCounts(lastChosenCategory)(cfgIdx) += 1
    usedTotals(lastChosenCategory) += 1
    curCategory = cats.classifyOnline(cfgIdx, reportedQual)
  }
}
