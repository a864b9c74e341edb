package repro.workload

/** A tunable knob: name plus its user-registered value domain (paper §2.1).
  * Domains are numeric; categorical knobs (model size) encode their levels
  * as ordinals whose cost/robustness mapping lives in the workload.
  */
final case class KnobDef(name: String, domain: Vector[Double])

/** One instantiation of every knob of a workload; `values` is aligned with
  * `Workload.knobs`. `id` indexes into the workload's full config grid.
  */
final case class KnobConfig(id: Int, values: Vector[Double]) {
  def apply(i: Int): Double = values(i)
}

/** A knob configuration with its profiled invariants (paper §3.1):
  *
  * @param unitCost  core·seconds of work per video-second per analyzed stream
  * @param rho       robustness ∈ [0,1]: how well the config holds up on
  *                  difficult content (drives the quality model)
  * @param streamCap max concurrent streams this config analyzes
  *                  (∞ for single-stream workloads)
  */
final case class ConfigProfile(cfg: KnobConfig, unitCost: Double, rho: Double,
                               streamCap: Double) {
  def id: Int = cfg.id
}

object Knobs {
  /** Cartesian product of all knob domains, ids in grid order. */
  def grid(knobs: Vector[KnobDef]): Vector[KnobConfig] = {
    val combos = knobs.foldLeft(Vector(Vector.empty[Double])) { (acc, k) =>
      acc.flatMap(prefix => k.domain.map(prefix :+ _))
    }
    combos.zipWithIndex.map { case (vs, i) => KnobConfig(i, vs) }
  }
}
