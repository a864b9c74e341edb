package repro.sim

/** Machine catalogue and monetary cost model (paper §5.3, Appendix L).
  *
  * The paper rents Google Cloud VMs as stand-ins for on-premise servers and
  * estimates that the same compute costs 1.8× more on the cloud than on
  * premise; total cost = VM-hours · price / 1.8 + AWS-Lambda dollars.
  */
final case class Machine(name: String, vCpus: Int, pricePerHour: Double)

object Machines {
  val e2s4:  Machine = Machine("e2-standard-4", 4, 0.14)
  val e2s8:  Machine = Machine("e2-standard-8", 8, 0.27)
  val e2s16: Machine = Machine("e2-standard-16", 16, 0.54)
  val e2s32: Machine = Machine("e2-standard-32", 32, 1.07)
  val c2s60: Machine = Machine("c2-standard-60", 60, 2.51)

  val catalogue: Vector[Machine] = Vector(e2s4, e2s8, e2s16, e2s32, c2s60)

  /** Cloud-to-on-premise cost ratio estimated in Appendix L. */
  val cloudRatio: Double = 1.8

  /** $ of provisioned on-premise compute for `hours` on machine `m`. */
  def onPremDollars(m: Machine, hours: Double): Double =
    m.pricePerHour * hours / cloudRatio

  /** Effective on-premise $ per core·second (e2 pricing divided by 1.8). */
  val onPremPerCoreSec: Double = (0.14 / 4.0) / cloudRatio / 3600.0

  /** Cloud $ per core·second at a given cloud:on-prem cost ratio
    * (1.8 = Appendix L estimate; the §5.4 ablation also uses 2.5 and 1.0).
    */
  def cloudPerCoreSec(ratio: Double = cloudRatio): Double = onPremPerCoreSec * ratio
}
