package repro.cleo

import repro.scopesim.OpSample

/** The four individual model families of Sections 3–4, ordered from most
  * specialized (highest accuracy, lowest coverage) to most general.
  */
sealed abstract class Family(val name: String) extends Serializable {
  def key(s: OpSample): Long
}

object Family {
  case object Subgraph extends Family("Op-Subgraph") {
    override def key(s: OpSample): Long = s.sigSub
  }
  case object Approx extends Family("Op-SubgraphApprox") {
    override def key(s: OpSample): Long = s.sigApprox
  }
  case object Input extends Family("Op-Input") {
    override def key(s: OpSample): Long = s.sigInput
  }
  case object Operator extends Family("Operator") {
    override def key(s: OpSample): Long = s.sigOperator
  }

  /** Specialized → general (the fallback order of the strawman in §4.3). */
  val all: Seq[Family] = Seq(Subgraph, Approx, Input, Operator)
}
