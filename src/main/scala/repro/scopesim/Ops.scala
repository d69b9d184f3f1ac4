package repro.scopesim

/** Physical operators of the simulated SCOPE-like engine. */
sealed abstract class PhysOp(val name: String, val logical: String) extends Serializable
object PhysOp {
  case object Extract        extends PhysOp("Extract", "Get")
  case object Filter         extends PhysOp("Filter", "Select")
  case object Project        extends PhysOp("Project", "Project")
  case object HashJoin       extends PhysOp("HashJoin", "Join")
  case object MergeJoin      extends PhysOp("MergeJoin", "Join")
  case object HashAggregate  extends PhysOp("HashAggregate", "GroupBy")
  case object StreamAggregate extends PhysOp("StreamAggregate", "GroupBy")
  case object Sort           extends PhysOp("Sort", "Sort")
  case object Exchange       extends PhysOp("Exchange", "Exchange")
  case object UdfProcessor   extends PhysOp("Process", "Process")
  case object Output         extends PhysOp("Output", "Output")

  val all: Seq[PhysOp] = Seq(Extract, Filter, Project, HashJoin, MergeJoin,
    HashAggregate, StreamAggregate, Sort, Exchange, UdfProcessor, Output)
}

/** Logical operators of job templates (what recurs across instances). */
sealed abstract class LogicalOp(val name: String) extends Serializable
object LogicalOp {
  final case class Get(input: String) extends LogicalOp("Get")
  final case class Select(selBase: Double) extends LogicalOp("Select")
  case object Project extends LogicalOp("Project")
  final case class Join(key: String, selBase: Double) extends LogicalOp("Join")
  final case class GroupBy(key: String, selBase: Double) extends LogicalOp("GroupBy")
  final case class Process(costFactor: Double) extends LogicalOp("Process")
  case object Output extends LogicalOp("Output")
}

/** Deterministic pseudo-randomness keyed by 64-bit hashes, so hidden
  * multipliers, estimation biases, and noise are reproducible functions of
  * (template, node, instance) — required for replaying alternative physical
  * plans of the same template through the ground-truth simulator.
  */
object Determ {
  /** splitmix64 finalizer — good avalanche for key mixing. */
  def mix(z0: Long): Long = {
    var z = z0 + 0x9E3779B97F4A7C15L
    z = (z ^ (z >>> 30)) * 0xBF58476D1CE4E5B9L
    z = (z ^ (z >>> 27)) * 0x94D049BB133111EBL
    z ^ (z >>> 31)
  }

  def mix2(a: Long, b: Long): Long = mix(a ^ mix(b))

  def hashStr(s: String): Long = {
    var h = 1125899906842597L
    var i = 0
    while (i < s.length) { h = 31 * h + s.charAt(i); i += 1 }
    mix(h)
  }

  /** Uniform in [0, 1). */
  def uniform(seed: Long): Double = {
    val bits = mix(seed) >>> 11
    bits.toDouble / (1L << 53).toDouble
  }

  /** Standard normal via Box–Muller over two derived uniforms. */
  def gauss(seed: Long): Double = {
    val u1 = math.max(1e-12, uniform(seed))
    val u2 = uniform(mix(seed ^ 0x5DEECE66DL))
    math.sqrt(-2.0 * math.log(u1)) * math.cos(2.0 * math.Pi * u2)
  }

  def lognormal(seed: Long, sigma: Double): Double = math.exp(gauss(seed) * sigma)
}
