package repro.planner

import repro.core.OpStats
import repro.cleo.CostModel

/** Partition-count exploration strategies of Section 5.3.
  *
  * A "stage" is a set of operators sharing one partition count; the stage
  * cost at P is the sum of each operator's learned cost with its statistics
  * re-evaluated at P. Sampling strategies probe the learned models at chosen
  * counts; the analytical strategy solves `min θP/P + θC·P` in closed form
  * from the models' raw coefficients.
  */
object PartitionExplorer {

  val MaxPartitions = 3000

  /** One stage member: its learned model and its (P-independent) statistics. */
  final case class StageOp(model: CostModel, stats: OpStats)

  def stageCost(ops: Seq[StageOp], p: Int): Double =
    ops.map(o => o.model.predictCost(repro.core.Features.vector(o.stats.withPartitions(p)))).sum

  /** Exhaustive scan — the reference optimum (1..Pmax model probes). */
  def exhaustive(ops: Seq[StageOp], pMax: Int = MaxPartitions): Int =
    (1 to pMax).minBy(stageCost(ops, _))

  def bestOf(ops: Seq[StageOp], candidates: Seq[Int]): Int =
    candidates.distinct.filter(p => p >= 1 && p <= MaxPartitions).minBy(stageCost(ops, _))

  def randomCandidates(k: Int, seed: Long, pMax: Int = MaxPartitions): Seq[Int] = {
    val rng = new scala.util.Random(seed)
    Seq.fill(k)(1 + rng.nextInt(pMax))
  }

  def uniformCandidates(k: Int, pMax: Int = MaxPartitions): Seq[Int] =
    (1 to k).map(i => math.max(1, math.round(i * pMax.toDouble / k).toInt))

  /** Geometrically increasing samples: x_{i+1} = ceil(x_i + x_i / s), with
    * x_0 = 1, x_1 = 2 (Section 5.3). `s` is the skipping coefficient.
    */
  def geometricCandidates(s: Double, pMax: Int = MaxPartitions): Seq[Int] = {
    val buf = scala.collection.mutable.ArrayBuffer(1, 2)
    while (buf.last < pMax) buf += math.min(pMax, math.ceil(buf.last + buf.last / s).toInt)
    buf.toSeq.distinct
  }

  /** Geometric candidates tuned to yield approximately `k` samples over pMax. */
  def geometricCandidatesOfSize(k: Int, pMax: Int = MaxPartitions): Seq[Int] = {
    // ratio r = (1 + 1/s); k steps from 1 to pMax → r = pMax^(1/k)
    val r = math.pow(pMax.toDouble, 1.0 / math.max(1, k))
    val s = 1.0 / math.max(1e-6, r - 1.0)
    geometricCandidates(s, pMax)
  }

  /** Closed-form optimum of `Σ θP_i / P + Σ θC_i · P` (three sign cases of
    * Section 5.3; with both sums negative the optimum is at a boundary).
    */
  def analyticalOptimum(thetas: Seq[(Double, Double)], pMax: Int = MaxPartitions): Int = {
    val tp = thetas.map(_._1).sum
    val tc = thetas.map(_._2).sum
    def cost(p: Double): Double = tp / p + tc * p
    val candidates = scala.collection.mutable.ArrayBuffer(1.0, pMax.toDouble)
    if (tp > 0 && tc > 0) candidates += math.sqrt(tp / tc)
    val best = candidates.minBy(cost)
    math.max(1, math.min(pMax, math.round(best).toInt))
  }

  /** Analytical strategy applied to a stage: probe-fitted θ from each
    * member's model; when the fit has no interior optimum the stage keeps
    * its current (heuristic) count, like [[PartitionOptimizer]].
    */
  def analytical(ops: Seq[StageOp], pMax: Int = MaxPartitions): Int = {
    val thetas = ops.map(o => o.model.theta(o.stats))
    val tp = thetas.map(_._1).sum
    val tc = thetas.map(_._2).sum
    val cur = ops.map(_.stats.p).max.toInt
    if (tp > 0 && tc > 0) {
      val opt = math.sqrt(tp / tc)
      val lo = math.max(1.0, cur / 8.0)
      val hi = math.min(pMax.toDouble, cur * 8.0)
      math.round(math.max(lo, math.min(hi, opt))).toInt
    } else math.max(1, math.min(pMax, cur))
  }
}
