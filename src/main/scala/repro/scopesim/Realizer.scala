package repro.scopesim

/** Chooses partition counts for partitioning operators — the decision the
  * paper's resource-aware planning replaces (Section 5.2): by default these
  * are set from local estimated statistics only.
  */
trait Partitioner {
  def extract(estRows: Double, rowLen: Double): Int
  def exchange(estRows: Double, rowLen: Double): Int
}

/** SCOPE-like defaults: one partition per 128 MB of extracted input, one per
  * 32 MB of exchanged data with a 48-partition parallelism floor — the
  * aggressive scale-out the paper observes ("SCOPE jobs tend to
  * over-partition at the leaf levels and leverage the massive scale-out
  * possible for improving latency"). The floor is what lets resource-aware
  * planning reclaim CPU time by *reducing* parallelism (Figure 19).
  */
object DefaultPartitioner extends Partitioner {
  val MaxPartitions = 3000
  private def clamp(p: Double): Int = math.max(1, math.min(MaxPartitions, math.ceil(p).toInt))
  override def extract(estRows: Double, rowLen: Double): Int = clamp(estRows * rowLen / (128e6))
  override def exchange(estRows: Double, rowLen: Double): Int =
    clamp(math.max(48.0, estRows * rowLen / (32e6)))
}

/** Turns a logical template instance into a physical plan, inserting Exchange
  * and Sort operators to satisfy required partitioning/sorting properties the
  * way a Cascades `Optimize Inputs` pass would (Section 2.3):
  *
  *  - joins and aggregates require their inputs partitioned on the key —
  *    an Exchange is inserted unless the child already delivers it;
  *  - merge joins and stream aggregates additionally require sorted inputs;
  *  - co-partitioned joins reuse an existing partition count where possible
  *    (the paper's "skipping exchange" plan change).
  */
final class Realizer(
    template: JobTemplate,
    cards: Map[Int, NodeCard],
    param: Double,
    partitioner: Partitioner,
) {

  private val logicalSize: Map[Int, Int] = {
    def walk(n: LogicalNode): Vector[(Int, Int)] =
      (n.id, n.size) +: n.children.flatMap(walk)
    walk(template.root).toMap
  }

  def realize(): Phys = build(template.root)

  private def mk(op: PhysOp, ln: LogicalNode, children: Vector[Phys], partitions: Int,
                 pKey: Option[String], sKey: Option[String]): Phys = {
    val cd = cards(ln.id)
    Phys(op, children, ln.id, ln.contentHash, cd.trueOut, cd.estOut, cd.trueBase, cd.estBase,
      cd.rowLen, partitions, pKey, sKey, cd.inputs, param, logicalSize(ln.id))
  }

  /** Auxiliary operator (Exchange/Sort) serving logical node `ln`: cardinality
    * passes through, properties change.
    */
  private def aux(op: PhysOp, ln: LogicalNode, child: Phys, partitions: Int,
                  pKey: Option[String], sKey: Option[String]): Phys = {
    val cd = cards(ln.id)
    Phys(op, Vector(child), ln.id, Determ.mix2(child.contentHash, Determ.hashStr(op.name)),
      child.trueOut, child.estOut, cd.trueBase, cd.estBase,
      child.rowLen, partitions, pKey, sKey, child.inputs, param, logicalSize(ln.id))
  }

  private def ensurePartitioned(child: Phys, ln: LogicalNode, key: String, forceP: Option[Int]): Phys =
    if (child.partitionKey.contains(key) && forceP.forall(_ == child.partitions)) child
    else {
      val p = forceP.getOrElse(partitioner.exchange(child.estOut, child.rowLen))
      aux(PhysOp.Exchange, ln, child, p, Some(key), None)
    }

  private def ensureSorted(child: Phys, ln: LogicalNode, key: String): Phys =
    if (child.sortKey.contains(key)) child
    else aux(PhysOp.Sort, ln, child, child.partitions, child.partitionKey, Some(key))

  private def build(ln: LogicalNode): Phys = ln.op match {
    case LogicalOp.Get(_) =>
      val cd = cards(ln.id)
      mk(PhysOp.Extract, ln, Vector.empty, partitioner.extract(cd.estOut, cd.rowLen), None, None)

    case LogicalOp.Select(_) =>
      val c = build(ln.children.head)
      mk(PhysOp.Filter, ln, Vector(c), c.partitions, c.partitionKey, c.sortKey)

    case LogicalOp.Project =>
      val c = build(ln.children.head)
      mk(PhysOp.Project, ln, Vector(c), c.partitions, c.partitionKey, c.sortKey)

    case LogicalOp.Process(_) =>
      val c = build(ln.children.head)
      mk(PhysOp.UdfProcessor, ln, Vector(c), c.partitions, c.partitionKey, None)

    case LogicalOp.Output =>
      val c = build(ln.children.head)
      mk(PhysOp.Output, ln, Vector(c), c.partitions, c.partitionKey, c.sortKey)

    case LogicalOp.Join(key, _) =>
      val l0 = build(ln.children(0))
      val r0 = build(ln.children(1))
      // Reuse an existing co-partitioning where one side already delivers the
      // key; otherwise partition both sides to the larger side's heuristic.
      val p: Int =
        if (l0.partitionKey.contains(key)) l0.partitions
        else if (r0.partitionKey.contains(key)) r0.partitions
        else {
          val big = if (l0.estOut * l0.rowLen >= r0.estOut * r0.rowLen) l0 else r0
          partitioner.exchange(big.estOut, big.rowLen)
        }
      val lp = ensurePartitioned(l0, ln.children(0), key, Some(p))
      val rp = ensurePartitioned(r0, ln.children(1), key, Some(p))
      template.physChoices.getOrElse(ln.id, PhysOp.HashJoin) match {
        case PhysOp.MergeJoin =>
          val ls = ensureSorted(lp, ln.children(0), key)
          val rs = ensureSorted(rp, ln.children(1), key)
          mk(PhysOp.MergeJoin, ln, Vector(ls, rs), p, Some(key), Some(key))
        case _ =>
          mk(PhysOp.HashJoin, ln, Vector(lp, rp), p, Some(key), None)
      }

    case LogicalOp.GroupBy(key, _) =>
      val c0 = build(ln.children.head)
      val cp = ensurePartitioned(c0, ln.children.head, key, None)
      template.physChoices.getOrElse(ln.id, PhysOp.HashAggregate) match {
        case PhysOp.StreamAggregate =>
          val cs = ensureSorted(cp, ln.children.head, key)
          mk(PhysOp.StreamAggregate, ln, Vector(cs), cs.partitions, Some(key), Some(key))
        case _ =>
          mk(PhysOp.HashAggregate, ln, Vector(cp), cp.partitions, Some(key), None)
      }
  }
}
