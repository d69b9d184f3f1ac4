package repro.scopesim

import org.scalatest.funsuite.AnyFunSuite

class RealizerSpec extends AnyFunSuite {

  /** A hand-built two-scan join + group-by template. */
  private def template(joinImpl: PhysOp, aggImpl: PhysOp): (JobTemplate, Map[Int, NodeCard]) = {
    val l = LogicalNode(0, LogicalOp.Get("inA"), Vector.empty)
    val r = LogicalNode(1, LogicalOp.Get("inB"), Vector.empty)
    val f = LogicalNode(2, LogicalOp.Select(0.5), Vector(l))
    val j = LogicalNode(3, LogicalOp.Join("k1", 0.8), Vector(f, r))
    val g = LogicalNode(4, LogicalOp.GroupBy("k1", 0.01), Vector(j))
    val root = LogicalNode(5, LogicalOp.Output, Vector(g))
    val t = JobTemplate(1L, 1, root, Map(3 -> joinImpl, 4 -> aggImpl), 1.0, adhoc = false)
    val cards = Map(
      0 -> NodeCard(1e7, 1.1e7, 1e7, 1.1e7, 100, Vector("inA")),
      1 -> NodeCard(2e7, 1.9e7, 2e7, 1.9e7, 80, Vector("inB")),
      2 -> NodeCard(5e6, 5.5e6, 1e7, 1.1e7, 100, Vector("inA")),
      3 -> NodeCard(1.6e7, 1.5e7, 3e7, 3e7, 180, Vector("inA", "inB")),
      4 -> NodeCard(1.6e5, 1.5e5, 3e7, 3e7, 144, Vector("inA", "inB")),
      5 -> NodeCard(1.6e5, 1.5e5, 3e7, 3e7, 144, Vector("inA", "inB")),
    )
    (t, cards)
  }

  private def realize(joinImpl: PhysOp, aggImpl: PhysOp): Phys = {
    val (t, cards) = template(joinImpl, aggImpl)
    new Realizer(t, cards, 1.0, DefaultPartitioner).realize()
  }

  test("hash join gets Exchange on both unpartitioned inputs") {
    val plan = realize(PhysOp.HashJoin, PhysOp.HashAggregate)
    val join = plan.allNodes.find(_.op == PhysOp.HashJoin).get
    assert(join.children.forall(_.op == PhysOp.Exchange))
  }

  test("co-partitioned join children share one partition count") {
    val plan = realize(PhysOp.HashJoin, PhysOp.HashAggregate)
    val join = plan.allNodes.find(_.op == PhysOp.HashJoin).get
    assert(join.children.map(_.partitions).distinct.size == 1)
    assert(join.partitions == join.children.head.partitions)
  }

  test("merge join inserts Sort above each exchanged input") {
    val plan = realize(PhysOp.MergeJoin, PhysOp.HashAggregate)
    val join = plan.allNodes.find(_.op == PhysOp.MergeJoin).get
    assert(join.children.forall(_.op == PhysOp.Sort))
    assert(join.children.forall(_.sortKey.contains("k1")))
  }

  test("merge join output is sorted and partitioned on the key") {
    val plan = realize(PhysOp.MergeJoin, PhysOp.HashAggregate)
    val join = plan.allNodes.find(_.op == PhysOp.MergeJoin).get
    assert(join.sortKey.contains("k1") && join.partitionKey.contains("k1"))
  }

  test("group-by on the join key reuses the join's partitioning (no Exchange)") {
    val plan = realize(PhysOp.HashJoin, PhysOp.HashAggregate)
    val agg = plan.allNodes.find(_.op == PhysOp.HashAggregate).get
    // child of the aggregate must be the join itself: partitionKey already k1
    assert(agg.children.head.op == PhysOp.HashJoin)
  }

  test("stream aggregate over merge join needs no extra Sort (sort property reused)") {
    val plan = realize(PhysOp.MergeJoin, PhysOp.StreamAggregate)
    val agg = plan.allNodes.find(_.op == PhysOp.StreamAggregate).get
    assert(agg.children.head.op == PhysOp.MergeJoin)
  }

  test("stream aggregate over hash join requires a Sort") {
    val plan = realize(PhysOp.HashJoin, PhysOp.StreamAggregate)
    val agg = plan.allNodes.find(_.op == PhysOp.StreamAggregate).get
    assert(agg.children.head.op == PhysOp.Sort)
  }

  test("unary operators inherit their child's partitioning") {
    val plan = realize(PhysOp.HashJoin, PhysOp.HashAggregate)
    val out = plan // Output root
    assert(out.op == PhysOp.Output)
    assert(out.partitions == out.children.head.partitions)
  }

  test("extract partition count follows the 128MB heuristic") {
    val plan = realize(PhysOp.HashJoin, PhysOp.HashAggregate)
    val ext = plan.allNodes.filter(_.op == PhysOp.Extract)
    ext.foreach { e =>
      val expected = math.max(1, math.ceil(e.estOut * e.rowLen / 128e6).toInt)
      assert(e.partitions == math.min(DefaultPartitioner.MaxPartitions, expected))
    }
  }

  test("depth and CL features are consistent") {
    val plan = realize(PhysOp.HashJoin, PhysOp.HashAggregate)
    assert(plan.depth == plan.allNodes.map(_.depth).max)
    val join = plan.allNodes.find(_.op == PhysOp.HashJoin).get
    assert(join.cl == 4) // logical subtree at the join: Join, Select, Get, Get
  }
}
