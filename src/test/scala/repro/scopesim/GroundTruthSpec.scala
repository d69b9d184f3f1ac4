package repro.scopesim

import org.scalatest.funsuite.AnyFunSuite

class GroundTruthSpec extends AnyFunSuite {

  private val cfg = GroundTruth.Config(noiseSigma = 0.0, hiddenSigma = 0.0, outlierFrac = 0.0)

  private def leaf(rows: Double, rowLen: Double = 100, p: Int = 10): Phys =
    Phys(PhysOp.Extract, Vector.empty, 0, Determ.hashStr("leaf"), rows, rows, rows, rows,
      rowLen, p, None, None, Vector("in"), 1.0, 1)

  private def over(op: PhysOp, child: Phys, p: Int): Phys =
    Phys(op, Vector(child), 1, Determ.hashStr("n1"), child.trueOut, child.estOut,
      child.trueBase, child.estBase, child.rowLen, p, None, None, child.inputs, 1.0, 2)

  test("work grows monotonically with input size") {
    val w1 = GroundTruth.work(leaf(1e6))
    val w2 = GroundTruth.work(leaf(1e8))
    assert(w2 > w1 * 50)
  }

  test("latency is U-shaped in the partition count") {
    val big = leaf(2e8, 200, 1)
    def lat(p: Int) = GroundTruth.exclusiveLatency(big.copy(partitions = p), 7L, cfg)
    val l1 = lat(1)
    val lMid = lat(400)
    val lMax = lat(3000)
    assert(lMid < l1, s"mid=$lMid one=$l1")
    assert(lMid < lMax, s"mid=$lMid max=$lMax")
  }

  test("per-partition overhead makes tiny inputs prefer few partitions") {
    val small = leaf(1000, 50, 1)
    def lat(p: Int) = GroundTruth.exclusiveLatency(small.copy(partitions = p), 7L, cfg)
    assert(lat(1) < lat(3000))
  }

  test("pipelining: running over a Sort is slower than over a Filter") {
    val l = leaf(1e7)
    val overSort = over(PhysOp.HashAggregate, l.copy(op = PhysOp.Sort), 10)
    val overFilter = over(PhysOp.HashAggregate, l.copy(op = PhysOp.Filter), 10)
    assert(GroundTruth.exclusiveLatency(overSort, 7L, cfg) >
      GroundTruth.exclusiveLatency(overFilter, 7L, cfg))
  }

  test("hidden multiplier is stable per subexpression content") {
    val c = GroundTruth.Config(hiddenSigma = 0.7)
    val n = leaf(1e6)
    assert(GroundTruth.hiddenMul(n, c) == GroundTruth.hiddenMul(n.copy(partitions = 999), c))
    val other = n.copy(contentHash = Determ.hashStr("other"))
    assert(GroundTruth.hiddenMul(n, c) != GroundTruth.hiddenMul(other, c))
  }

  test("latency deterministic per (plan, instance seed)") {
    val full = GroundTruth.Config(noiseSigma = 0.2, hiddenSigma = 0.5, outlierFrac = 0.02)
    val n = leaf(5e6)
    assert(GroundTruth.exclusiveLatency(n, 11L, full) == GroundTruth.exclusiveLatency(n, 11L, full))
    assert(GroundTruth.exclusiveLatency(n, 11L, full) != GroundTruth.exclusiveLatency(n, 12L, full))
  }

  test("noise is multiplicative and bounded in probability") {
    val noisy = GroundTruth.Config(noiseSigma = 0.1, hiddenSigma = 0.0, outlierFrac = 0.0)
    val n = leaf(1e7)
    val base = GroundTruth.exclusiveLatency(n, 1L, cfg)
    val ratios = (0 until 500).map(i => GroundTruth.exclusiveLatency(n, i.toLong, noisy) / base)
    // skew alone can raise latency; ratios must hover near 1 within a small band
    assert(ratios.count(r => r > 0.5 && r < 2.5) > 480)
  }

  test("merge join is cheaper than hash join on identical inputs") {
    val l = leaf(1e7); val r = leaf(1e7)
    def join(op: PhysOp) = Phys(op, Vector(l, r), 2, Determ.hashStr("j"), 1e7, 1e7, 2e7, 2e7,
      200, 10, Some("k"), None, Vector("in"), 1.0, 3)
    assert(GroundTruth.work(join(PhysOp.MergeJoin)) < GroundTruth.work(join(PhysOp.HashJoin)))
  }

  test("cpuSeconds scales with work not partitions") {
    val n = leaf(1e8, 100, 10)
    val cpu10 = GroundTruth.cpuSeconds(n, 3L, cfg)
    val cpu100 = GroundTruth.cpuSeconds(n.copy(partitions = 100), 3L, cfg)
    // more partitions add scheduling overhead but not less total work
    assert(cpu100 >= cpu10)
  }

  test("job latency sums operator exclusive latencies") {
    val l = leaf(1e6)
    val top = over(PhysOp.Output, l, 10)
    val sum = GroundTruth.exclusiveLatency(l, 5L, cfg) + GroundTruth.exclusiveLatency(top, 5L, cfg)
    assert(math.abs(GroundTruth.jobLatency(top, 5L, cfg) - sum) < 1e-9)
  }
}
