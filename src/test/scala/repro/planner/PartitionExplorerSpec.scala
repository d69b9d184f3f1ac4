package repro.planner

import org.scalatest.funsuite.AnyFunSuite

class PartitionExplorerSpec extends AnyFunSuite {
  import PartitionExplorer._

  test("analytical optimum matches sqrt(θP/θC) when both positive") {
    val p = analyticalOptimum(Seq((400.0, 1.0)))
    assert(p == 20)
  }

  test("analytical optimum sums thetas across stage members") {
    val p = analyticalOptimum(Seq((100.0, 0.5), (300.0, 0.5)))
    assert(p == 20)
  }

  test("negative θP with positive θC pins to minimum partitions") {
    assert(analyticalOptimum(Seq((-10.0, 2.0))) == 1)
  }

  test("positive θP with negative θC pins to maximum partitions") {
    assert(analyticalOptimum(Seq((10.0, -0.001))) == MaxPartitions)
  }

  test("both negative picks the cheaper boundary") {
    // cost(P) = -100/P - 0.001P : cost(1) = -100.001, cost(3000) = -3.03 -> P=1
    assert(analyticalOptimum(Seq((-100.0, -0.001))) == 1)
    // cost(P) = -1/P - 1.0P : cost(3000) = -3000 -> P=3000
    assert(analyticalOptimum(Seq((-1.0, -1.0))) == MaxPartitions)
  }

  test("analytical optimum is clamped to [1, pMax]") {
    assert(analyticalOptimum(Seq((1e12, 1e-9)), pMax = 100) == 100)
    assert(analyticalOptimum(Seq((0.0001, 1e9))) == 1)
  }

  test("geometric sequence starts 1,2 and grows by ~1/s") {
    val g = geometricCandidates(s = 1.0) // doubles each step
    assert(g.take(4) == Seq(1, 2, 4, 8))
    assert(g.last == MaxPartitions)
  }

  test("geometricCandidatesOfSize yields roughly the requested count") {
    for (k <- Seq(4, 8, 16, 32)) {
      val g = geometricCandidatesOfSize(k)
      assert(math.abs(g.size - k) <= k / 2 + 2, s"k=$k size=${g.size}")
    }
  }

  test("uniform candidates span the full range") {
    val u = uniformCandidates(10)
    assert(u.head <= 300 && u.last == MaxPartitions)
    assert(u.size == 10)
  }

  test("random candidates stay in range and are deterministic per seed") {
    val a = randomCandidates(20, seed = 5)
    val b = randomCandidates(20, seed = 5)
    assert(a == b)
    assert(a.forall(p => p >= 1 && p <= MaxPartitions))
  }

  test("bestOf picks the candidate minimizing stage cost on a synthetic model") {
    // cost model via a trained elastic net on y = 100/P + 0.01P
    val stats = repro.core.OpStats(1e6, 1e6, 1e5, 100, 1, 0L, 1.0, 2, 2)
    val xs = Seq(1, 2, 4, 8, 16, 32, 64, 128, 256, 512, 1024, 2048, 3000).map(p =>
      repro.core.Features.vector(stats.withPartitions(p)))
    val ys = Seq(1, 2, 4, 8, 16, 32, 64, 128, 256, 512, 1024, 2048, 3000).map(p =>
      math.log1p(1e-4 * (1e6.toDouble / p) + 0.01 * p))
    val net = repro.ml.ElasticNet(l1 = 1e-6, l2 = 1e-6).fit(xs.toArray, ys.toArray)
    val model = repro.cleo.CostModel(net, xs.size, ys.min, ys.max)
    val ops = Seq(StageOp(model, stats))
    val exh = exhaustive(ops)
    val best = bestOf(ops, geometricCandidatesOfSize(20))
    val cExh = stageCost(ops, exh)
    val cBest = stageCost(ops, best)
    assert(cBest <= cExh * 1.5, s"geometric pick $best (cost $cBest) vs optimum $exh (cost $cExh)")
  }
}
