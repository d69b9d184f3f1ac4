package repro.ml

import org.scalatest.funsuite.AnyFunSuite

class MLPSpec extends AnyFunSuite {

  test("fits a linear function") {
    val rng = new scala.util.Random(1)
    val xs = Array.fill(300)(Array(rng.nextDouble() * 4 - 2, rng.nextDouble() * 4 - 2))
    val ys = xs.map(x => 3.0 * x(0) - x(1) + 1.0)
    val m = MLP(hidden = Array(16), epochs = 150, seed = 1).fit(xs, ys)
    val med = Metrics.medianErrorPct(xs.map(m.predict).toSeq, ys.map(_ + 10.0).map(_ - 10.0).toSeq)
    val mse = xs.zip(ys).map { case (x, y) => math.pow(m.predict(x) - y, 2) }.sum / xs.length
    assert(mse < 0.3, s"mse=$mse med=$med")
  }

  test("fits a mild nonlinearity better than a linear model") {
    val rng = new scala.util.Random(2)
    val xs = Array.fill(400)(Array(rng.nextDouble() * 4 - 2))
    val ys = xs.map(x => x(0) * x(0))
    def mse(t: Trainer) = {
      val m = t.fit(xs, ys)
      xs.zip(ys).map { case (x, y) => math.pow(m.predict(x) - y, 2) }.sum / xs.length
    }
    assert(mse(MLP(hidden = Array(30), epochs = 200, seed = 2)) < mse(ElasticNet()))
  }

  test("deterministic under fixed seed") {
    val rng = new scala.util.Random(3)
    val xs = Array.fill(100)(Array(rng.nextDouble()))
    val ys = xs.map(x => 2 * x(0))
    val a = MLP(epochs = 30, seed = 7).fit(xs, ys)
    val b = MLP(epochs = 30, seed = 7).fit(xs, ys)
    xs.take(10).foreach(x => assert(a.predict(x) === b.predict(x)))
  }

  test("survives tiny sample counts") {
    val xs = Array(Array(1.0), Array(2.0), Array(3.0))
    val ys = Array(1.0, 2.0, 3.0)
    val m = MLP(epochs = 50, batch = 2, seed = 4).fit(xs, ys)
    assert(!m.predict(Array(2.0)).isNaN)
  }
}
