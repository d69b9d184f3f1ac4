package repro.ml

import org.scalatest.funsuite.AnyFunSuite

class StandardizerSpec extends AnyFunSuite {

  test("standardized columns have zero mean and unit variance") {
    val rng = new scala.util.Random(1)
    val xs = Array.fill(500)(Array(rng.nextDouble() * 100 + 7, rng.nextGaussian() * 3 - 2))
    val sc = Standardizer.fit(xs)
    val z = xs.map(sc.transform)
    for (j <- 0 until 2) {
      val mean = z.map(_(j)).sum / z.length
      val v = z.map(x => (x(j) - mean) * (x(j) - mean)).sum / z.length
      assert(math.abs(mean) < 1e-9)
      assert(math.abs(v - 1.0) < 1e-6)
    }
  }

  test("zero-variance columns become exactly zero") {
    val xs = Array.fill(50)(Array(42.0, 1.0))
    val sc = Standardizer.fit(xs)
    xs.map(sc.transform).foreach(z => assert(z(0) == 0.0))
  }

  test("transform is affine: order-preserving per column") {
    val xs = Array(Array(1.0), Array(2.0), Array(3.0))
    val sc = Standardizer.fit(xs)
    val z = xs.map(sc.transform(_)(0))
    assert(z(0) < z(1) && z(1) < z(2))
  }

  test("fit is deterministic") {
    val rng = new scala.util.Random(2)
    val xs = Array.fill(100)(Array(rng.nextDouble()))
    val a = Standardizer.fit(xs)
    val b = Standardizer.fit(xs)
    assert(a.mean.sameElements(b.mean) && a.std.sameElements(b.std))
  }
}
