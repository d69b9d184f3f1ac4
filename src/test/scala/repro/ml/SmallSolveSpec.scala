package repro.ml

import org.scalatest.funsuite.AnyFunSuite

class SmallSolveSpec extends AnyFunSuite {

  test("solve3 solves a well-conditioned system") {
    val a = Array(Array(2.0, 1.0, 0.0), Array(1.0, 3.0, 1.0), Array(0.0, 1.0, 4.0))
    val x = Array(1.0, -2.0, 3.0)
    val b = (0 until 3).map(r => (0 until 3).map(c => a(r)(c) * x(c)).sum).toArray
    val got = SmallSolve.solve3(a.map(_.clone), b).get
    got.zip(x).foreach { case (g, w) => assert(math.abs(g - w) < 1e-9) }
  }

  test("solve3 returns None on a singular system") {
    val a = Array(Array(1.0, 2.0, 3.0), Array(2.0, 4.0, 6.0), Array(1.0, 1.0, 1.0))
    assert(SmallSolve.solve3(a, Array(1.0, 2.0, 3.0)).isEmpty)
  }

  test("solve3 pivots when the leading entry is zero") {
    val a = Array(Array(0.0, 1.0, 0.0), Array(1.0, 0.0, 0.0), Array(0.0, 0.0, 1.0))
    val got = SmallSolve.solve3(a, Array(5.0, 7.0, 9.0)).get
    assert(got.toSeq == Seq(7.0, 5.0, 9.0))
  }

  test("lsq3 recovers coefficients from overdetermined noiseless data") {
    val rows = (1 to 50).map { i =>
      val p = i.toDouble
      (Array(1.0, 1.0 / p, p), 2.5 + 100.0 / p + 0.3 * p)
    }
    val w = SmallSolve.lsq3(rows).get
    assert(math.abs(w(0) - 2.5) < 1e-6)
    assert(math.abs(w(1) - 100.0) < 1e-4)
    assert(math.abs(w(2) - 0.3) < 1e-7)
  }

  test("lsq3 on noisy data stays close") {
    val rng = new scala.util.Random(3)
    val rows = (1 to 200).map { i =>
      val p = 1.0 + rng.nextDouble() * 100
      (Array(1.0, 1.0 / p, p), 10.0 / p + 0.5 * p + rng.nextGaussian() * 0.01)
    }
    val w = SmallSolve.lsq3(rows).get
    assert(math.abs(w(1) - 10.0) < 1.0)
    assert(math.abs(w(2) - 0.5) < 0.01)
  }
}
