package repro.ml

import org.scalatest.funsuite.AnyFunSuite

class MetricsSpec extends AnyFunSuite {

  test("pearson of a perfect linear relation is 1") {
    val a = Seq(1.0, 2.0, 3.0, 4.0)
    assert(math.abs(Metrics.pearson(a.map(_ * 3 + 1), a) - 1.0) < 1e-12)
  }

  test("pearson of an inverse relation is -1") {
    val a = Seq(1.0, 2.0, 3.0, 4.0)
    assert(math.abs(Metrics.pearson(a.map(-_), a) + 1.0) < 1e-12)
  }

  test("pearson is scale and shift invariant") {
    val rng = new scala.util.Random(1)
    val p = Seq.fill(100)(rng.nextDouble())
    val a = Seq.fill(100)(rng.nextDouble())
    val base = Metrics.pearson(p, a)
    assert(math.abs(Metrics.pearson(p.map(_ * 7 + 3), a) - base) < 1e-9)
  }

  test("pearson of a constant series is defined as 0") {
    assert(Metrics.pearson(Seq(2.0, 2.0, 2.0), Seq(1.0, 2.0, 3.0)) == 0.0)
  }

  test("pearson is symmetric") {
    val rng = new scala.util.Random(2)
    val p = Seq.fill(50)(rng.nextDouble())
    val a = Seq.fill(50)(rng.nextDouble())
    assert(math.abs(Metrics.pearson(p, a) - Metrics.pearson(a, p)) < 1e-12)
  }

  test("pearson bounded in [-1, 1] on random data") {
    val rng = new scala.util.Random(3)
    for (i <- 1 to 20) {
      val p = Seq.fill(30)(rng.nextDouble() * i)
      val a = Seq.fill(30)(rng.nextDouble() * i)
      val c = Metrics.pearson(p, a)
      assert(c >= -1.0 - 1e-12 && c <= 1.0 + 1e-12)
    }
  }

  test("median error of perfect predictions is 0") {
    val a = Seq(1.0, 5.0, 10.0)
    assert(Metrics.medianErrorPct(a, a) == 0.0)
  }

  test("median error of 2x over-estimates is 100%") {
    val a = Seq(1.0, 5.0, 10.0)
    assert(math.abs(Metrics.medianErrorPct(a.map(_ * 2), a) - 100.0) < 1e-9)
  }

  test("median error of 50% under-estimates is 50%") {
    val a = Seq(2.0, 4.0, 8.0)
    assert(math.abs(Metrics.medianErrorPct(a.map(_ / 2), a) - 50.0) < 1e-9)
  }

  test("p95 error picks the tail") {
    val a = Seq.fill(100)(1.0)
    val p = a.updated(0, 100.0) // one 99x over-estimate
    assert(Metrics.p95ErrorPct(p, a) < 9900.0)
    assert(Metrics.p95ErrorPct(p, a) >= 0.0)
    // with 10 bad points the p95 must capture them
    val p2 = (0 until 100).map(i => if (i < 10) 10.0 else 1.0)
    assert(Metrics.p95ErrorPct(p2, a) > 800.0)
  }

  test("percentile endpoints") {
    val v = Seq(1.0, 2.0, 3.0, 4.0, 5.0)
    assert(Metrics.percentile(v, 0.0) == 1.0)
    assert(Metrics.percentile(v, 1.0) == 5.0)
    assert(Metrics.percentile(v, 0.5) == 3.0)
  }

  test("relErrors guards against zero actuals") {
    val e = Metrics.relErrors(Seq(1.0), Seq(0.0))
    assert(e.head.isFinite)
  }

  test("mismatched inputs are rejected") {
    intercept[IllegalArgumentException](Metrics.pearson(Seq(1.0), Seq(1.0, 2.0)))
    intercept[IllegalArgumentException](Metrics.medianErrorPct(Seq.empty, Seq.empty))
  }
}
