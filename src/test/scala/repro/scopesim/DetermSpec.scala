package repro.scopesim

import org.scalatest.funsuite.AnyFunSuite

class DetermSpec extends AnyFunSuite {

  test("mix is deterministic and sensitive to input") {
    assert(Determ.mix(42L) == Determ.mix(42L))
    assert(Determ.mix(42L) != Determ.mix(43L))
  }

  test("hashStr distinguishes similar strings") {
    val hs = Seq("Extract", "Extrac", "extract", "Extract ").map(Determ.hashStr)
    assert(hs.distinct.size == hs.size)
  }

  test("uniform stays in [0,1)") {
    (0 until 2000).foreach { i =>
      val u = Determ.uniform(i.toLong * 7919)
      assert(u >= 0.0 && u < 1.0)
    }
  }

  test("uniform has roughly uniform mean") {
    val mean = (0 until 10000).map(i => Determ.uniform(Determ.mix(i.toLong))).sum / 10000
    assert(math.abs(mean - 0.5) < 0.02)
  }

  test("gauss has ~zero mean and ~unit variance") {
    val xs = (0 until 10000).map(i => Determ.gauss(Determ.mix(i.toLong + 555)))
    val mean = xs.sum / xs.size
    val v = xs.map(x => (x - mean) * (x - mean)).sum / xs.size
    assert(math.abs(mean) < 0.05, s"mean=$mean")
    assert(math.abs(v - 1.0) < 0.1, s"var=$v")
  }

  test("lognormal(sigma=0) is exactly 1") {
    assert(Determ.lognormal(123L, 0.0) == 1.0)
  }

  test("lognormal median near 1") {
    val xs = (0 until 5001).map(i => Determ.lognormal(Determ.mix(i.toLong), 0.5)).sorted
    val med = xs(2500)
    assert(med > 0.85 && med < 1.18, s"median=$med")
  }

  test("mix2 is order-sensitive") {
    assert(Determ.mix2(1L, 2L) != Determ.mix2(2L, 1L))
  }
}
