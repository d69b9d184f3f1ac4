package repro.cleo

import org.scalatest.funsuite.AnyFunSuite
import repro.scopesim._

class CardLearnerSpec extends AnyFunSuite {

  test("poisson regression recovers a constant correction factor") {
    // actual = 3x estimated, across two orders of magnitude
    val rows = (1 to 200).map { i =>
      val est = 10.0 * i
      (3.0 * est, est, est * 2)
    }
    val m = CardLearner.fitPoisson(rows)
    for (est <- Seq(50.0, 500.0, 1500.0)) {
      val p = m.predict(est, est * 2)
      assert(math.abs(p / (3 * est) - 1.0) < 0.25, s"est=$est pred=$p want=${3 * est}")
    }
  }

  test("poisson regression is exact-ish on identity data") {
    val rows = (1 to 100).map { i => (i * 7.0, i * 7.0, i * 9.0) }
    val m = CardLearner.fitPoisson(rows)
    assert(math.abs(m.predict(700.0, 900.0) / 700.0 - 1.0) < 0.2)
  }

  test("degenerate input falls back safely") {
    val m = CardLearner.fitPoisson(Seq((1.0, 1.0, 1.0)))
    assert(!m.predict(5.0, 5.0).isNaN)
  }

  test("trained corrector improves cardinality estimates on a real cluster") {
    val cfg = WorkloadGen.cluster(4)
    val samples = Logs.samples(WorkloadGen.genJobs(cfg), cfg.gtConfig)
    val cl = CardLearner.train(samples.filter(_.day <= 2))
    val test = samples.filter(_.day == 3).filter(s => cl.outBySig.contains(s.sigSub))
    assert(test.nonEmpty)
    def logErr(pairs: Seq[(Double, Double)]) = {
      val v = pairs.map { case (p, a) => math.abs(math.log(math.max(1, p) / math.max(1, a))) }.sorted
      v(v.size / 2)
    }
    val before = logErr(test.map(s => (s.stats.c, s.trueC)))
    val after = logErr(test.map(s => (cl.correctedStats(s).c, s.trueC)))
    assert(after < before, s"corrected=$after raw=$before")
  }

  test("corrected stats never go below 1") {
    val cfg = WorkloadGen.cluster(4)
    val samples = Logs.samples(WorkloadGen.genJobs(cfg), cfg.gtConfig).take(3000)
    val cl = CardLearner.train(samples)
    samples.take(500).foreach { s =>
      val c = cl.correctedStats(s)
      assert(c.i >= 1.0 && c.c >= 1.0)
    }
  }
}
