package repro.scopesim

import org.scalatest.funsuite.AnyFunSuite

class LogsSpec extends AnyFunSuite {

  private lazy val cfg = WorkloadGen.cluster(4)
  private lazy val runs = WorkloadGen.genJobs(cfg).take(200)
  private lazy val samples = Logs.samples(runs, cfg.gtConfig)

  test("one sample per operator instance") {
    assert(samples.size == runs.map(_.root.allNodes.size).sum)
  }

  test("samples carry provenance of their run") {
    val byJob = samples.groupBy(_.jobId)
    runs.foreach { r =>
      val ss = byJob(r.jobId)
      assert(ss.forall(s => s.cluster == r.cluster && s.day == r.day && s.adhoc == r.adhoc))
      assert(ss.forall(_.templateId == r.templateId))
    }
  }

  test("actual latencies are positive and finite") {
    samples.foreach(s => assert(s.actual > 0 && s.actual.isFinite))
  }

  test("features are finite and of the declared dimension") {
    samples.take(3000).foreach { s =>
      val f = s.features
      assert(f.length == repro.core.Features.dim)
      assert(f.forall(v => !v.isNaN && !v.isInfinite))
    }
  }

  test("signatures in samples match recomputation from the plan") {
    val r = runs.head
    val ss = Logs.samples(r, cfg.gtConfig)
    val nodes = r.root.allNodes
    nodes.zip(ss).foreach { case (n, s) =>
      assert(s.sigSub == Signatures.subgraph(n))
      assert(s.sigApprox == Signatures.approx(n))
      assert(s.sigInput == Signatures.inputSig(n))
      assert(s.op == n.op.name)
    }
  }

  test("actuals are reproducible for the same run") {
    val r = runs.head
    val a = Logs.samples(r, cfg.gtConfig).map(_.actual)
    val b = Logs.samples(r, cfg.gtConfig).map(_.actual)
    assert(a == b)
  }

  test("recurring instances of a template share signatures but differ in actuals") {
    val group = runs.filter(!_.adhoc).groupBy(_.templateId).values.find(_.size >= 2).get
    val s1 = Logs.samples(group(0), cfg.gtConfig)
    val s2 = Logs.samples(group(1), cfg.gtConfig)
    assert(s1.map(_.sigSub) == s2.map(_.sigSub))
    assert(s1.map(_.actual) != s2.map(_.actual))
  }
}
