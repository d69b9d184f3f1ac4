package repro.planner

import org.scalatest.funsuite.AnyFunSuite
import repro.cleo.{CleoPredictor, Trainer}
import repro.scopesim._

class PlannerSpec extends AnyFunSuite {

  private lazy val cfg = WorkloadGen.cluster(4)
  private lazy val runs = WorkloadGen.genJobs(cfg)
  private lazy val samples = Logs.samples(runs, cfg.gtConfig)
  private lazy val predictor = {
    val d1 = samples.filter(_.day == 1)
    val stacked = Trainer.withCombined(Trainer.trainIndividuals(d1), samples.filter(_.day == 2))
    new CleoPredictor(Trainer.trainIndividuals(samples.filter(_.day <= 2)).copy(combined = stacked.combined))
  }
  private lazy val templates = WorkloadGen.genTemplates(cfg).map(t => t.id -> t).toMap

  test("stage groups partition the plan's operators exactly") {
    runs.take(50).foreach { r =>
      val groups = PartitionOptimizer.stageGroups(r.root)
      val all = groups.flatten
      assert(all.size == r.root.allNodes.size, "every operator in exactly one stage")
    }
  }

  test("operators in one stage share one partition count (default plans)") {
    runs.take(50).foreach { r =>
      PartitionOptimizer.stageGroups(r.root).foreach { g =>
        assert(g.map(_.partitions).distinct.size == 1,
          s"stage mixes counts: ${g.map(n => s"${n.op.name}:${n.partitions}")}")
      }
    }
  }

  test("partition optimization keeps the plan structurally valid") {
    val r = runs.find(r => r.day == 3 && !r.adhoc).get
    val opt = PartitionOptimizer.optimize(r.root, predictor)
    assert(opt.allNodes.size <= r.root.allNodes.size) // elision can only drop ops
    PartitionOptimizer.stageGroups(opt).foreach { g =>
      assert(g.map(_.partitions).distinct.size == 1)
    }
    opt.allNodes.foreach(n => assert(n.partitions >= 1 && n.partitions <= 3000))
  }

  test("partition optimization changes partition counts for most plans") {
    val rs = runs.filter(r => r.day == 3 && !r.adhoc).take(30)
    val changed = rs.count { r =>
      val opt = PartitionOptimizer.optimize(r.root, predictor)
      opt.allNodes.map(_.partitions).toSet != r.root.allNodes.map(_.partitions).toSet
    }
    assert(changed > rs.size / 3, s"only $changed/${rs.size} plans changed")
  }

  test("choicePoints enumerates joins and group-bys") {
    val t = templates.values.find(t => CascadesLite.choicePoints(t.root).nonEmpty).get
    val points = CascadesLite.choicePoints(t.root)
    points.foreach { case (_, alts) =>
      assert(alts == Seq(PhysOp.HashJoin, PhysOp.MergeJoin) ||
        alts == Seq(PhysOp.HashAggregate, PhysOp.StreamAggregate))
    }
  }

  test("optimizer returns the cheapest enumerated candidate under its own coster") {
    val r = runs.find(r => r.day == 3 && !r.adhoc &&
      CascadesLite.choicePoints(templates(r.templateId).root).nonEmpty).get
    val t = templates(r.templateId)
    val cards = r.root.allNodes.map(n => n.logicalId ->
      NodeCard(n.trueOut, n.estOut, n.trueBase, n.estBase, n.rowLen, n.inputs)).toMap
    val planned = CascadesLite.optimize(t, cards, r.param, CascadesLite.DefaultCoster)
    // flipping any single choice must not be cheaper under the same coster
    CascadesLite.choicePoints(t.root).take(3).foreach { case (id, alts) =>
      alts.filterNot(_ == planned.choices(id)).foreach { alt =>
        val t2 = t.copy(physChoices = planned.choices.updated(id, alt))
        val other = new Realizer(t2, cards, r.param, DefaultPartitioner).realize()
        assert(DefaultCostModel.jobCost(other) >= planned.cost - 1e-6)
      }
    }
  }

  test("cleo planner never exceeds default planner under the learned cost model") {
    val rs = runs.filter(r => r.day == 3 && !r.adhoc).take(10)
    rs.foreach { r =>
      val t = templates(r.templateId)
      val dflt = CascadesLite.optimizeRun(r, t, cfg, CascadesLite.DefaultCoster)
      val cleo = CascadesLite.optimizeRun(r, t, cfg, CascadesLite.CleoCoster(predictor))
      assert(predictor.jobCost(cleo.root) <= predictor.jobCost(dflt.root) * 1.001 + 1e-6)
    }
  }

  test("comparison executes both plans on the ground truth") {
    val r = runs.find(r => r.day == 3 && !r.adhoc).get
    val c = CascadesLite.compare(r, templates(r.templateId), cfg, predictor)
    assert(c.defaultLatency > 0 && c.cleoLatency > 0)
    assert(c.defaultCpu > 0 && c.cleoCpu > 0)
  }

  test("cleo plan changes reduce latency on aggregate (the headline claim)") {
    val rs = runs.filter(r => r.day == 3 && !r.adhoc)
      .groupBy(_.templateId).values.map(_.head).take(40).toSeq
    val comps = rs.map(r => CascadesLite.compare(r, templates(r.templateId), cfg, predictor))
    val changed = comps.filter(_.changed)
    assert(changed.nonEmpty, "expected some plan changes")
    val dflt = changed.map(_.defaultLatency).sum
    val cleo = changed.map(_.cleoLatency).sum
    assert(cleo < dflt, s"cumulative latency should improve: cleo=$cleo default=$dflt")
  }
}
