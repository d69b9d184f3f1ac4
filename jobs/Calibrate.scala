package repro.jobs

import repro.experiments._
import repro.ml.Metrics
import repro.cleo.{Family, Trainer => CleoTrainer}

/** Internal calibration probe: prints the raw shape statistics the paper's
  * tables depend on, so simulator constants can be tuned quickly.
  */
object Calibrate {
  def main(args: Array[String]): Unit = {
    val t0 = System.nanoTime()
    for (c <- Seq(1, 4)) {
      val ss = Workloads.samples(c)
      val test = Workloads.testDay(c)
      println(s"cluster $c: samples=${ss.size} jobs=${Workloads.runs(c).size} " +
        s"adhocFrac=${test.count(_.adhoc).toDouble / test.size}")
      val dflt = test.map(s => (s.defaultCost, s.actual))
      println(f"  default: corr=${Metrics.pearson(dflt.map(_._1), dflt.map(_._2))}%.3f " +
        f"med=${Metrics.medianErrorPct(dflt.map(_._1), dflt.map(_._2))}%.0f%% " +
        f"p95=${Metrics.p95ErrorPct(dflt.map(_._1), dflt.map(_._2))}%.0f%%")
      val tuned = test.map(s => (s.tunedCost, s.actual))
      println(f"  tuned:   corr=${Metrics.pearson(tuned.map(_._1), tuned.map(_._2))}%.3f " +
        f"med=${Metrics.medianErrorPct(tuned.map(_._1), tuned.map(_._2))}%.0f%%")
      val t1 = System.nanoTime()
      val set = Workloads.trained(c, None)
      println(f"  train time: ${(System.nanoTime() - t1) / 1e9}%.1f s " +
        s"models: sub=${set.sub.size} approx=${set.approx.size} input=${set.input.size} op=${set.operator.size}")
      for (fam <- Family.all) {
        val covered = test.filter(set.covers(fam, _))
        val cov = 100.0 * covered.size / test.size
        val pairs = covered.map(s => (set.predictFamily(fam, s).get, s.actual))
        println(f"  ${fam.name}%-18s cov=$cov%.0f%% corr=${Metrics.pearson(pairs.map(_._1), pairs.map(_._2))}%.2f " +
          f"med=${Metrics.medianErrorPct(pairs.map(_._1), pairs.map(_._2))}%.0f%%")
      }
      val comb = test.map(s => (set.predict(s), s.actual))
      println(f"  Combined           cov=100%% corr=${Metrics.pearson(comb.map(_._1), comb.map(_._2))}%.2f " +
        f"med=${Metrics.medianErrorPct(comb.map(_._1), comb.map(_._2))}%.0f%%")
      val adhoc = test.filter(_.adhoc)
      val combA = adhoc.map(s => (set.predict(s), s.actual))
      println(f"  Combined(adhoc)    corr=${Metrics.pearson(combA.map(_._1), combA.map(_._2))}%.2f " +
        f"med=${Metrics.medianErrorPct(combA.map(_._1), combA.map(_._2))}%.0f%%")
      val subAdhocCov = 100.0 * adhoc.count(set.covers(Family.Subgraph, _)) / math.max(1, adhoc.size)
      println(f"  subgraph adhoc coverage=$subAdhocCov%.0f%%")
      // per-operator diagnostics for the Operator family
      test.groupBy(_.op).toSeq.sortBy(_._1).foreach { case (op, os) =>
        val pr = os.map(s => (set.predictFamily(Family.Operator, s).get, s.actual))
        println(f"    op=$op%-16s n=${os.size}%6d corr=${Metrics.pearson(pr.map(_._1), pr.map(_._2))}%.2f " +
          f"med=${Metrics.medianErrorPct(pr.map(_._1), pr.map(_._2))}%.0f%% maxActual=${os.map(_.actual).max}%.1f")
      }
      val top = test.sortBy(-_.actual).take(5)
      top.foreach(s => println(f"    TOP actual=${s.actual}%.1f op=${s.op} opPred=${set.predictFamily(Family.Operator, s).get}%.1f comb=${set.predict(s)}%.1f P=${s.stats.p}%.0f I=${s.stats.i}%.2e"))
    }
    println(f"total ${(System.nanoTime() - t0) / 1e9}%.1f s")
  }
}
