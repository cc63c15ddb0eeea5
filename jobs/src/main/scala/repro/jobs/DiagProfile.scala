package repro.jobs

import java.nio.file.Paths
import repro.exp.WorkloadRunner
import repro.sim.{ClusterSimulator, SparklensEstimator}
import repro.tpcds.Queries

/** Diagnostic: profile a few queries fresh and print their stage structure
  * and t(n) curves. Usage: runMain repro.jobs.DiagProfile <sf> <qid>…
  */
object DiagProfile {
  def main(args: Array[String]): Unit = {
    val spark = JobSupport.session("DiagProfile")
    val sf    = args(0).toDouble
    val qs    = args.drop(1).map(Queries.byId).toIndexedSeq
    val w = WorkloadRunner.build(spark, sf, s"DIAG$sf", queries = qs,
      dataDir = Paths.get("target/diag-data"), cacheDir = Paths.get(s"target/diag-profiles-${System.nanoTime()}"))
    for (q <- w.queries) {
      val p = q.profile
      println(f"== ${q.query.id}  wall=${p.wallMs}%.0f driver=${p.driverMs}%.0f totalTask=${p.totalTaskMs}%.0f stages=${p.stages.size}")
      p.stages.sortBy(s => (s.jobIndex, s.stageId)).foreach { s =>
        println(f"   stage ${s.stageId}%4d job ${s.jobIndex}%2d parents=${s.parentIds.mkString(",")}%-10s tasks=${s.numTasks}%4d " +
          f"total=${s.totalTaskMs}%8.0f max=${s.maxTaskMs}%6.0f shuffleKB=${s.shuffleReadBytes / 1024}%8d")
      }
      val grid = Seq(1, 3, 8, 16, 32, 48)
      println("   sparklens: " + grid.map(n => f"t($n)=${SparklensEstimator.estimate(p, n)}%.0f").mkString(" "))
      println("   actual:    " + grid.map(n => f"t($n)=${ClusterSimulator.measure(p, n)}%.0f").mkString(" "))
      println("   elbowActual=" + repro.core.ConfigSelector.elbow(
        repro.core.ConfigSelector.interpolate(q.actual)))
    }
  }
}
