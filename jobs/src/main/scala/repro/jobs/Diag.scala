package repro.jobs

import java.nio.file.Paths
import repro.sim.{ClusterSimulator, SparklensEstimator, TaskProfile}

/** Diagnostic: print stage structure and t(n) curves for cached profiles.
  * Usage: runMain repro.jobs.Diag <profileDir> <queryId> [<queryId>…]
  */
object Diag {
  def main(args: Array[String]): Unit = {
    val dir = Paths.get(args(0))
    for (qid <- args.drop(1)) {
      val p = TaskProfile.load(dir.resolve(s"$qid.bin"))
      println(s"== $qid  wall=${p.wallMs}%s driver=${f"${p.driverMs}%.0f"}ms totalTask=${f"${p.totalTaskMs}%.0f"}ms stages=${p.stages.size}")
      p.stages.sortBy(s => (s.jobIndex, s.stageId)).foreach { s =>
        println(f"   stage ${s.stageId}%3d job ${s.jobIndex}%2d parents=${s.parentIds.mkString(",")}%-8s tasks=${s.numTasks}%4d " +
          f"total=${s.totalTaskMs}%8.0fms max=${s.maxTaskMs}%6.0fms shuffle=${s.shuffleReadBytes / 1024}%8dKB input=${s.inputBytes / 1024}%8dKB")
      }
      val grid = Seq(1, 3, 8, 16, 32, 48)
      println("   sparklens: " + grid.map(n => f"t($n)=${SparklensEstimator.estimate(p, n)}%.0f").mkString(" "))
      println("   actual:    " + grid.map(n => f"t($n)=${ClusterSimulator.measure(p, n)}%.0f").mkString(" "))
    }
  }
}
