package repro.jobs

import java.nio.file.Paths
import repro.core.PpmKind
import repro.exp._

/** Diagnostic: replicate the T6 allocation experiment and dump per-query
  * rows. Usage: runMain repro.jobs.DiagT6 <dataDir>
  */
object DiagT6 {
  def main(args: Array[String]): Unit = {
    val spark = JobSupport.session("DiagT6")
    val base  = Paths.get(args(0))
    val w = WorkloadRunner.build(spark, sf = 0.1, sfLabel = "SF100",
      dataDir = base, cacheDir = base.resolve("profiles"))
    val folds = CrossValidation.trainFolds(w, Seq(PpmKind.PowerLaw), k = 5, repeats = 1, seed = 7)
    val pred  = AllocationExperiment.predictedCounts(w, folds, repeat = 0, h = 1.05)
    val r     = AllocationExperiment.run(w, pred)
    r.rows.take(15).foreach { row =>
      println(f"${row.queryId}  pred=${row.predictedN}%3d | rule t=${row.rule.elapsedMs}%7.0f n=${row.rule.maxN}%3d auc=${row.rule.aucExecSec}%8.1f" +
        f" | da t=${row.da.elapsedMs}%7.0f n=${row.da.maxN}%3d auc=${row.da.aucExecSec}%8.1f" +
        f" | sa t=${row.sa48.elapsedMs}%7.0f auc=${row.sa48.aucExecSec}%8.1f")
    }
    println(AllocationExperiment.report(r))
  }
}
