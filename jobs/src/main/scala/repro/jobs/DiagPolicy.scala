package repro.jobs

import java.nio.file.Paths
import repro.sim._

/** Diagnostic: simulate one cached profile under the three §5.4 policies.
  * Usage: runMain repro.jobs.DiagPolicy <profileDir> <qid> <ruleTarget>
  */
object DiagPolicy {
  def main(args: Array[String]): Unit = {
    val p      = TaskProfile.load(Paths.get(args(0)).resolve(s"${args(1)}.bin"))
    val target = args(2).toInt
    def show(name: String, r: ClusterSimulator.RunResult): Unit = {
      println(f"$name%-10s t=${r.elapsedMs}%8.0f maxN=${r.skyline.maxN}%3d auc=${r.skyline.aucExecutorSeconds}%8.1f")
      println("   steps: " + r.skyline.steps.map { case (t, n) => f"${t / 1000}%.2fs:$n" }.mkString(" "))
    }
    show("DA(1,48)", DynamicAllocation.simulate(p, DynamicAllocation.Dynamic()))
    show(s"Rule($target)", DynamicAllocation.simulate(p, DynamicAllocation.PredictiveRule(2, target)))
    show("SA(48)", DynamicAllocation.simulate(p, DynamicAllocation.Static(48)))
  }
}
