package repro.sim

/** Re-implementation of Qubole Sparklens' scheduler model (paper §3.2):
  * from a single profiled run, estimate the run time at any other executor
  * count as driver time plus, per stage, the larger of the stage's critical
  * path (its longest task — work that cannot be parallelized away) and its
  * total task time spread perfectly over the available slots.
  *
  * Estimates are deterministic and monotonically non-increasing in `n`, and
  * saturate once every stage is bound by its longest task — exactly the
  * properties the paper relies on (§3.1 reason 3, §3.2).
  */
object SparklensEstimator {

  /** Estimated elapsed time (ms) with `n` executors of `coresPerExecutor`
    * cores each.
    */
  def estimate(profile: TaskProfile, n: Int, coresPerExecutor: Int = 4): Double = {
    require(n >= 1, s"executor count must be >= 1, got $n")
    val slots = n.toLong * coresPerExecutor
    profile.driverMs + profile.stages.map { s =>
      math.max(s.maxTaskMs, s.totalTaskMs / slots)
    }.sum
  }

  /** The Sparklens series over the paper's executor grid. */
  def curve(profile: TaskProfile, grid: Seq[Int], coresPerExecutor: Int = 4): IndexedSeq[(Int, Double)] =
    grid.iterator.map(n => n -> estimate(profile, n, coresPerExecutor)).toIndexedSeq
}
