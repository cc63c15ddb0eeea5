package repro.sim

import org.scalatest.funsuite.AnyFunSuite

/** Simulator correctness on hand-built profiles where the exact schedule is
  * known. Noise/overheads are zeroed where exact equality is asserted.
  */
class ClusterSimulatorSpec extends AnyFunSuite {

  private val exact = ClusterSimulator.Fidelity(
    taskLaunchOverheadMs = 0.0, shuffleFanInMsPerMb = 0.0, ecPenaltyCoeff = 0.0,
    noiseSigma = 0.0, spillCoeff = 0.0)

  private def stage(id: Int, durations: Seq[Double], parents: Seq[Int] = Nil, job: Int = 0,
                    shuffleBytes: Long = 0L): StageProfile =
    StageProfile(id, job, parents, durations.toIndexedSeq, shuffleBytes, 0L)

  private def profile(stages: StageProfile*): TaskProfile =
    TaskProfile("test", stages.toIndexedSeq, wallMs = 0.0, driverMs = 0.0)

  test("single stage on one slot serializes all tasks") {
    val p = profile(stage(0, Seq(10.0, 20.0, 30.0)))
    val r = ClusterSimulator.simulate(p, n = 1, coresPerExecutor = 1, fidelity = exact)
    assert(math.abs(r.elapsedMs - 60.0) < 1e-9)
  }

  test("single stage with enough slots takes the longest task") {
    val p = profile(stage(0, Seq(10.0, 20.0, 30.0)))
    val r = ClusterSimulator.simulate(p, n = 1, coresPerExecutor = 4, fidelity = exact)
    assert(math.abs(r.elapsedMs - 30.0) < 1e-9)
  }

  test("LPT packing: 2 slots over {3,3,2,2,2} finishes in 7 (greedy LPT)") {
    // Greedy LPT: slots (3,3) → (5,5) → (7,5); optimal would be 6 but Spark's
    // scheduler is greedy too.
    val p = profile(stage(0, Seq(3.0, 3.0, 2.0, 2.0, 2.0)))
    val r = ClusterSimulator.simulate(p, n = 1, coresPerExecutor = 2, fidelity = exact)
    assert(math.abs(r.elapsedMs - 7.0) < 1e-9)
  }

  test("dependent stages run sequentially") {
    val p = profile(stage(0, Seq(10.0, 10.0)), stage(1, Seq(5.0), parents = Seq(0)))
    val r = ClusterSimulator.simulate(p, n = 2, coresPerExecutor = 1, fidelity = exact)
    assert(math.abs(r.elapsedMs - 15.0) < 1e-9)
  }

  test("independent stages in the same job share the pool concurrently") {
    val p = profile(stage(0, Seq(10.0)), stage(1, Seq(10.0)))
    val r = ClusterSimulator.simulate(p, n = 2, coresPerExecutor = 1, fidelity = exact)
    assert(math.abs(r.elapsedMs - 10.0) < 1e-9)
  }

  test("stages of a later job wait for the previous job (AQE barrier)") {
    val p = profile(stage(0, Seq(10.0), job = 0), stage(2, Seq(10.0), job = 1))
    val r = ClusterSimulator.simulate(p, n = 4, coresPerExecutor = 1, fidelity = exact)
    assert(math.abs(r.elapsedMs - 20.0) < 1e-9)
  }

  test("driver time is added to the makespan") {
    val p = TaskProfile("t", IndexedSeq(stage(0, Seq(10.0))), wallMs = 0.0, driverMs = 100.0)
    val r = ClusterSimulator.simulate(p, n = 1, coresPerExecutor = 1, fidelity = exact)
    assert(math.abs(r.elapsedMs - 110.0) < 1e-9)
  }

  test("a parent in a skipped stage (absent from profile) is ready at time 0") {
    val p = profile(stage(1, Seq(10.0), parents = Seq(99)))
    val r = ClusterSimulator.simulate(p, n = 1, coresPerExecutor = 1, fidelity = exact)
    assert(math.abs(r.elapsedMs - 10.0) < 1e-9)
  }

  test("elapsed time is monotonically non-increasing in n without noise") {
    val p = profile(stage(0, (1 to 100).map(i => (i % 7 + 1) * 10.0)),
                    stage(1, (1 to 40).map(_ => 25.0), parents = Seq(0)))
    val times = Seq(1, 2, 4, 8, 16, 32).map(n =>
      ClusterSimulator.simulate(p, n, 4, exact).elapsedMs)
    times.zip(times.tail).foreach { case (a, b) => assert(b <= a + 1e-6) }
  }

  test("per-task launch overhead penalizes small n more than large n") {
    // Mixed durations: serially, every task's overhead accumulates; at full
    // parallelism only the longest task's overhead is visible.
    val p     = profile(stage(0, (1 to 64).map(i => (i % 5 + 1) * 10.0)))
    val over  = exact.copy(taskLaunchOverheadMs = 5.0)
    val t1o   = ClusterSimulator.simulate(p, 1, 1, over).elapsedMs
    val t1    = ClusterSimulator.simulate(p, 1, 1, exact).elapsedMs
    val t64o  = ClusterSimulator.simulate(p, 16, 4, over).elapsedMs
    val t64   = ClusterSimulator.simulate(p, 16, 4, exact).elapsedMs
    assert((t1o - t1) / t1 > (t64o - t64) / t64)
  }

  test("shuffle fan-in cost grows with executor count") {
    val mb = 1024L * 1024L
    val p  = profile(stage(0, (1 to 32).map(_ => 10.0), shuffleBytes = 320 * mb))
    val fan = exact.copy(shuffleFanInMsPerMb = 1.0)
    // Compare per-task extra: same slot count, different executor counts.
    val few  = ClusterSimulator.simulate(p, n = 2, coresPerExecutor = 8, fidelity = fan).elapsedMs
    val many = ClusterSimulator.simulate(p, n = 16, coresPerExecutor = 1, fidelity = fan).elapsedMs
    assert(many > few)
  }

  test("spill factor is 1.0 when the stage fits in aggregate memory") {
    val fid = exact.copy(spillCoeff = 0.3, executorMemoryMb = 1.0)
    assert(ClusterSimulator.spillFactor(stageMb = 0.5, executors = 1, fid) == 1.0)
    assert(ClusterSimulator.spillFactor(stageMb = 8.0, executors = 16, fid) == 1.0)
    assert(ClusterSimulator.spillFactor(stageMb = 0.0, executors = 1, fid) == 1.0)
  }

  test("spill factor grows logarithmically with memory overflow") {
    val fid = exact.copy(spillCoeff = 0.3, executorMemoryMb = 1.0)
    val f2 = ClusterSimulator.spillFactor(stageMb = 2.0, executors = 1, fid)
    val f8 = ClusterSimulator.spillFactor(stageMb = 8.0, executors = 1, fid)
    assert(math.abs(f2 - 1.3) < 1e-9) // log2(2) = 1
    assert(math.abs(f8 - 1.9) < 1e-9) // log2(8) = 3
  }

  test("spill vanishes as executors (aggregate memory) grow") {
    val fid = exact.copy(spillCoeff = 0.3, executorMemoryMb = 1.0)
    val fs = Seq(1, 2, 4, 8, 16).map(n => ClusterSimulator.spillFactor(8.0, n, fid))
    fs.zip(fs.tail).foreach { case (a, b) => assert(b <= a) }
    assert(fs.last == 1.0)
  }

  test("spillCoeff = 0 disables memory-pressure modelling") {
    assert(ClusterSimulator.spillFactor(100.0, 1, exact) == 1.0)
  }

  test("spill makes small-n runs slower relative to Sparklens-style scaling") {
    val mb = 1024L * 1024L
    val p = profile(StageProfile(0, 0, Nil, (1 to 64).map(_ => 100.0), 8 * mb, 0L))
    val fid  = exact.copy(spillCoeff = 0.3, executorMemoryMb = 1.0)
    val t1   = ClusterSimulator.simulate(p, 1, 4, fid).elapsedMs
    val t16  = ClusterSimulator.simulate(p, 16, 4, fid).elapsedMs
    val t1x  = ClusterSimulator.simulate(p, 1, 4, exact).elapsedMs
    val t16x = ClusterSimulator.simulate(p, 16, 4, exact).elapsedMs
    assert(t1 / t1x > t16 / t16x, "spill should penalize n=1 more than n=16")
  }

  test("e_c penalty is 1.0 at the reference e_c = 4 and grows away from it") {
    assert(ClusterSimulator.ecPenalty(4, 0.1) == 1.0)
    assert(ClusterSimulator.ecPenalty(2, 0.1) > 1.0)
    assert(ClusterSimulator.ecPenalty(8, 0.1) > 1.0)
    assert(ClusterSimulator.ecPenalty(16, 0.1) > ClusterSimulator.ecPenalty(8, 0.1))
  }

  test("noise makes runs vary but measurement averages converge") {
    val p  = profile(stage(0, (1 to 50).map(_ => 20.0)))
    val fid = exact.copy(noiseSigma = 0.1)
    val a  = ClusterSimulator.simulate(p, 4, 4, fid, seed = 1).elapsedMs
    val b  = ClusterSimulator.simulate(p, 4, 4, fid, seed = 2).elapsedMs
    assert(a != b)
    val exactT = ClusterSimulator.simulate(p, 4, 4, exact).elapsedMs
    val avg    = ClusterSimulator.measure(p, 4, 4, fid, reps = 15)
    assert(math.abs(avg - exactT) / exactT < 0.1)
  }

  test("simulation is deterministic in the seed") {
    val p   = profile(stage(0, (1 to 30).map(_ => 15.0)))
    val fid = exact.copy(noiseSigma = 0.2)
    val a   = ClusterSimulator.simulate(p, 3, 4, fid, seed = 9).elapsedMs
    val b   = ClusterSimulator.simulate(p, 3, 4, fid, seed = 9).elapsedMs
    assert(a == b)
  }

  test("meanWithoutOutliers discards points outside 1.5 IQR") {
    val xs = IndexedSeq(10.0, 11.0, 9.0, 10.5, 9.5, 100.0)
    val m  = ClusterSimulator.meanWithoutOutliers(xs)
    assert(m < 12.0, s"outlier should be discarded, got $m")
  }

  test("meanWithoutOutliers of a constant series is the constant") {
    assert(ClusterSimulator.meanWithoutOutliers(IndexedSeq(5.0, 5.0, 5.0)) == 5.0)
  }

  test("actualCurve returns one time per grid point") {
    val p = profile(stage(0, (1 to 64).map(_ => 10.0)))
    val c = ClusterSimulator.actualCurve(p, Seq(1, 3, 8), fidelity = exact, reps = 2)
    assert(c.map(_._1) == Seq(1, 3, 8))
    assert(c.forall(_._2 > 0.0))
  }

  test("static skyline reflects the allocation") {
    val p = profile(stage(0, Seq(10.0)))
    val r = ClusterSimulator.simulate(p, n = 7, coresPerExecutor = 4, fidelity = exact)
    assert(r.skyline.maxN == 7)
    assert(math.abs(r.skyline.aucExecutorSeconds - 7 * r.elapsedMs / 1000.0) < 1e-9)
  }
}
