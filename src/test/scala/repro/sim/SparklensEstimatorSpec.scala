package repro.sim

import org.scalatest.funsuite.AnyFunSuite

class SparklensEstimatorSpec extends AnyFunSuite {

  private def stage(id: Int, durations: Seq[Double]): StageProfile =
    StageProfile(id, 0, Nil, durations.toIndexedSeq, 0L, 0L)

  private def profile(driverMs: Double, stages: StageProfile*): TaskProfile =
    TaskProfile("test", stages.toIndexedSeq, wallMs = 0.0, driverMs = driverMs)

  test("work-bound stage: total task time over slots") {
    val p = profile(0.0, stage(0, (1 to 64).map(_ => 10.0))) // 640 ms of work
    assert(SparklensEstimator.estimate(p, n = 4, coresPerExecutor = 4) == 640.0 / 16)
  }

  test("critical-path-bound stage: longest task wins at high n") {
    val p = profile(0.0, stage(0, Seq(100.0, 1.0, 1.0)))
    assert(SparklensEstimator.estimate(p, n = 48) == 100.0)
  }

  test("driver time is always included") {
    val p = profile(500.0, stage(0, Seq(10.0)))
    assert(SparklensEstimator.estimate(p, n = 48) == 510.0)
  }

  test("stages sum") {
    val p = profile(0.0, stage(0, Seq(40.0, 40.0)), stage(1, Seq(20.0)))
    // n=1, e_c=1: 80 + 20.
    assert(SparklensEstimator.estimate(p, n = 1, coresPerExecutor = 1) == 100.0)
  }

  test("estimates are monotonically non-increasing in n (paper §3.1)") {
    val p = profile(50.0,
      stage(0, (1 to 100).map(i => (i % 9 + 1) * 7.0)),
      stage(1, (1 to 30).map(_ => 33.0)))
    val times = (1 to 48).map(n => SparklensEstimator.estimate(p, n))
    times.zip(times.tail).foreach { case (a, b) => assert(b <= a + 1e-9) }
  }

  test("estimates saturate once every stage is bound by its longest task") {
    val p = profile(0.0, stage(0, Seq(100.0, 10.0, 10.0)))
    val t32 = SparklensEstimator.estimate(p, 32)
    val t48 = SparklensEstimator.estimate(p, 48)
    assert(t32 == t48)
    assert(t48 == 100.0)
  }

  test("curve evaluates the requested grid") {
    val p = profile(0.0, stage(0, (1 to 16).map(_ => 10.0)))
    val c = SparklensEstimator.curve(p, Seq(1, 2, 4))
    assert(c == IndexedSeq(1 -> 40.0, 2 -> 20.0, 4 -> 10.0))
  }

  test("n below 1 is rejected") {
    val p = profile(0.0, stage(0, Seq(1.0)))
    intercept[IllegalArgumentException] { SparklensEstimator.estimate(p, 0) }
  }
}
