package repro.exp

import java.nio.file.{Files, Path}
import org.apache.spark.sql.SparkSession
import repro.core.PlanFeaturizer
import repro.sim.{ClusterSimulator, ProfileCollector, SparklensEstimator, TaskProfile}
import repro.tpcds.{Queries, Query, TpcdsLite}

/** Everything the experiments need about one query: its profile from a real
  * local run (the paper's single profiling run, §5.1), its compile-time
  * features, and its "Actual" and Sparklens `t(n)` series over the paper's
  * executor grid.
  */
final case class QueryData(
    query: Query,
    profile: TaskProfile,
    features: Array[Double],
    actual: IndexedSeq[(Int, Double)],
    sparklens: IndexedSeq[(Int, Double)],
)

/** A fully-profiled workload at one scale factor. */
final case class Workload(sfLabel: String, sf: Double, queries: IndexedSeq[QueryData]) {
  def byId(id: String): QueryData = queries.find(_.query.id == id)
    .getOrElse(throw new NoSuchElementException(s"no query $id in $sfLabel"))
}

/** Builds [[Workload]]s: materializes TPC-DS-lite, executes each query once
  * under a profiling listener, and derives the Actual (cluster simulator)
  * and Sparklens series. Profiles are cached on disk so repeated bench runs
  * skip re-execution.
  */
object WorkloadRunner {

  /** The paper's measured executor grid (§5.1). */
  val Grid: IndexedSeq[Int] = IndexedSeq(1, 3, 8, 16, 32, 48)

  /** Denser (free) grid used to fit PPM labels on Sparklens estimates. */
  val FitGrid: IndexedSeq[Int] = IndexedSeq(1, 2, 3, 4, 6, 8, 12, 16, 24, 32, 48)

  /** Cache format/version tag: bump when the profiling configuration or the
    * data layout changes, so stale profiles are never reused.
    */
  val ProfilingVersion = "v4"

  /** Profiling runs expose task-level parallelism worth the full 48 × 4
    * slots, like the paper's SF=100 runs: 192 shuffle partitions, small scan
    * splits, and AQE disabled (its partition coalescing would collapse
    * reduce stages to a handful of tasks at this scale — the paper's
    * Synapse pools process enough data that coalescing leaves wide stages).
    */
  private val profileConfs = Map(
    "spark.sql.adaptive.enabled"        -> "false",
    "spark.sql.shuffle.partitions"      -> "192",
    // One scan task per fact-table file: bins smaller than file+openCost
    // prevent Spark's file packing from re-coalescing the 192 blocks.
    "spark.sql.files.maxPartitionBytes" -> (64 * 1024).toString,
    "spark.sql.files.openCostInBytes"   -> (16 * 1024).toString,
  )

  /** Build (or load from `cacheDir`) the workload at `sf`.
    *
    * @param sfLabel   name used in reports and cache paths ("SF100"/"SF10")
    * @param queries   workload queries (defaults to all 103)
    * @param reps      simulated repetitions per grid point (§5.1 averaging)
    */
  def build(
      spark: SparkSession,
      sf: Double,
      sfLabel: String,
      queries: IndexedSeq[Query] = Queries.all,
      grid: IndexedSeq[Int] = Grid,
      dataDir: Path = TpcdsLite.defaultBaseDir,
      cacheDir: Path = TpcdsLite.defaultBaseDir.resolve("profiles"),
      fidelity: ClusterSimulator.Fidelity = ClusterSimulator.Fidelity(),
      reps: Int = 5,
      verbose: Boolean = true,
  ): Workload = {
    TpcdsLite.materialize(spark, sf, dataDir)
    val data = queries.zipWithIndex.map { case (q, i) =>
      val profile = profileQuery(spark, q, sfLabel, cacheDir)
      val features = withProfilingConfs(spark) {
        PlanFeaturizer.featurize(spark.sql(q.sql))
      }
      if (verbose && (i + 1) % 20 == 0)
        Console.err.println(s"[WorkloadRunner] $sfLabel profiled ${i + 1}/${queries.size}")
      QueryData(
        query = q,
        profile = profile,
        features = features,
        actual = ClusterSimulator.actualCurve(profile, grid, fidelity = fidelity, reps = reps),
        sparklens = SparklensEstimator.curve(profile, grid),
      )
    }
    Workload(sfLabel, sf, data)
  }

  /** Run (or load) the single profiling run of one query. The query is run
    * once unprofiled first so one-time costs (codegen, JIT, catalog lookups)
    * do not inflate the profiled driver time — the paper profiles warm
    * production clusters.
    */
  def profileQuery(spark: SparkSession, q: Query, sfLabel: String, cacheDir: Path): TaskProfile = {
    val path = cacheDir.resolve(ProfilingVersion).resolve(sfLabel).resolve(s"${q.id}.bin")
    if (Files.exists(path)) TaskProfile.load(path)
    else {
      val profile = withProfilingConfs(spark) {
        spark.sql(q.sql).collect(): Unit // warm-up
        ProfileCollector.profileRun(spark, q.id) {
          spark.sql(q.sql).collect(): Unit
        }
      }
      profile.save(path)
      profile
    }
  }

  /** Apply the profiling Spark confs around `body`, restoring prior values. */
  def withProfilingConfs[A](spark: SparkSession)(body: => A): A = {
    val saved = profileConfs.keys.map(k => k -> spark.conf.getOption(k)).toMap
    profileConfs.foreach { case (k, v) => spark.conf.set(k, v) }
    try body
    finally saved.foreach {
      case (k, Some(v)) => spark.conf.set(k, v)
      case (k, None)    => spark.conf.unset(k)
    }
  }
}
