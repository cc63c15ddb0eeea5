package repro.sim

import java.io.{FileInputStream, FileOutputStream, ObjectInputStream, ObjectOutputStream}
import java.nio.file.{Files, Path}
import scala.collection.mutable
import org.apache.spark.scheduler._
import org.apache.spark.sql.SparkSession

/** Execution profile of one stage of a query: the raw material both the
  * cluster simulator and the Sparklens estimator scale to other executor
  * counts.
  *
  * @param stageId          Spark stage id (attempt 0)
  * @param jobIndex         0-based index of the job this stage belonged to;
  *                         jobs of a SQL query run sequentially (AQE submits
  *                         them one after another), which the simulator
  *                         enforces as a barrier
  * @param parentIds        stage ids this stage shuffles from (may reference
  *                         skipped stages that produced no tasks)
  * @param taskDurationsMs  per-task run times as observed on the live run
  * @param shuffleReadBytes total shuffle bytes fetched by the stage
  * @param inputBytes       total input (file scan) bytes read by the stage
  */
final case class StageProfile(
    stageId: Int,
    jobIndex: Int,
    parentIds: Seq[Int],
    taskDurationsMs: IndexedSeq[Double],
    shuffleReadBytes: Long,
    inputBytes: Long,
) extends Serializable {
  def totalTaskMs: Double = taskDurationsMs.sum
  def maxTaskMs: Double   = if (taskDurationsMs.isEmpty) 0.0 else taskDurationsMs.max
  def numTasks: Int       = taskDurationsMs.length
}

/** Full task-level profile of one query run — the analogue of the paper's
  * single profiling run (at n=16) whose Spark event log feeds Sparklens
  * (§3.4, §4.1).
  *
  * @param queryId   workload query identifier
  * @param wallMs    end-to-end elapsed time of the run
  * @param driverMs  time not covered by any running stage (driver-side
  *                  planning, result collection, job submission gaps) — the
  *                  serial floor no executor count can remove
  */
final case class TaskProfile(
    queryId: String,
    stages: IndexedSeq[StageProfile],
    wallMs: Double,
    driverMs: Double,
) extends Serializable {
  def totalTaskMs: Double = stages.map(_.totalTaskMs).sum

  def save(path: Path): Unit = {
    Files.createDirectories(path.getParent)
    val oos = new ObjectOutputStream(new FileOutputStream(path.toFile))
    try oos.writeObject(this) finally oos.close()
  }
}

object TaskProfile {
  def load(path: Path): TaskProfile = {
    val ois = new ObjectInputStream(new FileInputStream(path.toFile))
    try ois.readObject().asInstanceOf[TaskProfile] finally ois.close()
  }
}

/** SparkListener that records per-task durations, stage lineage and stage
  * wall-clock windows for everything that runs while it is attached.
  *
  * Stand-in for the paper's Peregrine/SparkCruise telemetry + Spark event
  * logs: attach, run the query once, detach, and [[ProfileCollector.profile]]
  * assembles a [[TaskProfile]].
  */
final class ProfileCollector extends SparkListener {
  private val taskDurations = mutable.Map.empty[Int, mutable.ArrayBuffer[Double]]
  private val shuffleRead   = mutable.Map.empty[Int, Long]
  private val inputRead     = mutable.Map.empty[Int, Long]
  private val parents       = mutable.Map.empty[Int, Seq[Int]]
  private val stageWindows  = mutable.Map.empty[Int, (Long, Long)]
  private val stageJob      = mutable.Map.empty[Int, Int]
  private val jobOrder      = mutable.ArrayBuffer.empty[Int]

  override def onJobStart(e: SparkListenerJobStart): Unit = synchronized {
    val jobIndex = jobOrder.length
    jobOrder += e.jobId
    e.stageInfos.foreach { si =>
      // A stage can appear in several jobs (shuffle reuse); keep the first,
      // which is the job that actually ran it.
      if (!stageJob.contains(si.stageId)) stageJob(si.stageId) = jobIndex
      parents.getOrElseUpdate(si.stageId, si.parentIds)
    }
  }

  override def onTaskEnd(e: SparkListenerTaskEnd): Unit = synchronized {
    if (e.stageAttemptId == 0 && e.taskInfo != null && e.taskInfo.successful) {
      taskDurations.getOrElseUpdate(e.stageId, mutable.ArrayBuffer.empty) +=
        math.max(e.taskInfo.duration.toDouble, 1.0)
      if (e.taskMetrics != null) {
        shuffleRead(e.stageId) = shuffleRead.getOrElse(e.stageId, 0L) +
          e.taskMetrics.shuffleReadMetrics.totalBytesRead
        inputRead(e.stageId) = inputRead.getOrElse(e.stageId, 0L) +
          e.taskMetrics.inputMetrics.bytesRead
      }
    }
  }

  override def onStageCompleted(e: SparkListenerStageCompleted): Unit = synchronized {
    val si = e.stageInfo
    if (si.attemptNumber == 0) {
      for (sub <- si.submissionTime; comp <- si.completionTime)
        stageWindows(si.stageId) = (sub, comp)
      parents.getOrElseUpdate(si.stageId, si.parentIds)
    }
  }

  /** Assemble the profile for a run that took `wallMs` end-to-end. */
  def profile(queryId: String, wallMs: Double): TaskProfile = synchronized {
    val stages = taskDurations.keys.toIndexedSeq.sorted.map { sid =>
      StageProfile(
        stageId = sid,
        jobIndex = stageJob.getOrElse(sid, 0),
        parentIds = parents.getOrElse(sid, Seq.empty),
        taskDurationsMs = taskDurations(sid).toIndexedSeq,
        shuffleReadBytes = shuffleRead.getOrElse(sid, 0L),
        inputBytes = inputRead.getOrElse(sid, 0L),
      )
    }
    // Driver time = wall time minus the union of stage wall-clock windows:
    // the part of the run no amount of executors can shrink.
    val covered = unionMs(stageWindows.values.toSeq)
    TaskProfile(queryId, stages, wallMs, driverMs = math.max(wallMs - covered, 0.0))
  }

  private def unionMs(windows: Seq[(Long, Long)]): Double = {
    if (windows.isEmpty) return 0.0
    val sorted = windows.sortBy(_._1)
    var total = 0L
    var (curStart, curEnd) = sorted.head
    for ((s, e) <- sorted.tail) {
      if (s > curEnd) { total += curEnd - curStart; curStart = s; curEnd = e }
      else curEnd = math.max(curEnd, e)
    }
    total += curEnd - curStart
    total.toDouble
  }
}

object ProfileCollector {

  /** Run `body` once with a fresh collector attached and return its profile.
    * The listener bus is flushed before detaching so late task-end events are
    * not lost.
    */
  def profileRun(spark: SparkSession, queryId: String)(body: => Unit): TaskProfile = {
    val collector = new ProfileCollector
    spark.sparkContext.addSparkListener(collector)
    val t0 = System.nanoTime()
    try {
      body
      val wallMs = (System.nanoTime() - t0) / 1e6
      // Listener events are delivered asynchronously; drain the bus.
      org.apache.spark.repro.SparkInternals.drainListenerBus(spark.sparkContext)
      collector.profile(queryId, wallMs)
    } finally spark.sparkContext.removeSparkListener(collector)
  }
}
