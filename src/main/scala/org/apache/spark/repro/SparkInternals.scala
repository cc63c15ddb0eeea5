package org.apache.spark.repro

import org.apache.spark.SparkContext

/** Narrow bridge to `private[spark]` internals needed by the profiler.
  *
  * Lives under `org.apache.spark` solely to reach `SparkContext.listenerBus`;
  * keep it to the one member below.
  */
object SparkInternals {

  /** Block until all queued listener events have been delivered, so a
    * detaching profiler does not lose trailing task-end events.
    */
  def drainListenerBus(sc: SparkContext): Unit = sc.listenerBus.waitUntilEmpty()
}
