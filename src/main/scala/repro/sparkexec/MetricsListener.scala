package repro.sparkexec

import org.apache.spark.scheduler.{SparkListener, SparkListenerTaskEnd}
import java.util.concurrent.atomic.AtomicLong

/** SparkListener that accumulates task execution metrics — LOCAT "observes
  * Spark job execution metrics"; this is the observation channel for the
  * real-Spark objective (JVM GC time in particular, the paper's §5.8 lever).
  */
final class MetricsListener extends SparkListener {
  private val gcTimeMs = new AtomicLong(0L)
  private val runTimeMs = new AtomicLong(0L)
  private val tasks = new AtomicLong(0L)

  override def onTaskEnd(taskEnd: SparkListenerTaskEnd): Unit = {
    val m = taskEnd.taskMetrics
    if (m != null) {
      gcTimeMs.addAndGet(m.jvmGCTime)
      runTimeMs.addAndGet(m.executorRunTime)
      tasks.incrementAndGet()
    }
  }

  def reset(): Unit = { gcTimeMs.set(0); runTimeMs.set(0); tasks.set(0) }

  def gcSeconds: Double = gcTimeMs.get() / 1000.0
  def executorRunSeconds: Double = runTimeMs.get() / 1000.0
  def taskCount: Long = tasks.get()
}
