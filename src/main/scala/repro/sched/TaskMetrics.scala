package repro.sched

import java.util.concurrent.ConcurrentLinkedQueue
import scala.jdk.CollectionConverters._

import org.apache.spark.scheduler.{SparkListener, SparkListenerTaskEnd}
import org.apache.spark.sql.SparkSession

/** One finished Spark task: its wall-clock duration and input volume. */
final case class TaskRecord(stageId: Int, taskId: Long, seconds: Double, bytesRead: Long,
                            recordsRead: Long)

/** Collects real per-task execution times from Spark's listener bus — the
  * executor-model analogue of the paper's per-worker processing-time
  * distribution (Fig 11): with one task per cold-store file and Parquet
  * min/max pushdown, pruned-file tasks land in a fast class and scanning
  * tasks in a slow class, exactly like Lambada's workers.
  */
object TaskMetrics {

  private final class Collector extends SparkListener {
    val records = new ConcurrentLinkedQueue[TaskRecord]()
    override def onTaskEnd(taskEnd: SparkListenerTaskEnd): Unit = {
      val info = taskEnd.taskInfo
      if (info != null && taskEnd.taskMetrics != null && info.successful) {
        records.add(TaskRecord(
          stageId = taskEnd.stageId,
          taskId = info.taskId,
          seconds = info.duration / 1000.0,
          bytesRead = taskEnd.taskMetrics.inputMetrics.bytesRead,
          recordsRead = taskEnd.taskMetrics.inputMetrics.recordsRead,
        ))
      }
    }
  }

  /** Run `action` and return the task records of everything it executed. */
  def collect(spark: SparkSession)(action: => Unit): Vector[TaskRecord] = {
    val collector = new Collector
    spark.sparkContext.addSparkListener(collector)
    try {
      action
      // The listener bus is asynchronous; give it a moment to drain.
      var waited = 0
      while (waited < 5000 && spark.sparkContext.statusTracker.getActiveJobIds().nonEmpty) {
        Thread.sleep(50); waited += 50
      }
      Thread.sleep(500)
      collector.records.asScala.toVector.sortBy(_.taskId)
    } finally spark.sparkContext.removeSparkListener(collector)
  }
}
