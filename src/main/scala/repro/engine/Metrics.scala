package repro.engine

import scala.collection.mutable.ArrayBuffer

/** Snapshot of one task's runtime info (paper Fig 18: task context). */
final case class TaskInfo(label: String, nodeId: Int, drivers: Int, rowsEmitted: Long,
                          turnUps: Int, finished: Boolean)

/** Snapshot of one stage's runtime info (aggregated from its tasks). */
final case class StageInfo(id: Int, kind: String, stageDop: Int, taskDop: Int,
                           rowsOut: Long, completed: Boolean, scanProgress: Option[Double],
                           tasks: Vector[TaskInfo])

/** The "query → stage → task" info tree the coordinator aggregates (§5.1). */
final case class QuerySnapshot(now: Double, stages: Vector[StageInfo]) {
  def stage(id: Int): StageInfo = stages.find(_.id == id).get
}

/** Runtime information collector: samples cumulative per-stage output counters
  * on a fixed period so throughput and scan-rate series can be derived — the
  * coordinator's "runtime information collector" of Fig 18.
  */
final class InfoCollector(qe: QueryExec) {
  final case class Sample(t: Double, rowsOut: Map[Int, Long], scanned: Map[Int, Long],
                          busyCoreSeconds: Double)

  val samples = ArrayBuffer[Sample]()

  def sample(now: Double): Unit = samples += Sample(
    now,
    qe.stages.map(s => s.id -> s.rowsOut).toMap,
    qe.scanStages.map(s => s.id -> s.scanned).toMap,
    qe.cluster.busyCoreSeconds,
  )

  private def rate(series: Sample => Long, window: Double): Double = {
    if (samples.size < 2) return 0.0
    val last = samples.last
    val from = samples.reverseIterator.find(s => last.t - s.t >= window).getOrElse(samples.head)
    val dt = last.t - from.t
    if (dt <= 0) 0.0 else (series(last) - series(from)).toDouble / dt
  }

  /** Output rows/second of a stage over the trailing window. */
  def throughput(stageId: Int, window: Double = 5.0): Double =
    rate(_.rowsOut.getOrElse(stageId, 0L), window)

  /** Scanned rows/second of a scan stage over the trailing window — the
    * consumption rate R_consume of §5.2 (backpressure makes the scan rate
    * track downstream consumption).
    */
  def scanRate(stageId: Int, window: Double = 10.0): Double =
    rate(_.scanned.getOrElse(stageId, 0L), window)

  /** (time, rows/sec) series for a stage — the throughput curves of §6. */
  def throughputSeries(stageId: Int): Vector[(Double, Double)] =
    samples.toVector.sliding(2).collect {
      case scala.collection.immutable.Vector(a, b) if b.t > a.t =>
        (b.t, (b.rowsOut.getOrElse(stageId, 0L) - a.rowsOut.getOrElse(stageId, 0L)) / (b.t - a.t))
    }.toVector

  def snapshot(now: Double): QuerySnapshot = QuerySnapshot(
    now,
    qe.stages.map { s =>
      StageInfo(s.id, s.kindName, s.stageDop, s.taskDop, s.rowsOut, s.completed,
        s match { case sc: ScanStageExec => Some(sc.progress); case _ => None },
        s.allTasks.map(t => TaskInfo(t.label, t.node.id, t.driverCount,
          t.outputBuffer.rowsEmitted, t.turnUps, t.finished)).toVector)
    },
  )
}
