package repro.core

import scala.collection.mutable
import repro.engine._

/** Runtime bottleneck localization (§5.1).
  *
  * Every elastic receive buffer turn-up increments its task's counter; a stage
  * that keeps its buffers populated (counter flat while the stage is live) is
  * processing slower than its upstream produces — a computational bottleneck.
  * The coordinator walks the query-stage-task info tree (Fig 18) comparing
  * counters between calls.
  */
final class BottleneckLocalizer(qe: QueryExec) {
  private val lastTurnUps = mutable.Map[Int, Int]()
  private val lastRowsOut = mutable.Map[Int, Long]()

  /** Stage ids that are computational bottlenecks since the last call. */
  def locate(): Vector[Int] = {
    qe.stages.flatMap { s =>
      val tu = s.allTasks.map(_.turnUps).sum
      val ro = s.rowsOut
      val prevTu = lastTurnUps.getOrElse(s.id, -1)
      val prevRo = lastRowsOut.getOrElse(s.id, -1L)
      lastTurnUps(s.id) = tu
      lastRowsOut(s.id) = ro
      val consuming = s match {
        case _: ScanStageExec | _: OutputStageExec => false // no upstream exchange
        case _ => true
      }
      val live = !s.completed && s.liveTasks.nonEmpty
      val working = ro != prevRo // actually processed rows in the window
      if (consuming && live && working && prevTu >= 0 && tu == prevTu) Some(s.id) else None
    }.toVector
  }
}
