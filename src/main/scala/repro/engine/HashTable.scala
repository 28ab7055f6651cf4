package repro.engine

import scala.collection.mutable
import repro.engine.Data.Row

/** Per-task join hash table. In a partitioned join each task holds the keys
  * hashing to its partition; in a broadcast join every task holds the full
  * build side. `ready` flips once the task's build pipeline finishes — probe
  * drivers are gated on it (execution dependency, §4.1).
  */
final class JoinHashTable {
  private val map = mutable.HashMap[Any, mutable.ArrayBuffer[Row]]()
  var rowCount: Long = 0L

  def insert(key: Any, row: Row): Unit = {
    map.getOrElseUpdate(key, mutable.ArrayBuffer[Row]()) += row
    rowCount += 1
  }

  def get(key: Any): scala.collection.Seq[Row] =
    map.getOrElse(key, Nil.asInstanceOf[scala.collection.Seq[Row]])

  def keyCount: Int = map.size
}
