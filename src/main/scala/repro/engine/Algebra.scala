package repro.engine

import repro.engine.Data.Row

/** A named scalar expression over an engine row. */
final case class NamedExpr(name: String, f: Row => Any)

/** A named boolean predicate over an engine row. */
final case class Pred(desc: String, f: Row => Boolean)

/** Type-erased aggregate function used by both the partial and the final
  * aggregation operators (paper §4.1, two-stage aggregation model). Partial
  * aggregation emits accumulator objects in row cells; the final aggregation
  * merges them and produces the result value.
  */
sealed trait AggFunc {
  def name: String
  def init(): Any
  def update(acc: Any, row: Row): Any
  def merge(a: Any, b: Any): Any
  def result(acc: Any): Any
}

final case class CountAgg(name: String) extends AggFunc {
  def init(): Any = 0L
  def update(acc: Any, row: Row): Any = acc.asInstanceOf[Long] + 1L
  def merge(a: Any, b: Any): Any = a.asInstanceOf[Long] + b.asInstanceOf[Long]
  def result(acc: Any): Any = acc.asInstanceOf[Long]
}

final case class SumAgg(name: String, col: Int) extends AggFunc {
  def init(): Any = 0.0
  def update(acc: Any, row: Row): Any = acc.asInstanceOf[Double] + Num.toD(row(col))
  def merge(a: Any, b: Any): Any = a.asInstanceOf[Double] + b.asInstanceOf[Double]
  def result(acc: Any): Any = acc.asInstanceOf[Double]
}

final case class MinAgg(name: String, col: Int) extends AggFunc {
  def init(): Any = null
  def update(acc: Any, row: Row): Any = if (acc == null) row(col) else Num.min(acc, row(col))
  def merge(a: Any, b: Any): Any =
    if (a == null) b else if (b == null) a else Num.min(a, b)
  def result(acc: Any): Any = acc
}

final case class MaxAgg(name: String, col: Int) extends AggFunc {
  def init(): Any = null
  def update(acc: Any, row: Row): Any = if (acc == null) row(col) else Num.max(acc, row(col))
  def merge(a: Any, b: Any): Any =
    if (a == null) b else if (b == null) a else Num.max(a, b)
  def result(acc: Any): Any = acc
}

final case class AvgAgg(name: String, col: Int) extends AggFunc {
  def init(): Any = (0.0, 0L)
  def update(acc: Any, row: Row): Any = {
    val (s, c) = acc.asInstanceOf[(Double, Long)]
    (s + Num.toD(row(col)), c + 1L)
  }
  def merge(a: Any, b: Any): Any = {
    val (s1, c1) = a.asInstanceOf[(Double, Long)]
    val (s2, c2) = b.asInstanceOf[(Double, Long)]
    (s1 + s2, c1 + c2)
  }
  def result(acc: Any): Any = {
    val (s, c) = acc.asInstanceOf[(Double, Long)]
    if (c == 0L) null else s / c
  }
}

/** Numeric/string coercion helpers shared by aggregates and comparisons. */
object Num {
  def toD(v: Any): Double = v match {
    case d: Double => d
    case l: Long => l.toDouble
    case i: Int => i.toDouble
    case s: String => s.toDouble
    case null => 0.0
    case other => other.toString.toDouble
  }

  private def cmp(a: Any, b: Any): Int = (a, b) match {
    case (x: String, y: String) => x.compareTo(y)
    case _ => java.lang.Double.compare(toD(a), toD(b))
  }

  def min(a: Any, b: Any): Any = if (cmp(a, b) <= 0) a else b
  def max(a: Any, b: Any): Any = if (cmp(a, b) >= 0) a else b
}

/** Grouping + aggregate specification shared by the partial and final
  * aggregation stages. `groupIdx` indexes the *input* schema; the output
  * schema is groups followed by one column per aggregate.
  */
final case class AggSpec(groupIdx: Vector[Int], groupNames: Vector[String], aggs: Vector[AggFunc]) {
  def outSchema: Schema = Schema(groupNames ++ aggs.map(_.name).toVector)

  def keyOf(row: Row): Vector[Any] = groupIdx.map(row)

  /** Column indices of the accumulator cells in a partial-agg output row. */
  def accOffset: Int = groupIdx.length
}
