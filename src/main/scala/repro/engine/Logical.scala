package repro.engine

import repro.engine.Data.Row

/** Minimal logical algebra the planner fragments into the stage DAG. The node
  * set matches what the paper's evaluation queries need: scans with fused
  * filters/projections, partitioned/broadcast inner hash joins on a single
  * equi-key, and (two-stage) grouped or global aggregation on top.
  */
sealed trait LNode { def schema: Schema }

final case class LScan(table: EngineTable) extends LNode {
  def schema: Schema = table.schema
}

final case class LFilter(pred: Pred, child: LNode) extends LNode {
  def schema: Schema = child.schema
}

final case class LProject(exprs: Vector[NamedExpr], child: LNode) extends LNode {
  def schema: Schema = Schema(exprs.map(_.name))
}

/** Inner equi-join; `build` is the side materialized into hash tables. If
  * `broadcast`, the build side is replicated to every join task; otherwise both
  * sides are hash-partitioned on the key (partitioned hash join, §4.5).
  */
final case class LJoin(build: LNode, probe: LNode, buildKey: String, probeKey: String,
                       broadcast: Boolean = false) extends LNode {
  def schema: Schema = build.schema ++ probe.schema
}

/** Aggregate definition by column name, resolved against the child schema. */
final case class AggDef(kind: String, col: String, alias: String) {
  def resolve(s: Schema): AggFunc = kind match {
    case "count" => CountAgg(alias)
    case "sum" => SumAgg(alias, s.idx(col))
    case "min" => MinAgg(alias, s.idx(col))
    case "max" => MaxAgg(alias, s.idx(col))
    case "avg" => AvgAgg(alias, s.idx(col))
    case other => throw new IllegalArgumentException(s"unknown aggregate '$other'")
  }
}

final case class LAgg(groupCols: Vector[String], aggs: Vector[AggDef], child: LNode) extends LNode {
  def spec: AggSpec = AggSpec(
    groupCols.map(child.schema.idx),
    groupCols,
    aggs.map(_.resolve(child.schema)),
  )
  def schema: Schema = spec.outSchema
}

/** Small DSL so query definitions read close to SQL. */
object Dsl {
  def scan(t: EngineTable): LNode = LScan(t)

  def col(s: Schema, name: String): Row => Any = { val i = s.idx(name); r => r(i) }

  def keep(child: LNode, names: String*): LNode = {
    val s = child.schema
    LProject(names.toVector.map(n => NamedExpr(n, col(s, n))), child)
  }

  def filter(child: LNode, desc: String)(f: Schema => Row => Boolean): LNode =
    LFilter(Pred(desc, f(child.schema)), child)

  def project(child: LNode, exprs: (String, Schema => Row => Any)*): LNode = {
    val s = child.schema
    LProject(exprs.toVector.map { case (n, mk) => NamedExpr(n, mk(s)) }, child)
  }

  def joinP(build: LNode, probe: LNode, buildKey: String, probeKey: String): LNode =
    LJoin(build, probe, buildKey, probeKey, broadcast = false)

  def joinB(build: LNode, probe: LNode, buildKey: String, probeKey: String): LNode =
    LJoin(build, probe, buildKey, probeKey, broadcast = true)

  def count(alias: String): AggDef = AggDef("count", "", alias)
  def sum(colName: String, alias: String): AggDef = AggDef("sum", colName, alias)
  def min(colName: String, alias: String): AggDef = AggDef("min", colName, alias)
  def max(colName: String, alias: String): AggDef = AggDef("max", colName, alias)
  def avg(colName: String, alias: String): AggDef = AggDef("avg", colName, alias)

  def agg(child: LNode, groupCols: Seq[String], aggs: AggDef*): LNode =
    LAgg(groupCols.toVector, aggs.toVector, child)
}
