package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._
import repro.saql.Ast._

/** The state maintainer: computes each sliding window's states from the
  * matched events, via Spark `groupBy(win, keys).agg(...)` — every
  * aggregate runs through Catalyst and is oracle-checkable against DuckDB.
  *
  * Window `i` of a `WindowSpec(len, slide)` covers `[i*slide, i*slide+len)`.
  * With `slide == len` (the paper's `#time(10 min)`) windows tumble; with
  * `slide < len` events are exploded into every window containing them.
  */
object StateMaintainer {

  /** Aggregate column for one `name := func(arg)` state definition. */
  def aggFor(q: SaqlQuery, d: StateDef): Column = {
    val c = col(Columns.resolve(q, d.arg))
    val a = d.func match {
      case "avg"   => avg(c)
      case "sum"   => sum(c).cast(DoubleType)
      case "count" => count(c).cast(DoubleType)
      case "max"   => max(c).cast(DoubleType)
      case "min"   => min(c).cast(DoubleType)
      case "set"   => collect_set(c.cast(StringType))
      case f => throw new IllegalArgumentException(s"unknown aggregate '$f'")
    }
    a.as(d.name)
  }

  /** Add the window-index column `__win`; explodes for overlapping windows. */
  def assignWindows(events: DataFrame, w: WindowSpec): DataFrame = {
    if (w.slideMs == w.lengthMs)
      events.withColumn("__win", floor(col("ts") / w.slideMs))
    else {
      val iMax = floor(col("ts") / w.slideMs)
      val iMin = greatest(lit(0L),
        floor((col("ts") - w.lengthMs) / w.slideMs) + 1)
      events.withColumn("__win", explode(sequence(iMin, iMax)))
    }
  }

  /** Candidate events for a stateful query: union of its pattern
    * predicates (stateful SAQL queries have a single pattern; if several,
    * any match feeds the state).
    */
  def matchedEvents(events: DataFrame, q: SaqlQuery): DataFrame =
    events.filter(q.patterns.map(p => Columns.patternPredicate(q, p)).reduce(_ || _))

  /** Per-window, per-group state DataFrame:
    * `__win`, group-key columns (named by their SAQL ref), state columns.
    */
  def states(events: DataFrame, q: SaqlQuery): DataFrame = {
    val sb = q.state.getOrElse(
      throw new IllegalArgumentException(s"query '${q.name}' has no state block"))
    val w = q.window.getOrElse(
      throw new IllegalArgumentException(s"stateful query '${q.name}' needs #time(...)"))
    val keyCols = sb.groupBy.map(r => col(Columns.resolve(q, r)).as(r.colName))
    val aggs = sb.defs.map(d => aggFor(q, d))
    assignWindows(matchedEvents(events, q), w)
      .groupBy(col("__win") +: keyCols: _*)
      .agg(aggs.head, aggs.tail: _*)
  }

  /** Driver-side snapshot of one group's state in one window. */
  final case class StateRow(win: Long, key: Seq[String], vals: Map[String, Eval.Value])

  /** Collect the state DataFrame into window-ordered driver rows:
    * (windowIndex -> rows), windows sorted ascending. Group keys are
    * stringified; values become [[Eval.Value]]s.
    */
  def collectStates(statesDf: DataFrame, q: SaqlQuery): Seq[(Long, Seq[StateRow])] = {
    val sb = q.state.get
    val keyNames = sb.groupBy.map(_.colName)
    val rows = statesDf.collect().toSeq.map { r =>
      val win = r.getAs[Long]("__win")
      val key = keyNames.map(k => String.valueOf(r.getAs[Any](k)))
      val vals: Map[String, Eval.Value] = sb.defs.map { d =>
        val v: Eval.Value = d.func match {
          case "set" =>
            Eval.SetV(r.getAs[scala.collection.Seq[String]](d.name).toSet)
          case _ =>
            val x = r.getAs[Any](d.name)
            Eval.NumV(x match {
              case null      => 0.0
              case n: Number => n.doubleValue()
              case o         => o.toString.toDouble
            })
        }
        d.name -> v
      }.toMap
      StateRow(win, key, vals)
    }
    rows.groupBy(_.win).toSeq.sortBy(_._1)
  }
}
