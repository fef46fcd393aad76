package repro.core

import org.apache.spark.sql.Column
import org.apache.spark.sql.functions._
import repro.saql.Ast._

/** Maps SAQL attribute names onto [[repro.events.SystemEvent]] columns.
  *
  * Resolution is role-sensitive: `p.exe_name` maps to `subj_exe` when `p`
  * is a pattern's subject and to `obj_exe` when it is the object of a
  * `start`. Event-level attributes (`evt.amount`, `evt.ts`, …) map 1:1.
  */
object Columns {

  /** SAQL event attributes usable via a pattern alias (`evt.amount`). */
  private val eventAttrs: Map[String, String] = Map(
    "amount" -> "amount", "ts" -> "ts", "time" -> "ts", "agentid" -> "agentid",
    "op" -> "op", "id" -> "event_id", "type" -> "event_type")

  /** Resolve an entity attribute for a given kind + role to a column name. */
  def entityColumn(kind: EntityKind, role: String, attr: String): String =
    (kind, attr) match {
      case (ProcKind, "exe_name" | "name" | "exe") =>
        if (role == "obj") "obj_exe" else "subj_exe"
      case (ProcKind, "pid") => if (role == "obj") "obj_pid" else "subj_pid"
      case (FileKind, "name" | "path") => "file_name"
      case (IpKind, "dstip")   => "dst_ip"
      case (IpKind, "srcip")   => "src_ip"
      case (IpKind, "dstport") => "dst_port"
      case (IpKind, "srcport") => "src_port"
      case _ =>
        throw new IllegalArgumentException(
          s"unknown attribute '$attr' for entity kind '${kind.keyword}'")
    }

  /** Identity attributes used for implicit shared-variable joins. */
  def identityAttrs(kind: EntityKind): Seq[String] = kind match {
    case ProcKind => Seq("exe_name", "pid")
    case FileKind => Seq("name")
    case IpKind   => Seq("dstip")
  }

  /** Event type implied by a pattern's object entity kind. */
  def eventTypeOf(kind: EntityKind): String = kind match {
    case ProcKind => "process"
    case FileKind => "file"
    case IpKind   => "network"
  }

  /** Resolve a [[FieldRef]] within a query to an event column name. Aliases
    * (`evt`, `evt1`, …) resolve through [[eventAttrs]]; entity variables
    * resolve through their first pattern occurrence, defaulting the
    * attribute per kind (`p` -> `exe_name`).
    */
  def resolve(q: SaqlQuery, ref: FieldRef): String = {
    val isAlias = q.patterns.exists(_.alias == ref.varName)
    if (isAlias) {
      val a = ref.attr.getOrElse(
        throw new IllegalArgumentException(s"event alias '${ref.varName}' needs an attribute"))
      eventAttrs.getOrElse(a,
        throw new IllegalArgumentException(s"unknown event attribute '$a'"))
    } else {
      q.varOccurrences.get(ref.varName) match {
        case Some(occ) =>
          val (_, role, decl) = occ.head
          entityColumn(decl.kind, role, ref.attr.getOrElse(decl.kind.defaultAttr))
        case None =>
          // Fall back to a raw event attribute (e.g. `agentid` in return).
          eventAttrs.getOrElse(ref.attr.getOrElse(ref.varName),
            throw new IllegalArgumentException(s"unknown variable '${ref.varName}'"))
      }
    }
  }

  /** Comparison on a column against a SAQL literal: numeric when the value
    * parses as a number, LIKE when it contains `%`, string equality else.
    */
  def compare(c: Column, op: String, value: String): Column = {
    val numeric = value.toDoubleOption
    (op, numeric) match {
      case ("=", _) if value.contains("%")  => c.like(value)
      case ("!=", _) if value.contains("%") => !c.like(value)
      case ("=", Some(d))                   => c === d
      case ("!=", Some(d))                  => c =!= d
      case ("<", Some(d))                   => c < d
      case (">", Some(d))                   => c > d
      case ("<=", Some(d))                  => c <= d
      case (">=", Some(d))                  => c >= d
      case ("=", None)                      => c === value
      case ("!=", None)                     => c =!= value
      case (o, _) =>
        throw new IllegalArgumentException(s"unsupported comparison '$o' on '$value'")
    }
  }

  /** Conjunction of a pattern's constraints (type, ops, subject, object)
    * plus the query's global constraints — the Catalyst predicate that
    * selects this pattern's candidate events.
    */
  def patternPredicate(q: SaqlQuery, p: EventPattern): Column = {
    val base = col("event_type") === eventTypeOf(p.obj.kind) &&
      col("op").isin(p.ops: _*)
    // Merge constraints from every occurrence of the same variable: re-used
    // variables (`f1` in two patterns) constrain all their occurrences.
    def predsFor(decl: EntityDecl): Seq[AttrPredicate] =
      q.varOccurrences.get(decl.varName)
        .map(_.flatMap(_._3.preds).distinct).getOrElse(decl.preds)
    val subjC = predsFor(p.subj).map(ap =>
      compare(col(entityColumn(p.subj.kind, "subj", ap.attr)), ap.op, ap.value))
    val objC = predsFor(p.obj).map(ap =>
      compare(col(entityColumn(p.obj.kind, "obj", ap.attr)), ap.op, ap.value))
    val globalC = q.globals.map(g =>
      compare(col(eventAttrs.getOrElse(g.attr, g.attr)), g.op, g.value))
    (Seq(base) ++ subjC ++ objC ++ globalC).reduce(_ && _)
  }
}
