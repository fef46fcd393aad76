package repro.saql

/** Abstract syntax of the Stream-based Anomaly Query Language (SAQL).
  *
  * Covers the full surface of the paper's Queries 1–4: event patterns with
  * attribute constraints, global constraints, sliding windows (`#time`),
  * temporal relations (`with evt1 -> evt2`), stateful computation
  * (`state[k] … group by`), invariant learning (`invariant[n][offline]`),
  * clustering (`cluster(points=…, distance=…, method=…)`), `alert` and
  * `return [distinct]` with context-aware shortcuts.
  */
object Ast {

  /** Entity kinds with their context-aware default attribute
    * (the `p1 -> p1.exe_name` shortcut of Query 1).
    */
  sealed trait EntityKind { def keyword: String; def defaultAttr: String }
  case object ProcKind extends EntityKind { val keyword = "proc"; val defaultAttr = "exe_name" }
  case object FileKind extends EntityKind { val keyword = "file"; val defaultAttr = "name" }
  case object IpKind   extends EntityKind { val keyword = "ip";   val defaultAttr = "dstip" }

  /** One attribute constraint inside `[...]`. `op` is "=", "!=", "<", ">",
    * "<=", ">=". Values containing `%` are matched as SQL LIKE patterns.
    */
  final case class AttrPredicate(attr: String, op: String, value: String)

  /** One occurrence of an entity in a pattern: kind, variable name, and the
    * constraints declared at this occurrence. Re-using a variable name binds
    * the same entity (an implicit attribute relationship between patterns).
    */
  final case class EntityDecl(kind: EntityKind, varName: String,
                              preds: Seq[AttrPredicate])

  /** Sliding-window spec: length and slide (slide == length => tumbling,
    * which is the paper's `#time(10 min)` behaviour).
    */
  final case class WindowSpec(lengthMs: Long, slideMs: Long) {
    require(lengthMs > 0 && slideMs > 0, "window length/slide must be positive")
  }

  /** `proc p1["%cmd.exe"] start proc p2["%osql.exe"] as evt1 #time(...)`.
    * `ops` has several entries for disjunctions like `read || write`.
    */
  final case class EventPattern(subj: EntityDecl, ops: Seq[String],
                                obj: EntityDecl, alias: String,
                                window: Option[WindowSpec])

  /** Top-of-query constraint applying to every pattern, e.g. `agentid = 5`. */
  final case class GlobalConstraint(attr: String, op: String, value: String)

  /** Reference to a variable's attribute: `evt.amount`, `p2.exe_name`, or a
    * bare variable `p` (attr resolved context-sensitively to the default).
    */
  final case class FieldRef(varName: String, attr: Option[String]) {
    /** Stable column-safe name, e.g. `i1.dstip` -> `i1_dstip`. */
    def colName: String = attr.fold(varName)(a => s"${varName}_$a")
    override def toString: String = attr.fold(varName)(a => s"$varName.$a")
  }

  /** `avg_amount := avg(evt.amount)` — one aggregate per sliding window. */
  final case class StateDef(name: String, func: String, arg: FieldRef)

  /** `state[3] ss { ... } group by p` — `history` is the number of window
    * states addressable as `ss[0]` (current) … `ss[history-1]` (oldest).
    */
  final case class StateBlock(history: Int, name: String, defs: Seq[StateDef],
                              groupBy: Seq[FieldRef])

  /** `invariant[10][offline] { a := <init>  a = <update> }` — learn from the
    * first `trainWindows` windows, then detect violations.
    */
  final case class InvariantBlock(trainWindows: Int, offline: Boolean,
                                  varName: String, init: Expr, update: Expr)

  /** `cluster(points=all(ss.amt), distance="ed", method="DBSCAN(100000,5)")`. */
  final case class ClusterBlock(points: Seq[FieldRef], distance: String,
                                method: String, args: Seq[Double])

  /** `return [distinct] item, item, …`. */
  final case class ReturnStmt(distinct: Boolean, items: Seq[Expr])

  // ------------------------------- expressions ---------------------------

  sealed trait Expr
  final case class NumLit(v: Double) extends Expr
  final case class StrLit(v: String) extends Expr
  /** `ss[1].avg_amount`; bare `ss.f` parses as index 0 (current window). */
  final case class StateRef(state: String, index: Int, field: String) extends Expr
  /** An entity/event attribute (`p`, `i.dstip`, `evt.amount`). */
  final case class AttrRef(ref: FieldRef) extends Expr
  /** The invariant variable (`a`). */
  final case class InvRef(name: String) extends Expr
  /** `cluster.outlier` — true iff this group's point is DBSCAN noise. */
  case object ClusterOutlier extends Expr
  /** `empty_set` — invariant initialiser. */
  case object EmptySet extends Expr
  /** `|e|` — set cardinality. */
  final case class SetCard(e: Expr) extends Expr
  /** Binary op: arithmetic + - * /, comparison > < >= <= == !=,
    * logical && ||, set ops `union` / `diff`.
    */
  final case class Bin(op: String, l: Expr, r: Expr) extends Expr

  // ------------------------------- query ---------------------------------

  /** The four anomaly-model types of the paper. */
  sealed trait ModelType
  case object RuleModel       extends ModelType
  case object TimeSeriesModel extends ModelType
  case object InvariantModel  extends ModelType
  case object OutlierModel    extends ModelType

  final case class SaqlQuery(
      name: String,
      globals: Seq[GlobalConstraint],
      patterns: Seq[EventPattern],
      /** Temporal chain from `with evt1 -> evt2 -> …` (pattern aliases). */
      temporal: Option[Seq[String]],
      state: Option[StateBlock],
      invariant: Option[InvariantBlock],
      cluster: Option[ClusterBlock],
      alert: Option[Expr],
      ret: ReturnStmt,
  ) {

    /** Which anomaly-model family this query expresses (paper §II-B). */
    def modelType: ModelType =
      if (cluster.isDefined) OutlierModel
      else if (invariant.isDefined) InvariantModel
      else if (state.isDefined) TimeSeriesModel
      else RuleModel

    /** The per-query window; stateful queries must declare one. */
    def window: Option[WindowSpec] = patterns.flatMap(_.window).headOption

    /** All occurrences of each entity variable: (alias, role, decl). */
    def varOccurrences: Map[String, Seq[(String, String, EntityDecl)]] =
      patterns
        .flatMap(p => Seq((p.alias, "subj", p.subj), (p.alias, "obj", p.obj)))
        .groupBy(_._3.varName)

    /** Kind of a declared variable (all occurrences must agree). */
    def kindOf(varName: String): Option[EntityKind] =
      varOccurrences.get(varName).map { occ =>
        val kinds = occ.map(_._3.kind).distinct
        require(kinds.size == 1,
          s"variable $varName declared with conflicting kinds $kinds")
        kinds.head
      }
  }
}
