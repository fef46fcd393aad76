package repro.saql

import org.scalatest.funsuite.AnyFunSuite
import Ast._

class AstSpec extends AnyFunSuite {

  private def pattern(alias: String, subj: EntityDecl, obj: EntityDecl,
                      win: Option[WindowSpec] = None) =
    EventPattern(subj, Seq("start"), obj, alias, win)

  private val p  = EntityDecl(ProcKind, "p", Nil)
  private val c  = EntityDecl(ProcKind, "c", Nil)
  private val ret = ReturnStmt(distinct = false, Seq(AttrRef(FieldRef("p", None))))

  private def query(state: Option[StateBlock] = None,
                    inv: Option[InvariantBlock] = None,
                    cluster: Option[ClusterBlock] = None) =
    SaqlQuery("q", Nil, Seq(pattern("e", p, c, Some(WindowSpec(1000, 1000)))),
      None, state, inv, cluster, None, ret)

  private val sb = StateBlock(1, "ss", Seq(StateDef("x", "avg", FieldRef("e", Some("amount")))),
    Seq(FieldRef("p", None)))

  test("model type: no stateful clauses means rule-based") {
    assert(query().modelType == RuleModel)
  }

  test("model type: state alone means time-series") {
    assert(query(state = Some(sb)).modelType == TimeSeriesModel)
  }

  test("model type: invariant dominates state") {
    val ib = InvariantBlock(5, offline = true, "a", EmptySet,
      Bin("union", InvRef("a"), StateRef("ss", 0, "x")))
    assert(query(state = Some(sb), inv = Some(ib)).modelType == InvariantModel)
  }

  test("model type: cluster dominates everything") {
    val cb = ClusterBlock(Seq(FieldRef("ss", Some("x"))), "ed", "DBSCAN", Seq(1, 2))
    assert(query(state = Some(sb), cluster = Some(cb)).modelType == OutlierModel)
  }

  test("window comes from the first windowed pattern") {
    val q = SaqlQuery("q", Nil, Seq(
      pattern("e1", p, c, None),
      pattern("e2", p, c, Some(WindowSpec(5000, 5000)))),
      None, None, None, None, None, ret)
    assert(q.window.contains(WindowSpec(5000, 5000)))
  }

  test("varOccurrences tracks alias, role and declaration") {
    val f = EntityDecl(FileKind, "f", Seq(AttrPredicate("name", "=", "%x")))
    val q = SaqlQuery("q", Nil, Seq(
      EventPattern(p, Seq("write"), f, "e1", None),
      EventPattern(c, Seq("read"), f, "e2", None)),
      None, None, None, None, None, ret)
    val occ = q.varOccurrences("f")
    assert(occ.map(o => (o._1, o._2)) == Seq(("e1", "obj"), ("e2", "obj")))
    assert(q.varOccurrences("p").head._2 == "subj")
  }

  test("kindOf rejects conflicting declarations") {
    val q = SaqlQuery("q", Nil, Seq(
      EventPattern(p, Seq("write"), EntityDecl(FileKind, "x", Nil), "e1", None),
      EventPattern(p, Seq("write"), EntityDecl(IpKind, "x", Nil), "e2", None)),
      None, None, None, None, None, ret)
    intercept[IllegalArgumentException](q.kindOf("x"))
  }

  test("kindOf of unknown variable is None") {
    assert(query().kindOf("zzz").isEmpty)
  }

  test("default attributes per entity kind") {
    assert(ProcKind.defaultAttr == "exe_name")
    assert(FileKind.defaultAttr == "name")
    assert(IpKind.defaultAttr == "dstip")
  }

  test("WindowSpec rejects non-positive lengths") {
    intercept[IllegalArgumentException](WindowSpec(0, 1))
    intercept[IllegalArgumentException](WindowSpec(1000, -1))
  }

  test("FieldRef colName flattens dots") {
    assert(FieldRef("i1", Some("dstip")).colName == "i1_dstip")
    assert(FieldRef("p", None).colName == "p")
    assert(FieldRef("i1", Some("dstip")).toString == "i1.dstip")
  }
}
