package repro.saql

import org.scalatest.funsuite.AnyFunSuite
import Ast._

/** Parses the paper's Queries 1–4 verbatim plus each clause in isolation. */
class ParserSpec extends AnyFunSuite {

  // ------------------------------------------------ the paper's Query 1

  private val query1 =
    """
      |agentid = 7 // SQL database server (obfuscated)
      |proc p1["%cmd.exe"] start proc p2["%osql.exe"] as evt1
      |proc p3["%sqlservr.exe"] write file f1["%backup1.dmp"] as evt2
      |proc p4["%sbblv.exe"] read file f1 as evt3
      |proc p4 read || write ip i1[dstip="203.0.113.129"] as evt4
      |with evt1 -> evt2 -> evt3 -> evt4
      |return distinct p1, p2, p3, f1, p4, i1 // p1 -> p1.exe_name
      |""".stripMargin

  test("Query 1 (rule-based) parses") {
    val q = Parser.parse(query1, "q1")
    assert(q.modelType == RuleModel)
    assert(q.patterns.size == 4)
    assert(q.globals == Seq(GlobalConstraint("agentid", "=", "7")))
    assert(q.temporal.contains(Seq("evt1", "evt2", "evt3", "evt4")))
    assert(q.ret.distinct)
    assert(q.ret.items.size == 6)
  }

  test("Query 1: default-attribute constraint becomes LIKE-style predicate") {
    val q = Parser.parse(query1)
    assert(q.patterns.head.subj.preds ==
      Seq(AttrPredicate("exe_name", "=", "%cmd.exe")))
  }

  test("Query 1: op disjunction read || write") {
    val q = Parser.parse(query1)
    assert(q.patterns(3).ops == Seq("read", "write"))
  }

  test("Query 1: named-attribute constraint on ip") {
    val q = Parser.parse(query1)
    assert(q.patterns(3).obj.preds ==
      Seq(AttrPredicate("dstip", "=", "203.0.113.129")))
  }

  test("Query 1: shared variable f1 occurs in two patterns") {
    val q = Parser.parse(query1)
    assert(q.varOccurrences("f1").map(_._1) == Seq("evt2", "evt3"))
  }

  test("Query 1: variable kinds are consistent") {
    val q = Parser.parse(query1)
    assert(q.kindOf("p4").contains(ProcKind))
    assert(q.kindOf("f1").contains(FileKind))
    assert(q.kindOf("i1").contains(IpKind))
  }

  // ------------------------------------------------ the paper's Query 2

  private val query2 =
    """
      |proc p write ip i as evt #time(10 min)
      |state[3] ss {
      |  avg_amount := avg(evt.amount)
      |} group by p
      |alert (ss[0].avg_amount > (ss[0].avg_amount + ss[1].avg_amount + ss[2].avg_amount) / 3) && (ss[0].avg_amount > 10000)
      |return p, ss[0].avg_amount, ss[1].avg_amount, ss[2].avg_amount
      |""".stripMargin

  test("Query 2 (time-series) parses") {
    val q = Parser.parse(query2, "q2")
    assert(q.modelType == TimeSeriesModel)
    assert(q.state.get.history == 3)
    assert(q.state.get.name == "ss")
    assert(q.window.contains(WindowSpec(600000, 600000)))
  }

  test("Query 2: state definition avg(evt.amount)") {
    val q = Parser.parse(query2)
    assert(q.state.get.defs ==
      Seq(StateDef("avg_amount", "avg", FieldRef("evt", Some("amount")))))
  }

  test("Query 2: group by bare variable") {
    val q = Parser.parse(query2)
    assert(q.state.get.groupBy == Seq(FieldRef("p", None)))
  }

  test("Query 2: alert references ss[0..2]") {
    val q = Parser.parse(query2)
    val refs = collectStateRefs(q.alert.get)
    assert(refs.map(_.index).toSet == Set(0, 1, 2))
  }

  test("Query 2: return mixes attr and state refs") {
    val q = Parser.parse(query2)
    assert(q.ret.items.head == AttrRef(FieldRef("p", None)))
    assert(q.ret.items(1) == StateRef("ss", 0, "avg_amount"))
  }

  // ------------------------------------------------ the paper's Query 3

  private val query3 =
    """
      |proc p1["%apache.exe"] start proc p2 as evt #time(10 s)
      |state ss {
      |  set_proc := set(p2.exe_name)
      |} group by p1
      |invariant[10][offline] {
      |  a := empty_set // invariant init
      |  a = a union ss.set_proc // invariant update
      |}
      |alert |ss.set_proc diff a| > 0
      |return p1, ss.set_proc
      |""".stripMargin

  test("Query 3 (invariant-based) parses") {
    val q = Parser.parse(query3, "q3")
    assert(q.modelType == InvariantModel)
    val ib = q.invariant.get
    assert(ib.trainWindows == 10 && ib.offline && ib.varName == "a")
    assert(ib.init == EmptySet)
    assert(ib.update == Bin("union", InvRef("a"), StateRef("ss", 0, "set_proc")))
  }

  test("Query 3: implicit state[1] history") {
    assert(Parser.parse(query3).state.get.history == 1)
  }

  test("Query 3: 10-second window") {
    assert(Parser.parse(query3).window.contains(WindowSpec(10000, 10000)))
  }

  test("Query 3: set-cardinality alert over diff") {
    val q = Parser.parse(query3)
    assert(q.alert.get ==
      Bin(">", SetCard(Bin("diff", StateRef("ss", 0, "set_proc"), InvRef("a"))),
          NumLit(0)))
  }

  test("Query 3: bare ss.field is state index 0") {
    val q = Parser.parse(query3)
    assert(q.ret.items(1) == StateRef("ss", 0, "set_proc"))
  }

  // ------------------------------------------------ the paper's Query 4

  private val query4 =
    """
      |agentid = 7 // SQL database server (obfuscated)
      |proc p["%sqlservr.exe"] read || write ip i as evt #time(10 min)
      |state ss {
      |  amt := sum(evt.amount)
      |} group by i.dstip
      |cluster(points=all(ss.amt), distance="ed", method="DBSCAN(100000, 5)")
      |alert cluster.outlier && ss.amt > 1000000
      |return i.dstip, ss.amt
      |""".stripMargin

  test("Query 4 (outlier-based) parses") {
    val q = Parser.parse(query4, "q4")
    assert(q.modelType == OutlierModel)
    val cb = q.cluster.get
    assert(cb.points == Seq(FieldRef("ss", Some("amt"))))
    assert(cb.distance == "ed")
    assert(cb.method == "DBSCAN" && cb.args == Seq(100000.0, 5.0))
  }

  test("Query 4: group by dotted attribute") {
    assert(Parser.parse(query4).state.get.groupBy == Seq(FieldRef("i", Some("dstip"))))
  }

  test("Query 4: cluster.outlier in alert conjunction") {
    val q = Parser.parse(query4)
    assert(q.alert.get ==
      Bin("&&", ClusterOutlier, Bin(">", StateRef("ss", 0, "amt"), NumLit(1000000))))
  }

  // ------------------------------------------------ clause details

  test("window units: seconds, minutes, hours, ms") {
    def win(u: String): Long =
      Parser.parse(s"proc p start proc q as e #time(2 $u)\nreturn p")
        .window.get.lengthMs
    assert(win("s") == 2000 && win("min") == 120000 && win("hour") == 7200000 &&
           win("ms") == 2)
  }

  test("explicit slide: #time(10 min, 5 min)") {
    val q = Parser.parse("proc p start proc q as e #time(10 min, 5 min)\nreturn p")
    assert(q.window.contains(WindowSpec(600000, 300000)))
  }

  test("multiple global constraints") {
    val q = Parser.parse("agentid = 1\nagentid != 5\nproc p start proc q as e\nreturn p")
    assert(q.globals.size == 2 && q.globals(1).op == "!=")
  }

  test("multiple predicates in one bracket") {
    val q = Parser.parse(
      """proc p write ip i[dstip="1.2.3.4", dstport=443] as e
        |return p""".stripMargin)
    assert(q.patterns.head.obj.preds.size == 2)
    assert(q.patterns.head.obj.preds(1) == AttrPredicate("dstport", "=", "443"))
  }

  test("online invariant mode") {
    val q = Parser.parse(
      """proc p start proc q as e #time(10 s)
        |state ss { s := set(q.exe_name) } group by p
        |invariant[5][online] { a := empty_set
        |a = a union ss.s }
        |alert |ss.s diff a| > 0
        |return p""".stripMargin)
    assert(!q.invariant.get.offline)
  }

  test("return without distinct") {
    assert(!Parser.parse("proc p start proc q as e\nreturn p, q").ret.distinct)
  }

  test("arithmetic precedence: * binds tighter than +") {
    val q = Parser.parse(
      "proc p write ip i as e #time(1 min)\nstate ss { x := avg(e.amount) } group by p\n" +
      "alert ss.x > 1 + 2 * 3\nreturn p")
    assert(q.alert.get ==
      Bin(">", StateRef("ss", 0, "x"), Bin("+", NumLit(1), Bin("*", NumLit(2), NumLit(3)))))
  }

  test("&& binds tighter than ||") {
    val q = Parser.parse(
      "proc p write ip i as e #time(1 min)\nstate ss { x := avg(e.amount) } group by p\n" +
      "alert ss.x > 1 || ss.x < 0 && ss.x > 2\nreturn p")
    q.alert.get match {
      case Bin("||", _, Bin("&&", _, _)) => ()
      case other => fail(s"wrong precedence: $other")
    }
  }

  test("parenthesised expressions override precedence") {
    val q = Parser.parse(
      "proc p write ip i as e #time(1 min)\nstate ss { x := avg(e.amount) } group by p\n" +
      "alert (ss.x + 1) * 2 > 4\nreturn p")
    q.alert.get match {
      case Bin(">", Bin("*", Bin("+", _, _), NumLit(2)), NumLit(4)) => ()
      case other => fail(s"wrong structure: $other")
    }
  }

  // ------------------------------------------------ error reporting

  test("error: query without patterns") {
    val e = intercept[SaqlParseException](Parser.parse("return p"))
    assert(e.getMessage.contains("at least one event pattern"))
  }

  test("error: missing 'as' alias") {
    intercept[SaqlParseException](Parser.parse("proc p start proc q\nreturn p"))
  }

  test("error: missing return clause") {
    intercept[SaqlParseException](Parser.parse("proc p start proc q as e"))
  }

  test("error: bad time unit") {
    val e = intercept[SaqlParseException](
      Parser.parse("proc p start proc q as e #time(10 fortnight)\nreturn p"))
    assert(e.getMessage.contains("unknown time unit"))
  }

  test("error: invariant updating a different variable") {
    val e = intercept[SaqlParseException](Parser.parse(
      """proc p start proc q as e #time(10 s)
        |state ss { s := set(q.exe_name) } group by p
        |invariant[5][offline] { a := empty_set
        |b = a union ss.s }
        |alert |ss.s diff a| > 0
        |return p""".stripMargin))
    assert(e.getMessage.contains("must assign 'a'"))
  }

  test("error: trailing garbage after return") {
    val e = intercept[SaqlParseException](
      Parser.parse("proc p start proc q as e\nreturn p }"))
    assert(e.getMessage.contains("unexpected trailing input"))
  }

  test("error messages carry line numbers") {
    val e = intercept[SaqlParseException](
      Parser.parse("proc p start proc q as e\nreturn p ]"))
    assert(e.getMessage.contains("line 2"))
  }

  test("method string without args") {
    assert(Parser.parseMethod("KMEANS") == ("KMEANS", Nil))
  }

  test("method string with args and spaces") {
    assert(Parser.parseMethod(" DBSCAN ( 1.5 , 3 ) ") == ("DBSCAN", Seq(1.5, 3.0)))
  }

  private def collectStateRefs(e: Expr): Seq[StateRef] = e match {
    case s: StateRef   => Seq(s)
    case Bin(_, l, r)  => collectStateRefs(l) ++ collectStateRefs(r)
    case SetCard(x)    => collectStateRefs(x)
    case _             => Nil
  }
}
