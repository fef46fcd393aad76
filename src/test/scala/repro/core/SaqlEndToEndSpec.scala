package repro.core

import repro.SparkSpec
import repro.saql.Parser
import TestEvents._

/** Language-feature coverage end-to-end: windows, grouping, aggregates,
  * predicates, modes — each exercised through parse -> compile -> run.
  */
class SaqlEndToEndSpec extends SparkSpec {

  test("sliding windows (#time(len, slide)) see events in multiple windows") {
    val q = Parser.parse(
      """proc p write ip i as evt #time(20 s, 10 s)
        |state ss { n := count(evt.amount) } group by p
        |return p, ss.n""".stripMargin, "slide")
    val evs = Seq(net(0, 15_000L, "a.exe", "1.1.1.1", 10))
    val out = QueryEngine.run(df(spark, evs), q)
    // ts=15s is inside windows [0,20s) and [10s,30s).
    assert(out.map(_.win).sorted == Seq(0L, 1L))
    assert(out.forall(_.values("ss_n") == "1"))
  }

  test("multi-key group by separates state per key pair") {
    val q = Parser.parse(
      """proc p write ip i as evt #time(10 s)
        |state ss { amt := sum(evt.amount) } group by p, i.dstip
        |alert ss.amt > 150
        |return p, i.dstip, ss.amt""".stripMargin, "multikey")
    val evs = Seq(
      net(0, 1000L, "a.exe", "1.1.1.1", 100),
      net(0, 2000L, "a.exe", "2.2.2.2", 200),
      net(0, 3000L, "b.exe", "1.1.1.1", 300))
    val alerts = QueryEngine.run(df(spark, evs), q)
    assert(alerts.map(a => (a.values("p"), a.values("i_dstip"))).toSet ==
      Set(("a.exe", "2.2.2.2"), ("b.exe", "1.1.1.1")))
  }

  test("min aggregate and comparison in alert") {
    val q = Parser.parse(
      """proc p write ip i as evt #time(10 s)
        |state ss { lo := min(evt.amount) } group by p
        |alert ss.lo < 50
        |return p, ss.lo""".stripMargin, "minq")
    val evs = Seq(
      net(0, 1000L, "a.exe", "1.1.1.1", 10),
      net(0, 2000L, "a.exe", "1.1.1.1", 500),
      net(0, 3000L, "b.exe", "1.1.1.1", 100))
    val alerts = QueryEngine.run(df(spark, evs), q)
    assert(alerts.map(_.values("p")) == Seq("a.exe"))
    assert(alerts.head.values("ss_lo") == "10")
  }

  test("numeric predicate on dstport filters the pattern") {
    val q = Parser.parse(
      """proc p write ip i[dstport=443] as evt #time(10 s)
        |state ss { n := count(evt.amount) } group by p
        |return p, ss.n""".stripMargin, "port")
    // TestEvents.net always uses port 443; craft one with a different port.
    val other = net(0, 1000L, "x.exe", "9.9.9.9", 5).copy(dst_port = 22L)
    val evs = Seq(net(0, 1000L, "a.exe", "1.1.1.1", 5), other)
    val out = QueryEngine.run(df(spark, evs), q)
    assert(out.map(_.values("p")) == Seq("a.exe"))
  }

  test("state arithmetic across history indices in alert") {
    val q = Parser.parse(
      """proc p write ip i as evt #time(10 s)
        |state[2] ss { amt := sum(evt.amount) } group by p
        |alert ss[0].amt > ss[1].amt * 2
        |return p, ss[0].amt, ss[1].amt""".stripMargin, "growth")
    val evs = Seq(
      net(0, 1000L, "a.exe", "1.1.1.1", 100),   // win0: 100
      net(0, 11_000L, "a.exe", "1.1.1.1", 150), // win1: 150 < 200 no alert
      net(0, 21_000L, "a.exe", "1.1.1.1", 400)) // win2: 400 > 300 alert
    val alerts = QueryEngine.run(df(spark, evs), q)
    // win0 alerts too (100 > 0*2); win2 alerts (400 > 150*2).
    assert(alerts.map(_.win).toSet == Set(0L, 2L))
  }

  test("op disjunction feeds both reads and writes into state") {
    val q = Parser.parse(
      """proc p read || write ip i as evt #time(10 s)
        |state ss { amt := sum(evt.amount) } group by p
        |alert ss.amt >= 30
        |return p, ss.amt""".stripMargin, "rw")
    val evs = Seq(
      net(0, 1000L, "a.exe", "1.1.1.1", 10, op = "read"),
      net(0, 2000L, "a.exe", "1.1.1.1", 20, op = "write"))
    val alerts = QueryEngine.run(df(spark, evs), q)
    assert(alerts.head.values("ss_amt") == "30")
  }

  test("global constraint applies to stateful queries") {
    val q = Parser.parse(
      """agentid = 1
        |proc p write ip i as evt #time(10 s)
        |state ss { n := count(evt.amount) } group by p
        |return p, ss.n""".stripMargin, "agent1")
    val evs = Seq(
      net(0, 1000L, "a.exe", "1.1.1.1", 10),
      net(1, 1000L, "b.exe", "1.1.1.1", 10))
    val out = QueryEngine.run(df(spark, evs), q)
    assert(out.map(_.values("p")) == Seq("b.exe"))
  }

  test("online invariant keeps learning after the training phase") {
    val q = Parser.parse(
      """proc p1 start proc p2 as evt #time(10 s)
        |state ss { sp := set(p2.exe_name) } group by p1
        |invariant[2][online] {
        |  a := empty_set
        |  a = a union ss.sp
        |}
        |alert |ss.sp diff a| > 0
        |return p1, ss.sp""".stripMargin, "online_inv")
    val evs = Seq(
      start(0, 1000L, "srv.exe", "w.exe"),   // win0 train
      start(0, 11_000L, "srv.exe", "w.exe"), // win1 train
      start(0, 21_000L, "srv.exe", "new.exe"), // win2: alert, then absorbed
      start(0, 41_000L, "srv.exe", "new.exe")) // win4: known now -> silent
    val alerts = QueryEngine.run(df(spark, evs), q)
    assert(alerts.map(_.win) == Seq(2L))
  }

  test("offline invariant alerts repeatedly on the same novelty") {
    val q = Parser.parse(
      """proc p1 start proc p2 as evt #time(10 s)
        |state ss { sp := set(p2.exe_name) } group by p1
        |invariant[2][offline] {
        |  a := empty_set
        |  a = a union ss.sp
        |}
        |alert |ss.sp diff a| > 0
        |return p1, ss.sp""".stripMargin, "offline_inv")
    val evs = Seq(
      start(0, 1000L, "srv.exe", "w.exe"),
      start(0, 11_000L, "srv.exe", "w.exe"),
      start(0, 21_000L, "srv.exe", "new.exe"),
      start(0, 41_000L, "srv.exe", "new.exe")) // frozen invariant: alerts again
    val alerts = QueryEngine.run(df(spark, evs), q)
    assert(alerts.map(_.win) == Seq(2L, 4L))
  }

  test("string equality predicate (no % wildcard) is exact") {
    val q = Parser.parse(
      """proc p1["cmd.exe"] start proc p2 as evt1
        |return distinct p1, p2""".stripMargin, "exact")
    val evs = Seq(
      start(0, 1000L, "cmd.exe", "a.exe"),
      start(0, 2000L, "notcmd.exe", "b.exe"))
    val alerts = QueryEngine.run(df(spark, evs), q)
    assert(alerts.map(_.values("p2")) == Seq("a.exe"))
  }

  test("!= predicate excludes a value") {
    val q = Parser.parse(
      """proc p1 start proc p2[exe_name!="noise.exe"] as evt1
        |return distinct p1, p2""".stripMargin, "neq")
    val evs = Seq(
      start(0, 1000L, "a.exe", "noise.exe"),
      start(0, 2000L, "a.exe", "signal.exe"))
    val alerts = QueryEngine.run(df(spark, evs), q)
    assert(alerts.map(_.values("p2")) == Seq("signal.exe"))
  }

  test("return items may be computed expressions over state") {
    val q = Parser.parse(
      """proc p write ip i as evt #time(10 s)
        |state ss { amt := sum(evt.amount) } group by p
        |alert ss.amt > 0
        |return p, ss.amt * 2""".stripMargin, "calc")
    val evs = Seq(net(0, 1000L, "a.exe", "1.1.1.1", 21))
    val alerts = QueryEngine.run(df(spark, evs), q)
    assert(alerts.head.values.values.toSet.contains("42"))
  }

  test("srcip attribute is addressable in patterns") {
    val q = Parser.parse(
      """proc p write ip i[srcip="10.0.0.50"] as evt #time(10 s)
        |state ss { n := count(evt.amount) } group by i.srcip
        |return i.srcip, ss.n""".stripMargin, "srcip")
    val evs = Seq(net(0, 1000L, "a.exe", "1.1.1.1", 5))
    val out = QueryEngine.run(df(spark, evs), q)
    assert(out.head.values("i_srcip") == "10.0.0.50")
  }

  test("count of matched process events via set+card") {
    val q = Parser.parse(
      """proc p1 start proc p2 as evt #time(10 s)
        |state ss { sp := set(p2.exe_name) } group by p1
        |alert |ss.sp| >= 2
        |return p1, ss.sp""".stripMargin, "card")
    val evs = Seq(
      start(0, 1000L, "a.exe", "x.exe"),
      start(0, 2000L, "a.exe", "y.exe"),
      start(0, 3000L, "b.exe", "x.exe"))
    val alerts = QueryEngine.run(df(spark, evs), q)
    assert(alerts.map(_.values("p1")) == Seq("a.exe"))
  }
}
