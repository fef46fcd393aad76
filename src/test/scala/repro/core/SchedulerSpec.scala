package repro.core

import repro.SparkSpec
import repro.events.{AttackTrace, MonitoringData}
import repro.saql.Parser
import repro.saql.Ast.SaqlQuery

/** Master-dependent-query scheme: grouping, subsumption, result equality
  * and data-copy accounting.
  */
class SchedulerSpec extends SparkSpec {

  private lazy val stream = MonitoringData.events(spark, sf = 0.002, seed = 2).cache()

  private def netQuery(name: String, exe: String): SaqlQuery = Parser.parse(
    s"""proc p["%$exe"] write ip i as evt #time(10 min)
       |state ss { amt := sum(evt.amount) } group by p
       |alert ss.amt > 0
       |return p, ss.amt""".stripMargin, name)

  private val master = Parser.parse(
    """proc p write ip i as evt #time(10 min)
      |state ss { amt := sum(evt.amount) } group by p
      |alert ss.amt > 0
      |return p, ss.amt""".stripMargin, "net_all")

  private val deps = Seq("chrome.exe", "outlook.exe", "sqlservr.exe", "apache.exe")
    .map(e => netQuery(s"net_$e", e))

  test("signature groups same-shape queries") {
    val sig = Scheduler.signature(master)
    assert(deps.forall(d => Scheduler.signature(d) == sig))
  }

  test("different window or ops break compatibility") {
    val other = Parser.parse(
      """proc p read ip i as evt #time(10 min)
        |state ss { amt := sum(evt.amount) } group by p
        |alert ss.amt > 0
        |return p, ss.amt""".stripMargin, "reads")
    assert(Scheduler.signature(other) != Scheduler.signature(master))
    val otherWin = Parser.parse(
      """proc p write ip i as evt #time(5 min)
        |state ss { amt := sum(evt.amount) } group by p
        |alert ss.amt > 0
        |return p, ss.amt""".stripMargin, "w5")
    assert(Scheduler.signature(otherWin) != Scheduler.signature(master))
  }

  test("subsumption: unconstrained master covers constrained dependents") {
    deps.foreach(d => assert(Scheduler.subsumes(master, d)))
    deps.foreach(d => assert(!Scheduler.subsumes(d, master)))
    assert(!Scheduler.subsumes(deps(0), deps(1)))
  }

  test("grouping elects the subsuming member as master") {
    val gs = Scheduler.group(master +: deps)
    assert(gs.size == 1)
    assert(gs.head.master.map(_.name).contains("net_all"))
    assert(gs.head.members.size == 5)
  }

  test("grouping without a subsuming member synthesizes a union master") {
    val gs = Scheduler.group(deps)
    assert(gs.size == 1)
    assert(gs.head.master.isEmpty) // union-of-constraints filter
  }

  test("incompatible queries go to separate groups") {
    val rule = Parser.parse(
      """proc p1["%cmd.exe"] start proc p2 as evt1
        |return distinct p1, p2""".stripMargin, "rule1")
    val gs = Scheduler.group(Seq(master, rule) ++ deps)
    assert(gs.size == 2)
  }

  test("master-dependent alerts equal independent alerts") {
    val queries = master +: deps
    val ind = Scheduler.runIndependent(stream, queries)
    val mdq = Scheduler.runMasterDependent(stream, queries)
    assert(ind.alerts.keySet == mdq.alerts.keySet)
    for (name <- ind.alerts.keySet)
      assert(ind.alerts(name) == mdq.alerts(name), s"alerts differ for $name")
  }

  test("union-master groups also preserve alerts") {
    val ind = Scheduler.runIndependent(stream, deps)
    val mdq = Scheduler.runMasterDependent(stream, deps)
    for (name <- ind.alerts.keySet)
      assert(ind.alerts(name) == mdq.alerts(name), s"alerts differ for $name")
  }

  test("scheme reduces stream scans by the grouping factor") {
    val queries = master +: deps // 5 queries, 1 group
    val n = stream.count()
    val ind = Scheduler.runIndependent(stream, queries)
    val mdq = Scheduler.runMasterDependent(stream, queries)
    assert(ind.stats.rowsScanned == 5 * n)
    assert(mdq.stats.rowsScanned == n)
    assert(mdq.stats.groups == 1 && ind.stats.groups == 5)
  }

  test("scheme reduces data copies (dependents read master output only)") {
    val queries = master +: deps
    val n = stream.count()
    val ind = Scheduler.runIndependent(stream, queries)
    val mdq = Scheduler.runMasterDependent(stream, queries)
    assert(ind.stats.rowsCopied == 5 * n)
    assert(mdq.stats.rowsCopied < ind.stats.rowsCopied)
  }

  test("rule queries detect the same attack under both schemes") {
    val atk = AttackTrace.withBackground(spark, sf = 0.002, seed = 0,
      attackStartMs = 1_800_000L).cache()
    val qs = Seq(
      repro.queries.DemoQueries.r1InitialCompromise(0L),
      repro.queries.DemoQueries.r3PrivilegeEscalation(0L))
    val ind = Scheduler.runIndependent(atk, qs)
    val mdq = Scheduler.runMasterDependent(atk, qs)
    assert(ind.alerts == mdq.alerts)
    assert(ind.alerts.values.forall(_.nonEmpty))
  }
}
