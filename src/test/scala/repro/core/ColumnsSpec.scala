package repro.core

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.events.MonitoringData
import repro.saql.Ast._
import repro.saql.Parser

class ColumnsSpec extends SparkSpec {

  private lazy val df = MonitoringData.events(spark, sf = 0.002, seed = 0).cache()

  test("entity column mapping is role-sensitive for processes") {
    assert(Columns.entityColumn(ProcKind, "subj", "exe_name") == "subj_exe")
    assert(Columns.entityColumn(ProcKind, "obj", "exe_name") == "obj_exe")
    assert(Columns.entityColumn(ProcKind, "subj", "pid") == "subj_pid")
    assert(Columns.entityColumn(ProcKind, "obj", "pid") == "obj_pid")
  }

  test("file and ip attribute mapping") {
    assert(Columns.entityColumn(FileKind, "obj", "name") == "file_name")
    assert(Columns.entityColumn(IpKind, "obj", "dstip") == "dst_ip")
    assert(Columns.entityColumn(IpKind, "obj", "srcip") == "src_ip")
    assert(Columns.entityColumn(IpKind, "obj", "dstport") == "dst_port")
  }

  test("unknown attribute raises") {
    intercept[IllegalArgumentException](Columns.entityColumn(FileKind, "obj", "dstip"))
  }

  test("identity attributes per kind") {
    assert(Columns.identityAttrs(ProcKind) == Seq("exe_name", "pid"))
    assert(Columns.identityAttrs(FileKind) == Seq("name"))
    assert(Columns.identityAttrs(IpKind) == Seq("dstip"))
  }

  test("event type follows the object kind") {
    assert(Columns.eventTypeOf(ProcKind) == "process")
    assert(Columns.eventTypeOf(FileKind) == "file")
    assert(Columns.eventTypeOf(IpKind) == "network")
  }

  test("resolve: alias attribute and entity defaults") {
    val q = Parser.parse("proc p write ip i as evt #time(1 min)\n" +
      "state ss { a := avg(evt.amount) } group by p\nreturn p")
    assert(Columns.resolve(q, FieldRef("evt", Some("amount"))) == "amount")
    assert(Columns.resolve(q, FieldRef("p", None)) == "subj_exe")
    assert(Columns.resolve(q, FieldRef("i", Some("dstip"))) == "dst_ip")
    assert(Columns.resolve(q, FieldRef("i", None)) == "dst_ip") // ip default
  }

  test("resolve: object process attribute") {
    val q = Parser.parse("proc p start proc c as evt #time(1 min)\n" +
      "state ss { s := set(c.exe_name) } group by p\nreturn p")
    assert(Columns.resolve(q, FieldRef("c", Some("exe_name"))) == "obj_exe")
    assert(Columns.resolve(q, FieldRef("c", None)) == "obj_exe")
  }

  test("compare: LIKE for % patterns, equality otherwise") {
    val like = df.filter(Columns.compare(col("subj_exe"), "=", "%sql%"))
    assert(like.count() > 0)
    assert(like.filter(!col("subj_exe").contains("sql")).count() == 0)
    val eq = df.filter(Columns.compare(col("subj_exe"), "=", "chrome.exe"))
    assert(eq.select("subj_exe").distinct().count() == 1)
  }

  test("compare: numeric comparisons cast the column") {
    val hi = df.filter(Columns.compare(col("amount"), ">", "50000"))
    assert(hi.filter(col("amount") <= 50000).count() == 0)
    val eq = df.filter(Columns.compare(col("agentid"), "=", "1"))
    assert(eq.select("agentid").distinct().count() == 1)
  }

  test("compare: negated LIKE") {
    val notLike = df.filter(Columns.compare(col("subj_exe"), "!=", "%chrome%"))
    assert(notLike.filter(col("subj_exe").contains("chrome")).count() == 0)
  }

  test("pattern predicate selects only matching events") {
    val q = Parser.parse(
      """agentid = 0
        |proc p1["%apache.exe"] start proc p2 as evt1
        |return p1, p2""".stripMargin)
    val m = df.filter(Columns.patternPredicate(q, q.patterns.head))
    assert(m.count() > 0)
    assert(m.filter(col("event_type") =!= "process").count() == 0)
    assert(m.filter(col("subj_exe") =!= "apache.exe").count() == 0)
    assert(m.filter(col("agentid") =!= 0).count() == 0)
  }

  test("pattern predicate honours op disjunction") {
    val q = Parser.parse("proc p read || write ip i as evt\nreturn p")
    val m = df.filter(Columns.patternPredicate(q, q.patterns.head))
    assert(m.filter(!col("op").isin("read", "write")).count() == 0)
    assert(m.select("op").distinct().count() == 2)
  }

  test("shared-variable constraints merge across occurrences") {
    val q = Parser.parse(
      """proc p1["%sqlservr.exe"] write file f1["%backup1.dmp"] as evt1
        |proc p2["%sbblv.exe"] read file f1 as evt2
        |return p1""".stripMargin)
    // evt2's f1 occurrence has no local preds, but inherits the LIKE
    // constraint from evt1's declaration of f1.
    val m = df.filter(Columns.patternPredicate(q, q.patterns(1)))
    assert(m.filter(!col("file_name").like("%backup1.dmp")).count() == 0)
  }
}
