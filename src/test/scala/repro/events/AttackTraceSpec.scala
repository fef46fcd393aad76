package repro.events

import org.apache.spark.sql.functions._
import repro.SparkSpec

class AttackTraceSpec extends SparkSpec {

  private val start = 1_800_000L
  private lazy val atk = AttackTrace.events(spark, start).cache()

  test("schema matches SystemEvent columns") {
    assert(atk.columns.toSeq == SystemEvent.columns)
  }

  test("attack ids are disjoint from benign generator ids") {
    assert(atk.agg(min("event_id")).head.getLong(0) >= 1_000_000_000L)
  }

  test("c1: outlook writes the macro-bearing attachment on the victim") {
    val c1 = atk.filter(col("subj_exe") === "outlook.exe" &&
      col("op") === "write" && col("file_name").endsWith(".xlsm"))
    assert(c1.count() == 1)
    assert(c1.head.getAs[Long]("agentid") == 0L)
  }

  test("c2: excel starts wscript which drops the vbs and spawns the backdoor") {
    assert(atk.filter(col("subj_exe") === "excel.exe" &&
      col("obj_exe") === "wscript.exe").count() == 1)
    assert(atk.filter(col("subj_exe") === "wscript.exe" &&
      col("file_name").endsWith(".vbs")).count() == 1)
    assert(atk.filter(col("subj_exe") === "wscript.exe" &&
      col("obj_exe") === "backdoor.exe").count() == 1)
  }

  test("c3: gsecdump reads the SAM and exfiltrates credentials") {
    assert(atk.filter(col("subj_exe") === "gsecdump.exe" &&
      col("file_name").endsWith("sam")).count() == 1)
    assert(atk.filter(col("subj_exe") === "gsecdump.exe" &&
      col("dst_ip") === AttackTrace.AttackerIp).count() == 1)
  }

  test("c4: cscript drops and starts sbblv on the database server") {
    val drop = atk.filter(col("subj_exe") === "cscript.exe" &&
      col("file_name").endsWith("sbblv.exe"))
    assert(drop.count() == 1)
    assert(drop.head.getAs[Long]("agentid") == 1L)
    assert(atk.filter(col("subj_exe") === "cscript.exe" &&
      col("obj_exe") === "sbblv.exe").count() == 1)
  }

  test("c5: the Query-1 sequence exists in order") {
    def ts(cond: org.apache.spark.sql.Column): Long =
      atk.filter(cond).agg(min("ts")).head.getLong(0)
    val t1 = ts(col("subj_exe") === "cmd.exe" && col("obj_exe") === "osql.exe")
    val t2 = ts(col("subj_exe") === "sqlservr.exe" && col("op") === "write" &&
      col("file_name").endsWith("backup1.dmp"))
    val t3 = ts(col("subj_exe") === "sbblv.exe" && col("op") === "read" &&
      col("file_name").endsWith("backup1.dmp"))
    val t4 = ts(col("subj_exe") === "sbblv.exe" && col("op") === "write" &&
      col("dst_ip") === AttackTrace.AttackerIp && col("ts") > t3)
    assert(t1 < t2 && t2 < t3 && t3 < t4)
  }

  test("c5 exfiltration volume crosses the 1MB outlier threshold") {
    val vol = atk.filter(col("subj_exe") === "sqlservr.exe" &&
        col("dst_ip") === AttackTrace.AttackerIp)
      .agg(sum("amount")).head.getLong(0)
    assert(vol > 1_000_000L)
  }

  test("step offsets place every event inside its step") {
    for ((step, off) <- AttackTrace.stepStartMs) {
      val next = AttackTrace.stepStartMs.values.filter(_ > off)
        .minOption.getOrElse(Long.MaxValue - start)
      val n = atk.filter(col("ts") >= start + off && col("ts") < start + next).count()
      assert(n > 0, s"step $step has no events")
    }
  }

  test("attack timestamps shift with attackStartMs") {
    val shifted = AttackTrace.events(spark, 0L)
    val d = atk.agg(min("ts")).head.getLong(0) - shifted.agg(min("ts")).head.getLong(0)
    assert(d == start)
  }

  test("withBackground unions benign and attack events") {
    val all = AttackTrace.withBackground(spark, sf = 0.002, attackStartMs = start)
    val benign = MonitoringData.events(spark, sf = 0.002).count()
    assert(all.count() == benign + atk.count())
  }

  test("pids are consistent within an attack process chain") {
    val wscriptStartPid = atk.filter(col("obj_exe") === "wscript.exe")
      .head.getAs[Long]("obj_pid")
    val wscriptActPids = atk.filter(col("subj_exe") === "wscript.exe")
      .select("subj_pid").distinct().collect().map(_.getLong(0)).toSet
    assert(wscriptActPids == Set(wscriptStartPid))
  }
}
