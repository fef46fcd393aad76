package repro.events

import org.apache.spark.sql.functions._
import repro.SparkSpec

class MonitoringDataSpec extends SparkSpec {

  private lazy val df = MonitoringData.events(spark, sf = 0.01, seed = 0).cache()

  test("schema matches SystemEvent column set") {
    assert(df.columns.toSeq == SystemEvent.columns)
  }

  test("row count scales with sf") {
    assert(df.count() == 20000)
    assert(MonitoringData.events(spark, sf = 0.002).count() == 4000)
  }

  test("deterministic in (sf, seed)") {
    val a = MonitoringData.events(spark, 0.005, seed = 7).orderBy("event_id")
      .collect().map(_.toString).toSeq
    val b = MonitoringData.events(spark, 0.005, seed = 7).orderBy("event_id")
      .collect().map(_.toString).toSeq
    assert(a == b)
  }

  test("different seeds differ") {
    val a = MonitoringData.events(spark, 0.002, seed = 1).agg(sum("ts")).head.getLong(0)
    val b = MonitoringData.events(spark, 0.002, seed = 2).agg(sum("ts")).head.getLong(0)
    assert(a != b)
  }

  test("event types partition into process/file/network with expected mix") {
    val counts = df.groupBy("event_type").count().collect()
      .map(r => r.getString(0) -> r.getLong(1)).toMap
    assert(counts.keySet == Set("process", "file", "network"))
    val n = df.count().toDouble
    assert(math.abs(counts("process") / n - 0.15) < 0.02)
    assert(math.abs(counts("file") / n - 0.45) < 0.02)
    assert(math.abs(counts("network") / n - 0.40) < 0.02)
  }

  test("process events carry obj_exe and op=start, no file/ip attrs") {
    val p = df.filter(col("event_type") === "process")
    assert(p.filter(col("op") =!= "start").count() == 0)
    assert(p.filter(col("obj_exe").isNull).count() == 0)
    assert(p.filter(col("file_name").isNotNull || col("dst_ip").isNotNull).count() == 0)
  }

  test("file events carry file_name and read/write ops") {
    val f = df.filter(col("event_type") === "file")
    assert(f.filter(col("file_name").isNull).count() == 0)
    assert(f.filter(!col("op").isin("read", "write")).count() == 0)
  }

  test("network events carry endpoints and positive amounts") {
    val nw = df.filter(col("event_type") === "network")
    assert(nw.filter(col("dst_ip").isNull || col("src_ip").isNull).count() == 0)
    assert(nw.filter(col("amount") <= 0).count() == 0)
  }

  test("timestamps stay within the configured duration") {
    val mm = df.agg(min("ts"), max("ts")).head
    assert(mm.getLong(0) >= 0)
    assert(mm.getLong(1) < MonitoringData.DefaultDurationMs)
  }

  test("hosts span max(2, 100*sf) agents") {
    val agents = df.select("agentid").distinct().count()
    assert(agents == 2) // sf = 0.01
    val agents10 = MonitoringData.events(spark, 0.1, seed = 0)
      .select("agentid").distinct().count()
    assert(agents10 == 10)
  }

  test("apache spawns only its fixed benign child set (invariant fodder)") {
    val children = df
      .filter(col("event_type") === "process" && col("subj_exe") === "apache.exe")
      .select("obj_exe").distinct().collect().map(_.getString(0)).toSet
    assert(children.subsetOf(Set("httpd-worker.exe", "php-cgi.exe", "rotatelogs.exe")))
    assert(children.nonEmpty)
  }

  test("excel spawns only splwow64.exe when benign") {
    val children = df
      .filter(col("event_type") === "process" && col("subj_exe") === "excel.exe")
      .select("obj_exe").distinct().collect().map(_.getString(0)).toSet
    assert(children == Set("splwow64.exe"))
  }

  test("benign per-process network-write averages stay below the SMA threshold") {
    val avgs = df
      .filter(col("event_type") === "network" && col("op") === "write")
      .groupBy("subj_exe").agg(avg("amount").as("a"))
      .collect().map(r => r.getString(0) -> r.getDouble(1))
    assert(avgs.nonEmpty)
    avgs.foreach { case (exe, a) => assert(a < 10000, s"$exe benign avg $a") }
  }

  test("benign sqlservr per-ip window sums stay below the outlier threshold") {
    val sums = df
      .filter(col("subj_exe") === "sqlservr.exe" && col("event_type") === "network")
      .withColumn("win", floor(col("ts") / 600000))
      .groupBy("agentid", "win", "dst_ip").agg(sum("amount").as("s"))
      .agg(max("s")).head.getLong(0)
    assert(sums < 1000000, s"max benign sqlservr per-ip window sum $sums")
  }

  test("sqlservr fans out to ten client IPs") {
    val ips = df.filter(col("subj_exe") === "sqlservr.exe" &&
        col("event_type") === "network")
      .select("dst_ip").distinct().collect().map(_.getString(0)).toSet
    assert(ips.size == 10)
    assert(ips.forall(_.startsWith("10.0.1.2")))
  }
}
