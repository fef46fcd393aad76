package repro.events

import org.apache.spark.sql.functions._
import repro.SparkSpec

class StreamReplayerSpec extends SparkSpec {

  private lazy val df = MonitoringData.events(spark, sf = 0.002, seed = 3).cache()

  test("select with no filters returns everything") {
    assert(StreamReplayer.select(df).count() == df.count())
  }

  test("select restricts hosts") {
    val one = StreamReplayer.select(df, agents = Seq(0L))
    assert(one.filter(col("agentid") =!= 0).count() == 0)
    assert(one.count() > 0)
  }

  test("select restricts the time range half-open") {
    val r = StreamReplayer.select(df, startMs = 1000, endMs = 2000)
    assert(r.filter(col("ts") < 1000 || col("ts") >= 2000).count() == 0)
  }

  test("ordered sorts by ts then event_id") {
    val rows = StreamReplayer.ordered(df.limit(500)).collect()
    val keys = rows.map(r => (r.getAs[Long]("ts"), r.getAs[Long]("event_id"))).toSeq
    assert(keys == keys.sorted)
  }

  test("micro-batches tile the interval without loss or overlap") {
    val total = df.filter(col("ts") < 600000).count()
    val batches = StreamReplayer.microBatches(df, batchMs = 100000, 0, 600000).toSeq
    assert(batches.size == 6)
    assert(batches.map(_._2.count()).sum == total)
  }

  test("micro-batches include empty ticks") {
    val empty = df.filter(col("ts") < 0) // no rows
    val batches = StreamReplayer.microBatches(empty, 1000, 0, 5000).toSeq
    assert(batches.size == 5)
    assert(batches.forall(_._2.count() == 0))
  }

  test("batch indexes are consecutive from zero") {
    val idx = StreamReplayer.microBatches(df, 50000, 0, 250000).map(_._1).toSeq
    assert(idx == Seq(0L, 1L, 2L, 3L, 4L))
  }

  test("writeFeed produces a directory a batch reader round-trips") {
    val dir = java.nio.file.Files.createTempDirectory("feed").toString + "/out"
    StreamReplayer.writeFeed(df.limit(200), dir)
    val back = spark.read.schema(SystemEvent.schema).json(dir)
    assert(back.count() == 200)
  }
}
