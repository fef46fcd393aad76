package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.report.Tables

/** spark-submit entrypoints, one per evaluation table (DESIGN.md §2). */
private object TableJob {
  def run(name: String)(body: SparkSession => String): Unit = {
    val spark = SparkSession.builder().appName(name)
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]")).getOrCreate()
    try println(s"== $name ==\n" + body(spark)) finally spark.stop()
  }
}

/** T1 — APT attack detection by the 8 demo queries. */
object T1AttackDetection {
  def main(args: Array[String]): Unit = TableJob.run("T1-attack-detection") { s =>
    val sf = args.headOption.map(_.toDouble).getOrElse(0.1)
    Tables.t1(s, sf = sf)._1
  }
}

/** T2 — per-model engine throughput over growing streams. */
object T2Throughput {
  def main(args: Array[String]): Unit = TableJob.run("T2-throughput") { s =>
    Tables.t2(s)._1
  }
}

/** T3 — master-dependent-query scheme vs independent execution. */
object T3Scheduler {
  def main(args: Array[String]): Unit = TableJob.run("T3-scheduler") { s =>
    Tables.t3(s)._1
  }
}

/** T4 — advanced anomaly-model accuracy under injected anomalies. */
object T4Accuracy {
  def main(args: Array[String]): Unit = TableJob.run("T4-accuracy") { s =>
    Tables.t4(s)._1
  }
}
