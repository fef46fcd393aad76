package repro.bench

import repro.SparkSpec
import repro.report.Tables

/** T4 — precision/recall of the three advanced anomaly models against
  * injected ground truth. Paper shape: the advanced queries detect the
  * attack behaviours with no attack-specific knowledge (P = R = 1 at
  * attack-scale anomalies), degrading gracefully as the anomaly magnitude
  * sinks toward benign noise / below the alert thresholds.
  */
class T4AccuracyBench extends SparkSpec {

  private lazy val result = Tables.t4(spark)

  test("T4: accuracy table") {
    val (table, rows) = result
    info("\n" + table)
    println(s"\n== T4: anomaly-model accuracy vs injected ground truth ==\n$table")
    assert(rows.nonEmpty)
    assert(rows.map(_.model).toSet ==
      Set("timeseries-sma", "invariant", "outlier-dbscan"))
  }

  test("T4: no model raises false positives on benign traffic") {
    result._2.foreach(r => assert(r.fp == 0, s"$r"))
  }

  test("T4: attack-scale anomalies are fully recalled") {
    // Everything at or above the paper's own thresholds (10k avg / 1MB sum
    // / any unseen child) must be caught.
    val strong = result._2.filter(r =>
      r.model == "invariant" && r.injected > 0 ||
      r.model == "timeseries-sma" && !r.magnitude.startsWith("8000") ||
      r.model == "outlier-dbscan" && !r.magnitude.startsWith("500000"))
    strong.foreach(r => assert(r.recall == 1.0, s"$r"))
  }

  test("T4: sub-threshold anomalies are (correctly) below the alert gates") {
    val weak = result._2.filter(r =>
      r.magnitude.startsWith("8000") || r.magnitude.startsWith("500000"))
    assert(weak.size == 2)
    weak.foreach(r => assert(r.recall == 0.0, s"$r"))
  }

  test("T4: the invariant control arm (seen children) stays silent") {
    val control = result._2.find(_.magnitude.contains("control")).get
    assert(control.tp == 0 && control.fp == 0 && control.fn == 0)
  }
}
