package repro.bench

import repro.SparkSpec
import repro.report.Tables

/** T1 — the paper's demonstration outcome: all 8 SAQL queries detect their
  * attack steps in real time over the replayed stream (SF=0.1, ~200k
  * events, 10 hosts, attack at t+60min).
  */
class T1AttackDetectionBench extends SparkSpec {

  private lazy val result = Tables.t1(spark, sf = 0.1, attackStartMs = 3_600_000L)

  test("T1: every attack step is detected by every responsible query") {
    val (table, rows) = result
    info("\n" + table)
    println(s"\n== T1: APT attack detection (sf=0.1) ==\n$table")
    assert(rows.size == 8)
    rows.foreach(r => assert(r.detected, s"${r.query} missed step ${r.step}"))
    assert(rows.map(_.step).toSet == Set("c1", "c2", "c3", "c4", "c5"))
  }

  test("T1: rule-based detection latency is bounded by the step duration") {
    val rows = result._2.filter(_.model == "rule")
    // Each rule alert fires at its final matched event, well inside the
    // 5-minute step windows the attack script uses.
    rows.foreach(r => assert(r.latencyMs >= 0 && r.latencyMs <= 120_000L,
      s"${r.query} latency ${r.latencyMs}"))
  }

  test("T1: advanced models detect with no attack-specific knowledge") {
    val advanced = result._2.filter(r => r.model != "rule")
    assert(advanced.size == 3)
    advanced.foreach(r => assert(r.detected && r.alerts > 0))
  }

  test("T1: advanced-model alerts implicate only attack actors") {
    // Alerts beyond the evidence-matching ones would be false positives on
    // benign background; the engine reports none for a1/a3 and only attack
    // processes for a2 (checked in DemoQueriesSpec at SF=0.01; here the
    // count stays small at SF=0.1).
    val advanced = result._2.filter(_.model != "rule")
    advanced.foreach(r => assert(r.alerts <= 6, s"${r.query}: ${r.alerts} alerts"))
  }
}
