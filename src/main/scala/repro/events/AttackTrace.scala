package repro.events

import org.apache.spark.sql.{DataFrame, SparkSession}

/** The paper's five-step APT attack as a deterministic event sequence.
  *
  * Substitute for performing the live attack in a controlled testbed: the
  * same five steps (c1 initial compromise, c2 malware infection, c3
  * privilege escalation, c4 penetration into the database server, c5 data
  * exfiltration) with the same artifact names the paper's queries match
  * (cmd.exe, osql.exe, sqlservr.exe, backup1.dmp, sbblv.exe, gsecdump.exe,
  * the attacker IP *.129), injected at known offsets from `attackStartMs`
  * so detection latency is measurable.
  */
object AttackTrace {

  /** Attacker-controlled host, matching Query 1's `dstip = "xxx.129"`. */
  val AttackerIp = "203.0.113.129"

  /** Per-step start offsets (ms from attack start), for latency accounting. */
  val stepStartMs: Map[String, Long] = Map(
    "c1" -> 0L, "c2" -> 60_000L, "c3" -> 300_000L, "c4" -> 900_000L,
    "c5" -> 1_500_000L)

  private val AtkPid = 666L // marker pid family for attack processes

  /** Build the attack events. `victimAgent` is the compromised desktop,
    * `dbAgent` the database server. Timestamps are `attackStartMs` + step
    * offsets; every event carries `event_id` >= 10^9 to stay disjoint from
    * the benign generator's ids.
    */
  def events(spark: SparkSession, attackStartMs: Long, victimAgent: Long = 0L,
             dbAgent: Long = 1L): DataFrame = {
    import spark.implicits._

    var id = 1_000_000_000L
    def nextId(): Long = { id += 1; id }

    def proc(agent: Long, t: Long, subj: String, spid: Long, child: String,
             cpid: Long): SystemEvent =
      SystemEvent(nextId(), agent, attackStartMs + t, SystemEvent.ProcessEvent,
        subj, spid, "start", null, child, cpid, null, -1L, null, -1L, 0L)

    def file(agent: Long, t: Long, subj: String, spid: Long, op: String,
             name: String, amount: Long): SystemEvent =
      SystemEvent(nextId(), agent, attackStartMs + t, SystemEvent.FileEvent,
        subj, spid, op, name, null, -1L, null, -1L, null, -1L, amount)

    def net(agent: Long, t: Long, subj: String, spid: Long, op: String,
            dstIp: String, dstPort: Long, amount: Long): SystemEvent =
      SystemEvent(nextId(), agent, attackStartMs + t, SystemEvent.NetworkEvent,
        subj, spid, op, null, null, -1L,
        s"10.0.0.${50 + agent}", 45000L, dstIp, dstPort, amount)

    val v = victimAgent; val d = dbAgent
    val trace = Seq(
      // ---- c1: initial compromise — crafted email with malicious macro ----
      net(v, 1_000, "outlook.exe", AtkPid + 1, "read", "10.0.0.5", 993L, 52_000),
      file(v, 5_000, "outlook.exe", AtkPid + 1, "write",
           "/home/user/mail/invoice.xlsm", 52_000),
      // ---- c2: malware infection — macro drops and runs a script ---------
      file(v, 60_000, "excel.exe", AtkPid + 2, "read",
           "/home/user/mail/invoice.xlsm", 52_000),
      proc(v, 65_000, "excel.exe", AtkPid + 2, "wscript.exe", AtkPid + 3),
      file(v, 70_000, "wscript.exe", AtkPid + 3, "write", "/tmp/dropper.vbs", 4_000),
      proc(v, 75_000, "wscript.exe", AtkPid + 3, "backdoor.exe", AtkPid + 4),
      net(v, 80_000, "backdoor.exe", AtkPid + 4, "write", AttackerIp, 4444L, 1_200),
      // ---- c3: privilege escalation — port scan + credential theft -------
      proc(v, 300_000, "backdoor.exe", AtkPid + 4, "cmd.exe", AtkPid + 5),
      proc(v, 310_000, "cmd.exe", AtkPid + 5, "portscan.exe", AtkPid + 6),
      net(v, 320_000, "portscan.exe", AtkPid + 6, "write", "10.0.0.21", 1433L, 64),
      net(v, 321_000, "portscan.exe", AtkPid + 6, "write", "10.0.0.21", 3306L, 64),
      net(v, 322_000, "portscan.exe", AtkPid + 6, "write", "10.0.0.21", 5432L, 64),
      net(v, 323_000, "portscan.exe", AtkPid + 6, "write", "10.0.0.21", 22L, 64),
      proc(v, 340_000, "cmd.exe", AtkPid + 5, "gsecdump.exe", AtkPid + 7),
      file(v, 350_000, "gsecdump.exe", AtkPid + 7, "read",
           "/windows/system32/config/sam", 16_000),
      net(v, 360_000, "gsecdump.exe", AtkPid + 7, "write", AttackerIp, 4444L, 8_000),
      // ---- c4: penetration into DB server — drop script, new backdoor ----
      proc(d, 900_000, "cmd.exe", AtkPid + 8, "cscript.exe", AtkPid + 9),
      file(d, 910_000, "cscript.exe", AtkPid + 9, "write", "/tmp/sbblv.exe", 30_000),
      proc(d, 920_000, "cscript.exe", AtkPid + 9, "sbblv.exe", AtkPid + 10),
      net(d, 930_000, "sbblv.exe", AtkPid + 10, "write", AttackerIp, 4444L, 900),
      // ---- c5: data exfiltration — osql dump, malware ships it out -------
      proc(d, 1_500_000, "cmd.exe", AtkPid + 8, "osql.exe", AtkPid + 11),
      file(d, 1_520_000, "sqlservr.exe", AtkPid + 12, "write",
           "/data/backup1.dmp", 50_000_000),
      net(d, 1_530_000, "sqlservr.exe", AtkPid + 12, "write", AttackerIp, 1433L, 2_000_000),
      net(d, 1_535_000, "sqlservr.exe", AtkPid + 12, "write", AttackerIp, 1433L, 2_000_000),
      net(d, 1_540_000, "sqlservr.exe", AtkPid + 12, "write", AttackerIp, 1433L, 2_000_000),
      file(d, 1_550_000, "sbblv.exe", AtkPid + 10, "read", "/data/backup1.dmp",
           50_000_000),
      net(d, 1_560_000, "sbblv.exe", AtkPid + 10, "write", AttackerIp, 4444L, 2_500_000),
      net(d, 1_565_000, "sbblv.exe", AtkPid + 10, "write", AttackerIp, 4444L, 2_500_000),
      net(d, 1_570_000, "sbblv.exe", AtkPid + 10, "write", AttackerIp, 4444L, 2_500_000),
      net(d, 1_575_000, "sbblv.exe", AtkPid + 10, "write", AttackerIp, 4444L, 2_500_000),
    )
    trace.toDF()
  }

  /** Benign background + injected attack, ready for replay. */
  def withBackground(spark: SparkSession, sf: Double = 0.01, seed: Long = 0,
                     durationMs: Long = MonitoringData.DefaultDurationMs,
                     attackStartMs: Long = 1_800_000L): DataFrame =
    MonitoringData.events(spark, sf, seed, durationMs)
      .unionByName(events(spark, attackStartMs))
}
