package repro.events

import org.apache.spark.sql.types._

/** The SVO (subject, operation, object) system-event data model of the paper.
  *
  * System monitoring observes kernel-level interactions among system entities
  * (processes, files, network connections). Every event happens on one host
  * (`agentid`) at one time (`ts`) and is one of three types according to its
  * object: file event, process event, network event. The flat schema below
  * carries the security-related attributes SAQL queries can reference.
  */
final case class SystemEvent(
    event_id: Long,
    agentid: Long,
    /** Event time in milliseconds since the stream epoch. */
    ts: Long,
    /** "process" | "file" | "network" — determined by the object entity. */
    event_type: String,
    /** Subject process executable name (e.g. "sqlservr.exe"). */
    subj_exe: String,
    subj_pid: Long,
    /** Operation: "start" (process), "read" / "write" (file, network). */
    op: String,
    /** Object file path; null for non-file events. */
    file_name: String,
    /** Object process executable name; null for non-process events. */
    obj_exe: String,
    obj_pid: Long,
    /** Connection endpoints; null / -1 for non-network events. */
    src_ip: String,
    src_port: Long,
    dst_ip: String,
    dst_port: Long,
    /** Bytes transferred by the operation (file / network I/O), else 0. */
    amount: Long,
)

object SystemEvent {

  /** Column names, in schema order — the engine selects by these names. */
  val columns: Seq[String] = Seq(
    "event_id", "agentid", "ts", "event_type", "subj_exe", "subj_pid", "op",
    "file_name", "obj_exe", "obj_pid", "src_ip", "src_port", "dst_ip",
    "dst_port", "amount")

  /** Spark schema matching [[SystemEvent]]. */
  val schema: StructType = StructType(Seq(
    StructField("event_id", LongType, nullable = false),
    StructField("agentid", LongType, nullable = false),
    StructField("ts", LongType, nullable = false),
    StructField("event_type", StringType, nullable = false),
    StructField("subj_exe", StringType, nullable = false),
    StructField("subj_pid", LongType, nullable = false),
    StructField("op", StringType, nullable = false),
    StructField("file_name", StringType, nullable = true),
    StructField("obj_exe", StringType, nullable = true),
    StructField("obj_pid", LongType, nullable = true),
    StructField("src_ip", StringType, nullable = true),
    StructField("src_port", LongType, nullable = true),
    StructField("dst_ip", StringType, nullable = true),
    StructField("dst_port", LongType, nullable = true),
    StructField("amount", LongType, nullable = false),
  ))

  /** Event types, keyed by the SAQL object entity kind. */
  val ProcessEvent = "process"
  val FileEvent    = "file"
  val NetworkEvent = "network"
}
