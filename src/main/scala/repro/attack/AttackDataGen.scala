package repro.attack

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

import repro.core.Times
import repro.events.EventSchema

/** Synthetic enterprise monitoring trace with an embedded APT.
  *
  * The paper's evaluation data (85 GB / 257M events from a 150-host NEC
  * deployment, with a white-hat APT) is proprietary; this generator is the
  * substitution documented in DESIGN.md. It produces:
  *
  *  - **background noise**: zipf-skewed process activity (file reads/writes,
  *    process starts, network traffic) across `hosts(sf)` agents over three
  *    days — deterministic in (sf, seed);
  *  - **the attack trace**: the exact 5-step APT of Section 3 (a1 UnrealIRCd
  *    exploit → a2 malware infection via Apache → a3 Mimikatz/Kiwi privilege
  *    escalation → a4 PwDump7/WCE credential dump on the DC → a5 OSQL +
  *    sbblv/powershell exfiltration from the DB server), on day 1.
  *
  * Ground-truth constants live in [[AttackFacts]] so tests and benches can
  * assert that investigation queries recover the attack.
  */
object AttackDataGen {

  /** Day 1 (attack day), 00:00 UTC. Globals use `(at "08/01/2023")`. */
  val Day1: String = "08/01/2023"
  val T0: Long = Times.parseMs(Day1)

  /** Background events per unit scale factor (3 days worth). */
  val EventsPerSf: Long = 5_000_000L

  def hosts(sf: Double): Int = math.min(150, math.max(4, math.round(150 * sf).toInt))

  def backgroundRows(sf: Double): Long = math.max(2000L, (EventsPerSf * sf).toLong)

  private val procPool = Seq(
    "chrome.exe", "firefox.exe", "svchost.exe", "explorer.exe", "services.exe",
    "winlogon.exe", "cmd.exe", "powershell.exe", "bash", "sshd", "systemd",
    "cron", "apache2", "nginx", "java", "python", "node", "mysqld",
    "sqlservr.exe", "outlook.exe", "excel.exe", "winword.exe", "teams.exe",
    "wget", "curl")

  private val sysFiles = Seq(
    "/etc/passwd", "/var/log/syslog", "C:/Windows/System32/kernel32.dll",
    "C:/Windows/System32/ntdll.dll", "/usr/lib/libc.so", "/etc/hosts")

  private def pick(pool: Seq[String], idx: Column): Column =
    element_at(array(pool.map(lit): _*), idx)

  /** Benign enterprise activity: deterministic in (sf, seed).
    *
    * Per-row randomness is *hash-derived from the row id*, not `rand()`:
    * a `rand` expression tree copied into several derived columns (or into
    * the branches of a `when` chain) advances each copy's RNG stream
    * independently under short-circuit evaluation, desynchronizing columns
    * that must agree (e.g. `op` vs `obj_type`). Hashing is a pure function
    * of (id, seed), so every copy agrees and the data is reproducible.
    */
  def background(spark: SparkSession, sf: Double, seed: Long = 7): DataFrame = {
    val h = hosts(sf)
    /** uniform [0,1) as a pure function of the row id and stream k */
    def u(k: Int): Column =
      (pmod(xxhash64(col("id"), lit(seed), lit(k)), lit(1000003L)).cast(DoubleType)) / 1000003.0
    /** zipf-ish 1-based index into a pool of size n (low indices common) */
    def skewIdx(n: Int, k: Int): Column = (pow(u(k), 2.5) * n).cast(IntegerType) + 1

    val b = floor(u(0) * 100) // operation-mix bucket
    val objType =
      when(b < 50, EventSchema.Kind.File)
        .when(b < 60, EventSchema.Kind.Proc)
        .when(b < 70, EventSchema.Kind.File)
        .otherwise(EventSchema.Kind.Ip)
    val op =
      when(b < 30, "read").when(b < 50, "write")
        .when(b < 60, "start").when(b < 65, "execute").when(b < 70, "delete")
        .when(b < 80, "connect").when(b < 90, "write").otherwise("read")
    val isFile = objType === EventSchema.Kind.File
    val isProc = objType === EventSchema.Kind.Proc
    val isIp   = objType === EventSchema.Kind.Ip

    val filePath =
      when(u(10) < 0.15, pick(sysFiles, skewIdx(sysFiles.size, 11)))
        .otherwise(concat(
          lit("/home/user"), (u(12) * 50).cast(IntegerType),
          lit("/file_"), (u(13) * 2000).cast(IntegerType), lit(".dat")))
    val internalIp = concat(
      lit("10.0."), (u(20) * 8).cast(IntegerType),
      lit("."), (u(21) * 250).cast(IntegerType))
    val dstIp =
      when(u(22) < 0.02,
           concat(lit("203.0.113."), (u(23) * 250).cast(IntegerType)))
        .otherwise(internalIp)

    val ts = (lit(T0) + (u(1) * (3 * EventSchema.DayMillis)).cast(LongType)).as("ts")

    spark.range(backgroundRows(sf)).select(
      col("id").as("event_id"),
      ((u(2) * h).cast(IntegerType) + 1).as("agent_id"),
      ts,
      op.as("op"),
      ((u(3) * 400).cast(LongType) + 1).as("subj_pid"),
      pick(procPool, skewIdx(procPool.size, 4)).as("subj_exe"),
      objType.as("obj_type"),
      when(isProc, (u(5) * 400).cast(LongType) + 300).as("obj_pid"),
      when(isProc, pick(procPool, skewIdx(procPool.size, 6))).as("obj_exe"),
      when(isFile, filePath).as("obj_path"),
      when(isIp, internalIp).as("src_ip"),
      when(isIp, dstIp).as("dst_ip"),
      when(isIp, (u(24) * 60000).cast(IntegerType) + 1024).as("src_port"),
      when(isIp, element_at(
        array(Seq(80, 443, 22, 445, 3306, 8080, 53, 25).map(lit): _*),
        (u(25) * 8).cast(IntegerType) + 1)).as("dst_port"),
      when(op.isin("read", "write") && !isProc,
           (pow(u(26), 6) * 2e6).cast(LongType)).as("amount"),
    ).withColumn("day", dayOf(col("ts")))
  }

  /** Timezone-independent day string from epoch millis. */
  def dayOf(ts: Column): Column =
    date_add(lit("1970-01-01").cast(DateType),
             floor(ts / EventSchema.DayMillis).cast(IntegerType)).cast(StringType)

  // ------------------------------------------------------------ the attack

  /** One raw event row (schema order); None → NULL. */
  final case class RawEv(
      event_id: Long, agent_id: Int, ts: Long, op: String,
      subj_pid: Long, subj_exe: String, obj_type: String,
      obj_pid: Option[Long], obj_exe: Option[String], obj_path: Option[String],
      src_ip: Option[String], dst_ip: Option[String],
      src_port: Option[Int], dst_port: Option[Int], amount: Option[Long],
      day: String)

  /** The handcrafted APT trace (day 1). See [[AttackFacts]] for the cast. */
  def attackTrace(spark: SparkSession): DataFrame = {
    import spark.implicits._
    AttackFacts.trace.toDS().toDF(EventSchema.columns: _*)
  }

  /** Full dataset: background noise + attack trace. */
  def events(spark: SparkSession, sf: Double, seed: Long = 7): DataFrame =
    background(spark, sf, seed).unionByName(attackTrace(spark))
}

/** Ground truth of the synthetic APT — hosts, processes, files, times.
  * Times are minutes on day 1; every step matches the demo's Section 3.
  */
object AttackFacts {
  import AttackDataGen.{RawEv, T0, dayOf => _}

  // spatial layout
  val IrcServer = 1        // a1: initial compromise
  val IntranetHost = 2     // a2/a3: infection + privilege escalation
  val DomainController = 3 // a4: credential dump
  val DbServer = 4         // a5: data exfiltration
  val AttackerIp = "10.99.99.129"
  /** Apache server's address on the intranet (the a2 infection channel). */
  val ApacheIp = "10.0.1.1"

  val InfoStealerSrv = "/srv/www/htdocs/info_stealer.sh"
  val InfoStealerTmp = "/tmp/info_stealer.sh"
  val LsassPath = "C:/Windows/System32/lsass.exe"
  val SamPath = "C:/Windows/System32/config/SAM"
  val PwDumpOut = "C:/Users/admin/pwdump_out.txt"
  val WceOut = "C:/Users/admin/wce_out.txt"
  val CredsTxt = "/tmp/creds.txt"
  val DbBak = "/data/db.bak"
  val BackupDmp = "/data/backup1.dmp"

  // process ids (outside the background pid ranges would hide join noise;
  // these deliberately sit in a distinct 4xxx/5xxx band)
  val UnrealPid = 4001L; val ShPid = 4002L
  val ApachePid = 4100L
  val WgetPid = 4500L; val BashPid = 4501L; val StealerPid = 4502L
  val ExploitPid = 4600L; val MimikatzPid = 4601L; val KiwiPid = 4602L
  val DcCmdPid = 4699L; val PwDumpPid = 4700L; val WcePid = 4701L
  val ExplorerPid = 5000L; val CmdPid = 5001L; val OsqlPid = 5002L
  val SbblvPid = 5003L; val PowershellPid = 5004L; val SqlServrPid = 5005L

  /** Epoch millis at hh:mm:ss on day 1. */
  def t(h: Int, m: Int, s: Int = 0): Long = T0 + ((h * 60 + m) * 60L + s) * 1000

  private val day1 = "2023-08-01"
  private var nextId = 10_000_000_000L
  private def id(): Long = { nextId += 1; nextId }

  private def ev(agent: Int, ts: Long, op: String, pid: Long, exe: String)(
      objType: String,
      objPid: Option[Long] = None, objExe: Option[String] = None,
      objPath: Option[String] = None, dstIp: Option[String] = None,
      dstPort: Option[Int] = None, amount: Option[Long] = None): RawEv =
    RawEv(id(), agent, ts, op, pid, exe, objType, objPid, objExe, objPath,
          if (objType == "ip") Some(s"10.0.$agent.10") else None,
          dstIp, if (objType == "ip") Some(40000 + agent) else None,
          dstPort, amount, day1)

  private def procStart(agent: Int, ts: Long, pid: Long, exe: String,
                        cPid: Long, cExe: String): RawEv =
    ev(agent, ts, "start", pid, exe)("proc", objPid = Some(cPid), objExe = Some(cExe))
  private def fileOp(op: String)(agent: Int, ts: Long, pid: Long, exe: String,
                                 path: String, amount: Long = 4096): RawEv =
    ev(agent, ts, op, pid, exe)("file", objPath = Some(path), amount = Some(amount))
  private def ipOp(op: String)(agent: Int, ts: Long, pid: Long, exe: String,
                               dst: String, port: Int, amount: Option[Long]): RawEv =
    ev(agent, ts, op, pid, exe)("ip", dstIp = Some(dst), dstPort = Some(port), amount = amount)

  /** The exfiltration beacon+burst (a5): small beacons then a huge burst, so
    * the anomaly query's moving-average `having` fires (the burst window's
    * average exceeds twice the sum of the two previous windows').
    */
  val beaconTimes: Seq[Long] = (0 until 12).map(k => t(12, 15, 10 * k))
  val beaconAmount = 10_000L
  val burstTimes: Seq[Long] = Seq(t(12, 17, 2), t(12, 17, 4), t(12, 17, 6))
  val burstAmount = 50_000_000L

  lazy val trace: Seq[RawEv] = {
    val a1 = Seq(
      ipOp("read")(IrcServer, t(9, 0), UnrealPid, "unrealircd", AttackerIp, 6667, Some(2048L)),
      procStart(IrcServer, t(9, 1), UnrealPid, "unrealircd", ShPid, "sh"),
      ipOp("connect")(IrcServer, t(9, 5), ShPid, "sh", AttackerIp, 31337, None),
      ipOp("write")(IrcServer, t(9, 6), ShPid, "sh", AttackerIp, 31337, Some(8192L)),
    )
    val a2 = Seq(
      fileOp("write")(IrcServer, t(9, 20), ShPid, "sh", InfoStealerSrv, 24576),
      fileOp("read")(IrcServer, t(9, 25), ApachePid, "apache2", InfoStealerSrv, 24576),
      ipOp("connect")(IrcServer, t(9, 26), ApachePid, "apache2", ApacheIp, 80, None),
      ipOp("connect")(IntranetHost, t(9, 26, 30), WgetPid, "wget", ApacheIp, 80, None),
      fileOp("write")(IntranetHost, t(9, 27), WgetPid, "wget", InfoStealerTmp, 24576),
      fileOp("execute")(IntranetHost, t(9, 28), BashPid, "bash", InfoStealerTmp),
      procStart(IntranetHost, t(9, 28, 30), BashPid, "bash", StealerPid, InfoStealerTmp),
    )
    val a3 = Seq(
      procStart(IntranetHost, t(10, 0), StealerPid, InfoStealerTmp, ExploitPid, "exploit.exe"),
      procStart(IntranetHost, t(10, 5), ExploitPid, "exploit.exe", MimikatzPid, "mimikatz.exe"),
      fileOp("read")(IntranetHost, t(10, 6), MimikatzPid, "mimikatz.exe", LsassPath, 1 << 20),
      fileOp("write")(IntranetHost, t(10, 7), MimikatzPid, "mimikatz.exe", CredsTxt, 2048),
      procStart(IntranetHost, t(10, 8), ExploitPid, "exploit.exe", KiwiPid, "kiwi.exe"),
      fileOp("read")(IntranetHost, t(10, 9), KiwiPid, "kiwi.exe", LsassPath, 1 << 20),
    )
    val a4 = Seq(
      procStart(DomainController, t(11, 0), DcCmdPid, "cmd.exe", PwDumpPid, "PwDump7.exe"),
      fileOp("read")(DomainController, t(11, 1), PwDumpPid, "PwDump7.exe", SamPath, 65536),
      fileOp("write")(DomainController, t(11, 2), PwDumpPid, "PwDump7.exe", PwDumpOut, 16384),
      procStart(DomainController, t(11, 3), DcCmdPid, "cmd.exe", WcePid, "WCE.exe"),
      fileOp("read")(DomainController, t(11, 3, 30), WcePid, "WCE.exe", SamPath, 65536),
      fileOp("write")(DomainController, t(11, 4), WcePid, "WCE.exe", WceOut, 16384),
      ipOp("connect")(DomainController, t(11, 5), DcCmdPid, "cmd.exe", AttackerIp, 443, None),
      ipOp("write")(DomainController, t(11, 6), DcCmdPid, "cmd.exe", AttackerIp, 443, Some(32768L)),
    )
    val a5core = Seq(
      fileOp("write")(DbServer, t(12, 0), SqlServrPid, "sqlservr.exe", DbBak, 200 << 20),
      procStart(DbServer, t(12, 4), ExplorerPid, "explorer.exe", CmdPid, "cmd.exe"),
      procStart(DbServer, t(12, 5), CmdPid, "cmd.exe", OsqlPid, "osql.exe"),
      fileOp("write")(DbServer, t(12, 6), OsqlPid, "osql.exe", BackupDmp, 150 << 20),
      procStart(DbServer, t(12, 9), CmdPid, "cmd.exe", SbblvPid, "sbblv.exe"),
      fileOp("read")(DbServer, t(12, 10), SbblvPid, "sbblv.exe", BackupDmp, 150 << 20),
      ipOp("write")(DbServer, t(12, 11), SbblvPid, "sbblv.exe", AttackerIp, 443, Some(burstAmount)),
      fileOp("read")(DbServer, t(12, 15), PowershellPid, "powershell.exe", DbBak, 200 << 20),
      ipOp("connect")(DbServer, t(12, 14), PowershellPid, "powershell.exe", AttackerIp, 443, None),
    )
    val a5exfil =
      beaconTimes.map(ts => ipOp("write")(DbServer, ts, PowershellPid, "powershell.exe",
                                          AttackerIp, 443, Some(beaconAmount))) ++
      burstTimes.map(ts => ipOp("write")(DbServer, ts, PowershellPid, "powershell.exe",
                                         AttackerIp, 443, Some(burstAmount)))
    a1 ++ a2 ++ a3 ++ a4 ++ a5core ++ a5exfil
  }
}
