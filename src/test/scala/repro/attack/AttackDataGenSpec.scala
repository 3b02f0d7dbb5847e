package repro.attack

import org.apache.spark.sql.functions._

import repro.SparkSpec
import repro.events.EventSchema

class AttackDataGenSpec extends SparkSpec {

  private lazy val bg = AttackDataGen.background(spark, sf = 0.002, seed = 3).cache()
  private lazy val trace = AttackDataGen.attackTrace(spark).cache()

  test("background schema matches the data model") {
    assert(bg.columns.toSeq == EventSchema.columns)
  }

  test("background size scales with sf") {
    assert(bg.count() == AttackDataGen.backgroundRows(0.002))
    assert(AttackDataGen.backgroundRows(0.1) == 500000L)
  }

  test("host count scales like the paper's deployment (150 hosts at sf=1)") {
    assert(AttackDataGen.hosts(1.0) == 150)
    assert(AttackDataGen.hosts(0.1) == 15)
    assert(AttackDataGen.hosts(0.001) == 4) // floor for the four attack roles
  }

  test("background is deterministic in (sf, seed)") {
    val again = AttackDataGen.background(spark, sf = 0.002, seed = 3)
    assert(bg.exceptAll(again).count() == 0)
    assert(again.exceptAll(bg).count() == 0)
  }

  test("different seeds give different data") {
    val other = AttackDataGen.background(spark, sf = 0.002, seed = 4)
    assert(bg.exceptAll(other).count() > 0)
  }

  test("agent ids stay within the host count") {
    val h = AttackDataGen.hosts(0.002)
    val ids = bg.select("agent_id").distinct().collect().map(_.getInt(0))
    assert(ids.forall(a => a >= 1 && a <= h))
  }

  test("background spans three days") {
    val days = bg.select("day").distinct().collect().map(_.getString(0)).sorted
    assert(days.toSeq == Seq("2023-08-01", "2023-08-02", "2023-08-03"))
  }

  test("day column is consistent with ts") {
    val bad = bg.filter(AttackDataGen.dayOf(col("ts")) =!= col("day")).count()
    assert(bad == 0)
  }

  test("object columns match obj_type") {
    assert(bg.filter(col("obj_type") === "file" && col("obj_path").isNull).count() == 0)
    assert(bg.filter(col("obj_type") === "proc" && col("obj_pid").isNull).count() == 0)
    assert(bg.filter(col("obj_type") === "ip" && col("dst_ip").isNull).count() == 0)
    assert(bg.filter(col("obj_type") === "file" && col("dst_ip").isNotNull).count() == 0)
  }

  test("operations respect the object types") {
    val fileOps = bg.filter(col("obj_type") === "file")
      .select("op").distinct().collect().map(_.getString(0)).toSet
    assert(fileOps.subsetOf(Set("read", "write", "execute", "delete")))
    val procOps = bg.filter(col("obj_type") === "proc")
      .select("op").distinct().collect().map(_.getString(0)).toSet
    assert(procOps == Set("start"))
  }

  test("the attacker IP never appears in background noise") {
    assert(bg.filter(col("dst_ip") === AttackFacts.AttackerIp).count() == 0)
  }

  test("process-name distribution is skewed (zipf-like)") {
    val counts = bg.groupBy("subj_exe").count().orderBy(desc("count"))
      .collect().map(_.getLong(1))
    assert(counts.head > 3 * counts.last)
  }

  test("attack trace lands on day 1 on the four staged hosts") {
    assert(trace.select("day").distinct().collect().map(_.getString(0)).toSeq == Seq("2023-08-01"))
    val agents = trace.select("agent_id").distinct().collect().map(_.getInt(0)).toSet
    assert(agents == Set(AttackFacts.IrcServer, AttackFacts.IntranetHost,
                         AttackFacts.DomainController, AttackFacts.DbServer))
  }

  test("attack trace contains each step's signature events") {
    def has(cond: org.apache.spark.sql.Column): Boolean = trace.filter(cond).count() > 0
    // a1: exploit + backdoor
    assert(has(col("subj_exe") === "unrealircd" && col("op") === "start"))
    assert(has(col("subj_exe") === "sh" && col("dst_ip") === AttackFacts.AttackerIp))
    // a2: infection via apache
    assert(has(col("subj_exe") === "apache2" && col("obj_path") === AttackFacts.InfoStealerSrv))
    assert(has(col("subj_exe") === "wget" && col("obj_path") === AttackFacts.InfoStealerTmp))
    // a3: memory dumping tools
    assert(has(col("subj_exe") === "mimikatz.exe" && col("obj_path") === AttackFacts.LsassPath))
    assert(has(col("subj_exe") === "kiwi.exe"))
    // a4: password dumping tools
    assert(has(col("subj_exe") === "PwDump7.exe" && col("obj_path") === AttackFacts.SamPath))
    assert(has(col("subj_exe") === "WCE.exe" && col("obj_path") === AttackFacts.SamPath))
    // a5: dump + exfiltration
    assert(has(col("subj_exe") === "sqlservr.exe" && col("obj_path") === AttackFacts.DbBak))
    assert(has(col("subj_exe") === "sbblv.exe" && col("dst_ip") === AttackFacts.AttackerIp))
    assert(has(col("subj_exe") === "powershell.exe" && col("dst_ip") === AttackFacts.AttackerIp))
  }

  test("exfiltration burst dwarfs the beacons") {
    assert(AttackFacts.burstAmount > 1000 * AttackFacts.beaconAmount)
    assert(AttackFacts.beaconTimes.size == 12 && AttackFacts.burstTimes.size == 3)
  }

  test("attack event ids do not collide with background ids") {
    val maxBg = bg.agg(max("event_id")).collect()(0).getLong(0)
    val minAttack = trace.agg(min("event_id")).collect()(0).getLong(0)
    assert(minAttack > maxBg)
  }

  test("combined events union cleanly") {
    val all = AttackDataGen.events(spark, sf = 0.002, seed = 3)
    assert(all.count() == bg.count() + trace.count())
    assert(all.columns.toSeq == EventSchema.columns)
  }
}
