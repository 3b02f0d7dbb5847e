package repro.attack

/** The investigation workload of the evaluation: the paper's end-to-end
  * investigation used "19 multievent queries and 1 anomaly query". These are
  * our 20, reconstructed from the demo narrative (Section 3) over the
  * synthetic trace of [[AttackDataGen]]: q01–q19 are multievent (q08/q10 use
  * the dependency syntax, which compiles to multievent), q20 is the anomaly
  * query (Query 3 of the paper).
  *
  * Each query carries the attack step it investigates and a ground-truth
  * marker — a value that must appear in the results if the engine is
  * correct.
  */
object InvestigationQueries {

  final case class Q(
      name: String,
      step: String,
      aiql: String,
      /** column → expected value present in some result row */
      expect: Map[String, String])

  private val at = s"""(at "${AttackDataGen.Day1}")"""

  val all: Seq[Q] = Seq(
    Q("q01", "a5: files read by the exfiltrating process",
      s"""$at
         |agentid = 4
         |proc p["%powershell.exe"] read file f as evt
         |return p, f, evt.ts""".stripMargin,
      Map("f" -> AttackFacts.DbBak)),

    Q("q02", "a5: creation process of the database dump",
      s"""$at
         |agentid = 4
         |proc p write file f["%db.bak"] as evt
         |return p, p.pid, f, evt.ts""".stripMargin,
      Map("p" -> "sqlservr.exe")),

    Q("q03", "a5: connection established before the transfer",
      s"""$at
         |agentid = 4
         |proc p["%powershell.exe"] connect ip i["${AttackFacts.AttackerIp}"] as evt1
         |proc p write ip i as evt2
         |with evt1 before evt2
         |return p, i, evt1.ts, evt2.ts""".stripMargin,
      Map("p" -> "powershell.exe", "i" -> AttackFacts.AttackerIp)),

    Q("q04", "a5: OSQL dump + malware exfiltration (paper Query 1)",
      s"""$at
         |agentid = 4
         |proc p1["%cmd.exe"] start proc p2["%osql.exe"] as evt1
         |proc p2 write file f1["%backup1.dmp"] as evt2
         |proc p3["%sbblv.exe"] read file f1 as evt3
         |proc p3 write ip i1[dst_ip = "${AttackFacts.AttackerIp}"] as evt4
         |with evt1 before evt2, evt2 before evt3, evt3 before evt4
         |return p1, p2, f1, p3, i1""".stripMargin,
      Map("p1" -> "cmd.exe", "p2" -> "osql.exe", "p3" -> "sbblv.exe",
          "f1" -> AttackFacts.BackupDmp, "i1" -> AttackFacts.AttackerIp)),

    Q("q05", "a5: parent of the malware process",
      s"""$at
         |agentid = 4
         |proc p1 start proc p2["%sbblv.exe"] as evt1
         |return p1, p1.pid, p2, evt1.ts""".stripMargin,
      Map("p1" -> "cmd.exe", "p2" -> "sbblv.exe")),

    Q("q06", "a1: UnrealIRCd exploit chain on the IRC server",
      s"""$at
         |agentid = 1
         |proc p1["%unrealircd%"] read ip i1 as evt1
         |proc p1 start proc p2["sh"] as evt2
         |proc p2 connect ip i2[dst_ip = "${AttackFacts.AttackerIp}"] as evt3
         |with evt1 before evt2, evt2 before evt3
         |return p1, p2, i1.dst_ip, i2.dst_ip, evt3.ts""".stripMargin,
      Map("p1" -> "unrealircd", "p2" -> "sh")),

    Q("q07", "a1: telnet backdoor traffic to the attacker",
      s"""$at
         |agentid = 1
         |proc p["sh"] write ip i[dst_ip = "${AttackFacts.AttackerIp}"] as evt
         |return p, p.pid, i, evt.ts, evt.amount""".stripMargin,
      Map("p" -> "sh", "i" -> AttackFacts.AttackerIp)),

    Q("q08", "a2: forward tracking of the malware (paper Query 2)",
      s"""$at
         |forward
         |proc p1["%apache2%"] read file f1["%info_stealer%"] as evt1
         |proc p1 connect ip i1 as evt2
         |proc p2["%wget%"] connect ip i1 as evt3
         |proc p2 write file f2["%info_stealer%"] as evt4
         |return p1, f1, i1, p2, f2, evt4.ts""".stripMargin,
      Map("p1" -> "apache2", "p2" -> "wget", "i1" -> AttackFacts.ApacheIp,
          "f2" -> AttackFacts.InfoStealerTmp)),

    Q("q09", "a2: execution of the downloaded malware",
      s"""$at
         |agentid = 2
         |proc p1["%bash%"] execute file f["%info_stealer%"] as evt1
         |proc p1 start proc p2["%info_stealer%"] as evt2
         |with evt1 before evt2
         |return p1, p2, p2.pid, evt2.ts""".stripMargin,
      Map("p1" -> "bash", "p2" -> AttackFacts.InfoStealerTmp)),

    Q("q10", "a3: backward tracking from the credential theft",
      s"""$at
         |agentid = 2
         |backward
         |proc p2["%mimikatz%"] read file f1["%lsass%"] as evt3
         |proc p1 start proc p2 as evt2
         |proc p0 start proc p1 as evt1
         |return p2, p1, p0, p0.pid""".stripMargin,
      Map("p1" -> "exploit.exe", "p0" -> AttackFacts.InfoStealerTmp)),

    Q("q11", "a3: files written by Mimikatz",
      s"""$at
         |agentid = 2
         |proc p["%mimikatz%"] write file f as evt
         |return p, f, evt.ts""".stripMargin,
      Map("f" -> AttackFacts.CredsTxt)),

    Q("q12", "a3: Kiwi memory-dumping activity",
      s"""$at
         |agentid = 2
         |proc p1 start proc p2["%kiwi%"] as evt1
         |proc p2 read file f["%lsass%"] as evt2
         |with evt1 before evt2
         |return p1, p2, f, evt2.ts""".stripMargin,
      Map("p1" -> "exploit.exe", "p2" -> "kiwi.exe")),

    Q("q13", "a4: PwDump7 credential dump on the DC",
      s"""$at
         |agentid = 3
         |proc p["%PwDump7.exe"] read file f["%SAM%"] as evt1
         |proc p write file f2 as evt2
         |with evt1 before evt2
         |return p, f, f2, evt2.ts""".stripMargin,
      Map("p" -> "PwDump7.exe", "f2" -> AttackFacts.PwDumpOut)),

    Q("q14", "a4: WCE credential dump on the DC",
      s"""$at
         |agentid = 3
         |proc p["%WCE.exe"] read file f["%SAM%"] as evt1
         |proc p write file f2 as evt2
         |with evt1 before evt2
         |return p, f2, evt2.ts""".stripMargin,
      Map("p" -> "WCE.exe", "f2" -> AttackFacts.WceOut)),

    Q("q15", "a4: common parent of both dump tools",
      s"""$at
         |agentid = 3
         |proc p1 start proc p2["%PwDump7.exe"] as evt1
         |proc p1 start proc p3["%WCE.exe"] as evt2
         |return p1, p1.pid, p2, p3""".stripMargin,
      Map("p1" -> "cmd.exe")),

    Q("q16", "a5: process chain that launched OSQL",
      s"""$at
         |agentid = 4
         |proc p0 start proc p1["%cmd.exe"] as evt1
         |proc p1 start proc p2["%osql.exe"] as evt2
         |with evt1 before evt2
         |return p0, p1, p2, evt1.ts""".stripMargin,
      Map("p0" -> "explorer.exe")),

    Q("q17", "a5: dump written by SQL server, read by exfiltrator",
      s"""$at
         |agentid = 4
         |proc p1["%sqlservr.exe"] write file f["%db.bak"] as evt1
         |proc p2["%powershell.exe"] read file f as evt2
         |with evt1 before evt2
         |return p1, p2, f, evt1.ts, evt2.ts""".stripMargin,
      Map("p1" -> "sqlservr.exe", "p2" -> "powershell.exe")),

    Q("q18", "a5: per-process exfiltration volume to the attacker",
      s"""$at
         |agentid = 4
         |proc p write ip i[dst_ip = "${AttackFacts.AttackerIp}"] as evt
         |return p, count(evt) as n, sum(evt.amount) as total
         |group by p""".stripMargin,
      Map("p" -> "powershell.exe")),

    Q("q19", "all steps: attacker-IP touch points across the enterprise",
      s"""$at
         |agentid in (1, 2, 3, 4)
         |proc p connect ip i[dst_ip = "${AttackFacts.AttackerIp}"] as evt
         |return evt.agentid, p, evt.ts""".stripMargin,
      Map("p" -> "powershell.exe")),

    Q("q20", "a5: large-transfer anomaly (paper Query 3)",
      s"""$at
         |agentid = 4
         |window = 1 min, step = 10 sec
         |proc p write ip i[dst_ip = "${AttackFacts.AttackerIp}"] as evt
         |return p, avg(evt.amount) as amt
         |group by p
         |having amt > 2 * (amt + amt[1] + amt[2]) / 3""".stripMargin,
      Map("p" -> "powershell.exe")),
  )

  def byName(name: String): Q = all.find(_.name == name)
    .getOrElse(throw new NoSuchElementException(name))

  val multievent: Seq[Q] = all.filterNot(_.name == "q20")
  val anomaly: Q = byName("q20")
}
