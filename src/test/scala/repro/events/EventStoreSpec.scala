package repro.events

import java.nio.file.{Files, Paths}

import repro.SparkSpec
import repro.attack.AttackDataGen

class EventStoreSpec extends SparkSpec {

  private lazy val events = AttackDataGen.events(spark, sf = 0.002, seed = 11).cache()
  private lazy val dir = Files.createTempDirectory("evstore").toString

  test("schema of generated events matches the data model") {
    assert(events.columns.toSeq == EventSchema.columns)
  }

  test("dedup collapses identical interactions keeping the smallest id") {
    val twice = events.limit(50).union(events.limit(50))
    val d = EventStore.dedup(twice)
    assert(d.count() == EventStore.dedup(events.limit(50)).count())
  }

  test("dedup is idempotent") {
    val once = EventStore.dedup(events.limit(200))
    assert(once.count() == EventStore.dedup(once).count())
  }

  test("dedup preserves distinct events") {
    val distinctKeys = events.select(EventSchema.dedupKey.map(org.apache.spark.sql.functions.col): _*)
      .distinct().count()
    assert(EventStore.dedup(events).count() == distinctKeys)
  }

  test("write lays out both partition dimensions") {
    EventStore.write(events, dir)
    val fine = Files.list(Paths.get(s"$dir/by_agent_day")).toArray.map(_.toString)
    assert(fine.exists(_.contains("agent_id=")))
    val days = Files.list(Paths.get(fine.find(_.contains("agent_id=1")).get))
      .toArray.map(_.toString)
    assert(days.exists(_.contains("day=2023-08-01")))
    val coarse = Files.list(Paths.get(s"$dir/by_day")).toArray.map(_.toString)
    assert(coarse.exists(_.contains("day=2023-08-01")))
    assert(!coarse.exists(_.contains("agent_id=")))
  }

  test("read restores all columns in schema order") {
    val back = EventStore.read(spark, dir)
    assert(back.columns.toSeq == EventSchema.columns)
    assert(back.count() == EventStore.dedup(events).count())
  }

  test("pruned read scans fewer files than a full read") {
    val full = EventStore.read(spark, dir)
    val pruned = EventStore.readPruned(spark, dir, Some(Seq(4)), Some(Seq("2023-08-01")))
    assert(pruned.inputFiles.length < full.inputFiles.length)
    assert(pruned.inputFiles.forall(f => f.contains("agent_id=4") && f.contains("day=2023-08-01")))
  }

  test("pruned read returns exactly the partition rows") {
    val expected = EventStore.read(spark, dir)
      .filter("agent_id = 4 and day = '2023-08-01'").count()
    assert(EventStore.readPruned(spark, dir, Some(Seq(4)), Some(Seq("2023-08-01"))).count() == expected)
  }

  test("pruning one dimension only") {
    val byAgent = EventStore.readPruned(spark, dir, Some(Seq(2)), None)
    assert(byAgent.inputFiles.forall(_.contains("agent_id=2")))
    val byDay = EventStore.readPruned(spark, dir, None, Some(Seq("2023-08-02")))
    assert(byDay.inputFiles.forall(_.contains("day=2023-08-02")))
  }

  test("flat store has no partition directories") {
    val flatDir = Files.createTempDirectory("evflat").toString
    EventStore.writeFlat(events, flatDir)
    val entries = Files.list(Paths.get(flatDir)).toArray.map(_.toString)
    assert(!entries.exists(_.contains("agent_id=")))
    assert(EventStore.readFlat(spark, flatDir).count() == EventStore.dedup(events).count())
  }

  test("partitioned and flat stores hold identical data") {
    val flatDir = Files.createTempDirectory("evflat2").toString
    EventStore.writeFlat(events, flatDir)
    val a = EventStore.read(spark, dir).orderBy("event_id")
    val b = EventStore.readFlat(spark, flatDir).orderBy("event_id")
    assert(a.count() == b.count())
    assert(a.limit(100).collect().toSeq == b.limit(100).collect().toSeq)
  }
}
