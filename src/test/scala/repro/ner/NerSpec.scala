package repro.ner

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.world.{BehaviorGen, EntityWorld, WorldConfig}

class NerSpec extends SparkSpec {

  private lazy val world = new EntityWorld(WorldConfig(nEntities = 120, nTopics = 6, nUsers = 15, seed = 23))
  private lazy val logCfg = BehaviorGen.LogConfig(days = 6, sessionsPerDay = 2, mentionsPerSession = 4)
  private lazy val logs = BehaviorGen.generate(spark, world, logCfg).cache()

  test("noise-free tagger recovers exactly the generated mentions") {
    val tagged = BertCrfSim.tag(spark, world, logs, BertCrfSim.NerConfig(pDrop = 0.0, pConfuse = 0.0))
    val expected = logs.count() * logCfg.mentionsPerSession
    assert(tagged.count() == expected)
  }

  test("noise-free tags match the entities named in the text") {
    val tagged = BertCrfSim.tag(spark, world, logs, BertCrfSim.NerConfig(pDrop = 0.0, pConfuse = 0.0))
      .collect()
    val byKey = logs.collect().map(r => (r.getInt(0), r.getInt(1), r.getInt(2)) -> r.getString(3)).toMap
    tagged.take(200).foreach { r =>
      val text = byKey((r.getInt(0), r.getInt(1), r.getInt(2)))
      val tok = text.split(' ')(r.getInt(3))
      assert(world.idOf(tok).contains(r.getInt(4)))
    }
  }

  test("pDrop removes roughly the configured fraction") {
    val full = BertCrfSim.tag(spark, world, logs, BertCrfSim.NerConfig(pDrop = 0.0, pConfuse = 0.0)).count()
    val dropped = BertCrfSim.tag(spark, world, logs, BertCrfSim.NerConfig(pDrop = 0.3, pConfuse = 0.0)).count()
    val rate = 1.0 - dropped.toDouble / full
    assert(rate > 0.2 && rate < 0.4, s"drop rate $rate should be near 0.3")
  }

  test("pConfuse rewrites some tags to other entities") {
    val clean = BertCrfSim.tag(spark, world, logs, BertCrfSim.NerConfig(pDrop = 0.0, pConfuse = 0.0))
    val noisy = BertCrfSim.tag(spark, world, logs, BertCrfSim.NerConfig(pDrop = 0.0, pConfuse = 0.25))
    val key = Seq("user_id", "day", "session", "pos")
    val joined = clean.withColumnRenamed("entity_id", "clean_id")
      .join(noisy.withColumnRenamed("entity_id", "noisy_id"), key)
    val changed = joined.filter(col("clean_id") =!= col("noisy_id")).count()
    val total = joined.count()
    val rate = changed.toDouble / total
    assert(rate > 0.1 && rate < 0.4, s"confusion rate $rate should be near 0.25")
  }

  test("tagging is deterministic") {
    val a = BertCrfSim.tag(spark, world, logs, BertCrfSim.NerConfig())
    val b = BertCrfSim.tag(spark, world, logs, BertCrfSim.NerConfig())
    assert(a.except(b).count() == 0 && b.except(a).count() == 0)
  }

  test("sequence extractor orders by (day, session, pos) — Oracle-checked counts") {
    val tagged = BertCrfSim.tag(spark, world, logs, BertCrfSim.NerConfig(pDrop = 0.0, pConfuse = 0.0)).cache()
    val seqs = EntitySequenceExtractor.extract(tagged)
    val flat = EntitySequenceExtractor.flattened(seqs)
    // per-user sequence length must equal the user's tag count
    val got = flat.groupBy("user_id").agg(count("*").as("n"))
    Oracle.assertEquivalent(got,
      "SELECT user_id, count(*) AS n FROM tagged GROUP BY user_id",
      "tagged" -> tagged)
  }

  test("sequence order is chronological") {
    val tagged = BertCrfSim.tag(spark, world, logs, BertCrfSim.NerConfig(pDrop = 0.0, pConfuse = 0.0))
    val seqs = EntitySequenceExtractor.extract(tagged)
    val row = seqs.filter(col("user_id") === 0).head
    val seq = row.getSeq[Int](1)
    val expected = tagged.filter(col("user_id") === 0)
      .orderBy("day", "session", "pos").select("entity_id").collect().map(_.getInt(0)).toSeq
    assert(seq == expected)
  }

  test("window filtering drops days outside the last 30") {
    // shift some rows to day 100 so earlier days fall out of the window
    val shifted = logs.withColumn("day", when(col("day") === 0, 100).otherwise(col("day")))
    val tagged = BertCrfSim.tag(spark, world, shifted, BertCrfSim.NerConfig(pDrop = 0.0, pConfuse = 0.0))
    val seqs = EntitySequenceExtractor.extract(tagged, windowDays = 30)
    val flat = EntitySequenceExtractor.flattened(seqs)
    val kept = flat.join(tagged.select("user_id").distinct(), Seq("user_id")).count()
    val inWindow = tagged.filter(col("day") > 100 - 30).count()
    assert(kept == inWindow, s"kept=$kept expected=$inWindow")
  }
}
