package repro.world

import org.apache.spark.sql.functions._
import repro.SparkSpec

class BehaviorGenSpec extends SparkSpec {

  private lazy val world = new EntityWorld(WorldConfig(nEntities = 120, nTopics = 6, nUsers = 20, seed = 19))
  private lazy val logCfg = BehaviorGen.LogConfig(days = 5, sessionsPerDay = 2, mentionsPerSession = 4)
  private lazy val logs = BehaviorGen.generate(spark, world, logCfg).cache()

  test("row count = Σ_user days × sessionsFor(user)") {
    val expected = (0 until 20).map(u => 5L * BehaviorGen.sessionsFor(world, u, logCfg)).sum
    assert(logs.count() == expected)
  }

  test("activity multipliers span the documented 1×–3× range") {
    val mults = (0 until 20).map(u => BehaviorGen.sessionsFor(world, u, logCfg) / logCfg.sessionsPerDay)
    assert(mults.min >= 1 && mults.max <= 3)
    assert(mults.distinct.size > 1, "users should differ in activity")
  }

  test("texts contain dict entity names") {
    val names = world.entities.map(_.name).toSet
    val texts = logs.select("text").collect().map(_.getString(0))
    val hits = texts.map(t => t.split(' ').count(names.contains))
    assert(hits.forall(_ >= 1), "every session should mention at least one entity")
    assert(hits.sum.toDouble / hits.length >= 3.0, "most mentions should survive")
  }

  test("generation is deterministic in (world seed, week seed)") {
    val again = BehaviorGen.generate(spark, world, logCfg)
    assert(logs.except(again).count() == 0 && again.except(logs).count() == 0)
  }

  test("different week seeds change the logs") {
    val other = BehaviorGen.generate(spark, world, logCfg.copy(weekSeed = 99))
    assert(logs.except(other).count() > 0)
  }

  test("sessions are topically coherent: dominant same-topic co-occurrence") {
    val names = world.entities.map(e => e.name -> e.topic).toMap
    val texts = logs.select("text").collect().map(_.getString(0))
    var same = 0; var diff = 0
    texts.foreach { t =>
      val topics = t.split(' ').flatMap(names.get)
      for (i <- topics.indices; j <- i + 1 until topics.length) {
        if (topics(i) == topics(j)) same += 1 else diff += 1
      }
    }
    assert(same.toDouble / (same + diff) > 0.6,
      s"same-topic co-occurrence should dominate: same=$same diff=$diff")
  }

  test("users with disjoint interests produce different entity mixes") {
    val names = world.entities.map(e => e.name -> e.topic).toMap
    def topicHist(u: Int): Map[Int, Int] =
      logs.filter(col("user_id") === u).select("text").collect()
        .flatMap(_.getString(0).split(' ').flatMap(names.get))
        .groupBy(identity).view.mapValues(_.length).toMap
    // find two users with different top topics in their latent mix
    val u1 = 0
    val top1 = world.users(u1).topicMix.zipWithIndex.maxBy(_._1)._2
    val u2 = (1 until 20).find(u => world.users(u).topicMix.zipWithIndex.maxBy(_._1)._2 != top1).get
    val h1 = topicHist(u1); val h2 = topicHist(u2)
    assert(h1.maxBy(_._2)._1 != h2.maxBy(_._2)._1 || h1 != h2)
  }
}
