package repro.eval

import repro.SparkSpec
import repro.ner.{BertCrfSim, EntitySequenceExtractor}
import repro.preference.UserPreference
import repro.storage.GraphStore
import repro.world.{BehaviorGen, EntityWorld, WorldConfig}
import java.nio.file.Files

class OnlineSimSpec extends SparkSpec {

  private lazy val world = new EntityWorld(WorldConfig(nEntities = 80, nTopics = 4, nUsers = 60, seed = 61))

  private lazy val fixtures = {
    import spark.implicits._
    // entity graph: latent-cosine kNN (density like the mined graph's)
    val store = new GraphStore(spark, Files.createTempDirectory("ab").resolve("e").toString)
    val edges = world.entities.toSeq.flatMap { e =>
      world.entities.filter(_.id != e.id)
        .sortBy(o => -EntityWorld.cosine(e.latent, o.latent)).take(5)
        .map(o => (e.id, o.id, 0.9))
    }
    store.write(edges.toDF("src", "dst", "score"))
    // user behavior → sequences → embeddings from latent entity vectors
    val logs = BehaviorGen.generate(spark, world,
      BehaviorGen.LogConfig(days = 6, sessionsPerDay = 2, mentionsPerSession = 4))
    val tagged = BertCrfSim.tag(spark, world, logs)
    val flat = EntitySequenceExtractor.flattened(EntitySequenceExtractor.extract(tagged)).cache()
    val entityEmb = UserPreference.embeddingsDf(spark, world.entities.map(_.latent)).cache()
    val userEmb = UserPreference.userEmbeddings(flat, entityEmb).cache()
    (store, flat, entityEmb, userEmb)
  }

  test("default services seed with the topic's most popular entity names") {
    val specs = OnlineSim.defaultServices(world, Seq(0, 2))
    assert(specs.length == 2)
    specs.foreach { s =>
      s.phrases.foreach(p => assert(world.idOf(p).exists(id => world.entities(id).topic == s.topic)))
    }
  }

  test("A/B run produces a coherent result for one service") {
    val (store, flat, entityEmb, userEmb) = fixtures
    val spec = OnlineSim.defaultServices(world, Seq(1)).head
    val cfg = OnlineSim.AbConfig(topKUsers = 20, hops = 2)
    val r = OnlineSim.runService(spark, world, store, userEmb, entityEmb, flat, spec, cfg)
    assert(r.service == spec.name)
    assert(r.eglCvr >= 0 && r.eglCvr <= 1 && r.baseCvr >= 0 && r.baseCvr <= 1)
    assert(r.runtimeMillis > 0)
    assert(math.abs(r.exposureGainPct) < 30, s"exposure should be roughly flat: ${r.exposureGainPct}")
  }

  test("EGL beats the rule-based baseline on most services (the Table III claim)") {
    val (store, flat, entityEmb, userEmb) = fixtures
    val cfg = OnlineSim.AbConfig(topKUsers = 20, hops = 2)
    val results = OnlineSim.defaultServices(world, 0 until 4).map { spec =>
      OnlineSim.runService(spark, world, store, userEmb, entityEmb, flat, spec, cfg)
    }
    val wins = results.count(r => r.cvrGainPct > 0)
    assert(wins >= results.length / 2,
      s"EGL should win most services: ${results.map(r => f"${r.service}:${r.cvrGainPct}%.1f%%")}")
  }

  test("A/B simulation is deterministic in the seed") {
    val (store, flat, entityEmb, userEmb) = fixtures
    val spec = OnlineSim.defaultServices(world, Seq(0)).head
    val cfg = OnlineSim.AbConfig(topKUsers = 15)
    val a = OnlineSim.runService(spark, world, store, userEmb, entityEmb, flat, spec, cfg)
    val b = OnlineSim.runService(spark, world, store, userEmb, entityEmb, flat, spec, cfg)
    assert(a.eglCvr == b.eglCvr && a.baseCvr == b.baseCvr && a.exposureGainPct == b.exposureGainPct)
  }
}
