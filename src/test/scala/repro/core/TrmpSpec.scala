package repro.core

import repro.SparkSpec
import repro.eval.Annotators
import repro.world.{EntityWorld, WorldConfig}
import repro.candidate.CandidateGeneration
import repro.embed.{SemanticEmbed, SkipGram}
import repro.ner.BertCrfSim

class TrmpSpec extends SparkSpec {

  private lazy val world = new EntityWorld(WorldConfig(nEntities = 150, nTopics = 6, nUsers = 40, seed = 47))
  private lazy val cfg = Trmp.TrmpConfig(
    logCfg = repro.world.BehaviorGen.LogConfig(days = 8, sessionsPerDay = 2, mentionsPerSession = 4),
    candCfg = CandidateGeneration.CandConfig(topKCooc = 6, topKSem = 5),
    sgCfg = SkipGram.SgConfig(dim = 12, epochs = 2),
    alpcCfg = AlpcConfig(dim = 12, layers = 1, k = 4, epochs = 25),
    ensCfg = EnsembleConfig(epochs = 15, maxTrainPairs = 2000),
    weeks = 2, ensembleWindow = 2)
  private lazy val result = Trmp.run(spark, world, cfg)

  test("pipeline produces one run per week and one ensemble per week") {
    assert(result.weekly.length == 2)
    assert(result.ensembles.length == 2)
    assert(result.ensembles.map(_._1) == Seq(0, 1))
  }

  test("candidate stage yields a non-trivial graph") {
    result.weekly.foreach { wr =>
      val edges = wr.candidateEdges.count()
      assert(edges > world.cfg.nEntities, s"week ${wr.week}: only $edges candidate edges")
    }
  }

  test("ranking keeps a subset of candidate relations") {
    val wr = result.weekly.head
    val stages = Trmp.stageRelations(wr, None)
    assert(stages("ranked").length <= stages("candidate").length)
    assert(stages("ranked").nonEmpty, "ranking should keep something")
    val candSet = stages("candidate").toSet
    stages("ranked").foreach(p => assert(candSet.contains(p)))
  }

  test("ranking improves annotator-judged accuracy over candidates") {
    val wr = result.weekly.head
    val stages = Trmp.stageRelations(wr, None)
    val accCand = Annotators.evaluate(world, stages("candidate")).acc
    val accRank = Annotators.evaluate(world, stages("ranked")).acc
    assert(accRank >= accCand - 0.02,
      s"ranking should not hurt accuracy: cand=$accCand ranked=$accRank")
  }

  test("weekly runs differ (upstream drift is real)") {
    val e0 = result.weekly(0).candidateEdges.select("src", "dst")
    val e1 = result.weekly(1).candidateEdges.select("src", "dst")
    assert(e0.except(e1).count() > 0, "weeks produced identical candidate graphs")
  }

  test("ensemble relations are a subset of candidates") {
    val wr = result.weekly.last
    val ens = result.ensembles.last._2
    val stages = Trmp.stageRelations(wr, Some(ens))
    assert(stages.contains("ensemble"))
    val candSet = stages("candidate").toSet
    stages("ensemble").foreach(p => assert(candSet.contains(p)))
  }

  test("semantic embeddings feed features of the right width") {
    val wr = result.weekly.head
    assert(wr.data.featSe(0).length == cfg.semCfg.dim)
    assert(wr.data.featCo(0).length == cfg.sgCfg.dim)
  }
}
