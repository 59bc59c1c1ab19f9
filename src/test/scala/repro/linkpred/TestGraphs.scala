package repro.linkpred

import org.apache.spark.sql.SparkSession
import repro.candidate.CandidateGeneration
import repro.embed.SemanticEmbed
import repro.world.{EntityWorld, WorldConfig}

/** Shared tiny link-prediction fixture for model tests: a topic-structured
  * candidate graph over a small world, so every method has learnable signal.
  */
object TestGraphs {

  lazy val world = new EntityWorld(WorldConfig(nEntities = 120, nTopics = 6, nUsers = 10, seed = 43))

  def tinyDataset(spark: SparkSession): LinkPredData = {
    val embSe = SemanticEmbed.embed(world, SemanticEmbed.SemConfig(signal = 0.75, noise = 0.15, seed = 2))
    val embCo = SemanticEmbed.embed(world, SemanticEmbed.SemConfig(signal = 0.65, noise = 0.25, seed = 3))
    val gc = CandidateGeneration.candidateGraph(spark, embCo, embSe,
      CandidateGeneration.CandConfig(topKCooc = 6, topKSem = 5))
    LinkPredData.split(spark, gc, world.cfg.nEntities, embSe, embCo, seed = 13)
  }
}
