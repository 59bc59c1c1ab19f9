package repro.candidate

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.embed.SemanticEmbed
import repro.world.{EntityWorld, WorldConfig}

class CandidateGenerationSpec extends SparkSpec {

  private lazy val world = new EntityWorld(WorldConfig(nEntities = 90, nTopics = 6, nUsers = 10, seed = 37))
  private lazy val embSe = SemanticEmbed.embed(world, SemanticEmbed.SemConfig(signal = 0.8, noise = 0.1))

  test("knnEdges returns exactly k neighbours per source, no self-edges") {
    val df = CandidateGeneration.knnEdges(spark, embSe, k = 5, relType = 1).cache()
    assert(df.count() == 90L * 5)
    assert(df.filter(col("src") === col("dst")).count() == 0)
    val perSrc = df.groupBy("src").count().select("count").distinct().collect().map(_.getLong(0))
    assert(perSrc.sameElements(Array(5L)))
  }

  test("knn neighbours are the true cosine top-k") {
    val df = CandidateGeneration.knnEdges(spark, embSe, k = 3, relType = 0)
    val got = df.filter(col("src") === 7).select("dst").collect().map(_.getInt(0)).toSet
    val expected = (0 until 90).filter(_ != 7)
      .sortBy(j => -EntityWorld.cosine(embSe(7), embSe(j))).take(3).toSet
    assert(got == expected)
  }

  test("candidateGraph canonicalises src<dst and dedups") {
    val gc = CandidateGeneration.candidateGraph(spark, embSe, embSe,
      CandidateGeneration.CandConfig(topKCooc = 4, topKSem = 4)).cache()
    assert(gc.filter(col("src") >= col("dst")).count() == 0)
    assert(gc.groupBy("src", "dst").count().filter(col("count") > 1).count() == 0)
  }

  test("candidate edges are mostly same-topic (the signal TRMP refines)") {
    // topK must stay below topic size (15 here) or cross-topic edges are forced
    val gc = CandidateGeneration.candidateGraph(spark, embSe, embSe,
      CandidateGeneration.CandConfig(topKCooc = 6, topKSem = 5))
    val pairs = gc.select("src", "dst").collect().map(r => (r.getInt(0), r.getInt(1)))
    val sameRate = pairs.count { case (u, v) =>
      world.entities(u).topic == world.entities(v).topic
    }.toDouble / pairs.length
    assert(sameRate > 0.5, s"same-topic rate $sameRate too low for candidate stage")
  }

  test("popularity-sampled pairs hit the requested degree and favour popular entities") {
    val df = CandidateGeneration.popularitySampledPairs(spark, world, avgDegree = 6).cache()
    val nPairs = df.count()
    assert(math.abs(nPairs - 90L * 6 / 2) <= 2, s"got $nPairs pairs")
    // popular entities (low in-topic rank) should appear more often
    val apps = df.select(explode(array(col("src"), col("dst"))).as("e"))
      .groupBy("e").count().collect().map(r => r.getInt(0) -> r.getLong(1)).toMap
    val popularAvg = (0 until 12).map(i => apps.getOrElse(i, 0L)).sum / 12.0
    val tailAvg = (78 until 90).map(i => apps.getOrElse(i, 0L)).sum / 12.0
    assert(popularAvg > tailAvg, s"popular=$popularAvg tail=$tailAvg")
  }
}
