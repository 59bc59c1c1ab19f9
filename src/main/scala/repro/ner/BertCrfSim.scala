package repro.ner

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.world.EntityWorld

/** Stand-in for the paper's pre-trained BertCRF entity tagger.
  *
  * The real system runs BERT+CRF NER over behavior text; downstream modules
  * only ever see the resulting entity list per behavior. We reproduce that
  * interface with dictionary matching over the generated text plus an
  * explicit noise model approximating NER imperfection:
  *   - a match is dropped with probability `pDrop` (recall < 1), and
  *   - a match is confused with a random dict entity with probability
  *     `pConfuse` (precision < 1).
  * Noise is deterministic in (seed, user, day, session, position) so the
  * whole pipeline is reproducible.
  *
  * Runs distributed: the dict is broadcast and tagging happens in a UDF over
  * the behavior DataFrame.
  */
object BertCrfSim {

  final case class NerConfig(pDrop: Double = 0.05, pConfuse: Double = 0.03, seed: Long = 17L)

  /** Input: (user_id, day, session, text); output: (user_id, day, session, pos, entity_id). */
  def tag(spark: SparkSession, world: EntityWorld, behaviors: DataFrame,
          cfg: NerConfig = NerConfig()): DataFrame = {
    val dict: Map[String, Int] = world.entities.map(e => e.name -> e.id).toMap
    val nEntities = world.cfg.nEntities
    val bDict = spark.sparkContext.broadcast(dict)
    val pDrop = cfg.pDrop; val pConfuse = cfg.pConfuse; val seed = cfg.seed

    val tagUdf = udf { (user: Int, day: Int, session: Int, text: String) =>
      val d = bDict.value
      val out = scala.collection.mutable.ArrayBuffer[(Int, Int)]()
      var pos = 0
      text.split(' ').foreach { tok =>
        d.get(tok).foreach { id =>
          val r = new scala.util.Random(seed ^ (user * 1_000_003L + day * 10_007L + session * 101L + pos))
          val roll = r.nextDouble()
          if (roll >= pDrop) {
            val id2 = if (roll < pDrop + pConfuse) r.nextInt(nEntities) else id
            out += ((pos, id2))
          }
        }
        pos += 1
      }
      out.toSeq
    }

    behaviors
      .withColumn("tags", tagUdf(col("user_id"), col("day"), col("session"), col("text")))
      .select(col("user_id"), col("day"), col("session"), explode(col("tags")).as("tag"))
      .select(col("user_id"), col("day"), col("session"),
              col("tag._1").as("pos"), col("tag._2").as("entity_id"))
  }
}
