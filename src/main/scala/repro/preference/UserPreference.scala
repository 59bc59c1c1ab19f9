package repro.preference

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** User entity preference (paper §III-C, eq. 7): the user embedding is the
  * element-wise mean of the fused entity embeddings h_e over the user's
  * entity sequence, and the preference score is its dot product with h_e.
  *
  * Implemented as pure DataFrame math (posexplode + groupBy) so it scales the
  * way the paper's daily batch job does; the Oracle tests check the
  * aggregation against DuckDB SQL.
  */
object UserPreference {

  /** Entity embeddings as a DataFrame (entity_id, vec array<double>). */
  def embeddingsDf(spark: SparkSession, emb: Array[Array[Double]]): DataFrame = {
    import spark.implicits._
    emb.zipWithIndex.toSeq.map { case (v, i) => (i, v.toSeq) }.toDF("entity_id", "vec")
  }

  /** r_u = Σ_j h_{e_j} / l over the user's entity sequence.
    * Input: flattened sequences (user_id, rank, entity_id) + embeddings.
    * Output: (user_id, vec array<double>).
    */
  def userEmbeddings(flatSeq: DataFrame, embeddings: DataFrame): DataFrame = {
    flatSeq
      .join(embeddings, "entity_id")
      .select(col("user_id"), posexplode(col("vec")).as(Seq("dim", "value")))
      .groupBy("user_id", "dim")
      .agg(avg("value").as("value"))
      .groupBy("user_id")
      .agg(sort_array(collect_list(struct(col("dim"), col("value")))).as("pairs"))
      .select(col("user_id"), expr("transform(pairs, p -> p.value)").as("vec"))
  }

  /** s_<u,e> = r_u · h_e for every (user, entity in `entityIds`) pair.
    * Output: (user_id, entity_id, score).
    */
  def preferenceScores(spark: SparkSession, userEmb: DataFrame,
                       embeddings: DataFrame, entityIds: Seq[Int]): DataFrame = {
    import spark.implicits._
    val chosen = entityIds.toDF("entity_id").join(embeddings, "entity_id")
      .select(col("entity_id"), col("vec").as("evec"))
    userEmb.crossJoin(chosen)
      .select(col("user_id"), col("entity_id"),
        expr("aggregate(zip_with(vec, evec, (x, y) -> x * y), 0D, (acc, x) -> acc + x)").as("score"))
  }
}
