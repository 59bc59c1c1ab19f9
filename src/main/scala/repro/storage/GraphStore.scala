package repro.storage

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Stand-in for Geabase, Ant's distributed graph database (paper §III-C).
  *
  * The online stage needs exactly two capabilities from the store: persist
  * the mined relations, and answer k-hop neighbourhood queries fast. We
  * persist the edge DataFrame as Parquet on the local filesystem and answer
  * k-hop expansion with iterative self-joins — the same dataflow a
  * distributed graph DB would execute, minus the RPC layer.
  */
final class GraphStore(spark: SparkSession, path: String) {

  /** Persists mined relations (src, dst, score). Overwrites prior weeks —
    * the paper's graph is rebuilt weekly.
    */
  def write(relations: DataFrame): Unit =
    relations.select("src", "dst", "score").write.mode("overwrite").parquet(path)

  def edges(): DataFrame = spark.read.parquet(path)

  /** Undirected adjacency view (both directions). */
  def adjacency(): DataFrame = {
    val e = edges()
    e.select(col("src").as("a"), col("dst").as("b"), col("score"))
      .union(e.select(col("dst").as("a"), col("src").as("b"), col("score")))
  }

  /** Entities reachable within `k` hops of the seed entities, with hop depth
    * and the best path score (product of edge scores along the discovered
    * path). Seeds themselves are returned with hop 0 / score 1. This is the
    * entity-graph-reasoning primitive the marketer UI drives.
    */
  def kHop(seeds: Seq[Int], k: Int): DataFrame = {
    import spark.implicits._
    val adj = adjacency().cache()
    var frontier = seeds.toDF("entity_id").withColumn("hop", lit(0)).withColumn("path_score", lit(1.0))
    var visited = frontier
    var hop = 0
    while (hop < k) {
      val next = frontier
        .join(adj, frontier("entity_id") === adj("a"))
        .select(col("b").as("entity_id"), (col("hop") + 1).as("hop"),
                (col("path_score") * col("score")).as("path_score"))
        .join(visited.select(col("entity_id").as("seen")), col("entity_id") === col("seen"), "left_anti")
        .groupBy("entity_id")
        .agg(min("hop").as("hop"), max("path_score").as("path_score"))
      visited = visited.union(next.select("entity_id", "hop", "path_score"))
      frontier = next.select("entity_id", "hop", "path_score")
      hop += 1
    }
    visited.groupBy("entity_id").agg(min("hop").as("hop"), max("path_score").as("path_score"))
  }
}
