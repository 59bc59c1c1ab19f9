package repro.candidate

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.world.EntityWorld
import scala.util.Random

/** TRMP Stage I — candidate generation (paper §III-B1).
  *
  * Builds the initial entity graph `G^C` as the union of
  *   - co-occurrence candidates: top-k cosine neighbours in the Skip-gram
  *     embedding space `E^Co`, and
  *   - semantic candidates: top-k cosine neighbours in the BERT-like space
  *     `E^Se`.
  * The k-NN runs distributed: the full embedding matrix is broadcast and each
  * partition scores its slice of source entities against it (block
  * nested-loop, the standard Spark pattern at this scale).
  *
  * Also provides the popularity-sampling pair generator used by the paper's
  * `TRMP w.o. E&R_s` ablation row.
  */
object CandidateGeneration {

  val RelCooc = 0
  val RelSemantic = 1

  final case class CandConfig(topKCooc: Int = 12, topKSem: Int = 8)

  /** Top-k cosine neighbours of every entity. Output: (src, dst, sim, rel_type),
    * src < dst canonicalised later by `candidateGraph`.
    */
  def knnEdges(spark: SparkSession, emb: Array[Array[Double]], k: Int, relType: Int): DataFrame = {
    import spark.implicits._
    val n = emb.length
    val bEmb = spark.sparkContext.broadcast(emb)
    spark.sparkContext.parallelize(0 until n, math.min(16, n))
      .flatMap { src =>
        val all = bEmb.value
        val v = all(src)
        val sims = new Array[(Int, Double)](n)
        var j = 0
        while (j < n) { sims(j) = (j, EntityWorld.cosine(v, all(j))); j += 1 }
        sims.filter(_._1 != src).sortBy(-_._2).take(k).map { case (dst, s) => (src, dst, s, relType) }
      }
      .toDF("src", "dst", "sim", "rel_type")
  }

  /** The initial graph G^C: union of co-occurrence and semantic k-NN edges,
    * canonicalised to src < dst with the best sim and min rel_type per pair.
    */
  def candidateGraph(spark: SparkSession, embCo: Array[Array[Double]],
                     embSe: Array[Array[Double]], cfg: CandConfig = CandConfig()): DataFrame = {
    val co = knnEdges(spark, embCo, cfg.topKCooc, RelCooc)
    val se = knnEdges(spark, embSe, cfg.topKSem, RelSemantic)
    co.union(se)
      .select(least(col("src"), col("dst")).as("src"),
              greatest(col("src"), col("dst")).as("dst"),
              col("sim"), col("rel_type"))
      .groupBy("src", "dst")
      .agg(max("sim").as("sim"), min("rel_type").as("rel_type"))
  }

  /** Ablation baseline `TRMP w.o. E&R_s`: entity pairs drawn from the Entity
    * Dict by popularity sampling (no embeddings at all). Produces the same
    * average out-degree as the candidate stage so AEEC is comparable.
    */
  def popularitySampledPairs(spark: SparkSession, world: EntityWorld,
                             avgDegree: Int, seed: Long = 41L): DataFrame = {
    import spark.implicits._
    val n = world.cfg.nEntities
    val pops = world.entities.map(_.popularity)
    val cum = pops.scanLeft(0.0)(_ + _).tail
    val total = cum.last
    val rng = new Random(seed)
    def draw(): Int = {
      val x = rng.nextDouble() * total
      val i = java.util.Arrays.binarySearch(cum, x)
      math.min(if (i >= 0) i else -i - 1, n - 1)
    }
    val pairs = scala.collection.mutable.Set[(Int, Int)]()
    val target = n.toLong * avgDegree / 2
    var guard = 0
    while (pairs.size < target && guard < target * 20) {
      val u = draw(); val v = draw()
      if (u != v) pairs += ((math.min(u, v), math.max(u, v)))
      guard += 1
    }
    pairs.toSeq.map { case (u, v) => (u, v, 0.0, RelCooc) }.toDF("src", "dst", "sim", "rel_type")
  }
}
