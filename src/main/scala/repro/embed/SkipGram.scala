package repro.embed

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import scala.util.Random

/** Skip-gram with negative sampling (SGNS) over user entity sequences —
  * produces the co-occurrence embedding matrix `E^Co` of TRMP stage I.
  *
  * (center, context) pairs are built distributed with a Spark self-join over
  * sequence positions; the embedding table itself is trained on the driver
  * (the paper's word2vec runs on a parameter server — at our SF the table is
  * a few thousand rows, so a driver loop is the faithful equivalent).
  */
object SkipGram {

  final case class SgConfig(dim: Int = 16, window: Int = 2, negatives: Int = 5,
                            epochs: Int = 3, lr: Double = 0.05, seed: Long = 23L)

  /** Distributed pair generation: for each user sequence, all (center, context)
    * pairs within `window` positions. Input: (user_id, rank, entity_id) rows.
    */
  def pairs(flat: DataFrame, window: Int): DataFrame = {
    val a = flat.select(col("user_id"), col("rank").as("ra"), col("entity_id").as("center"))
    val b = flat.select(col("user_id"), col("rank").as("rb"), col("entity_id").as("context"))
    a.join(b, Seq("user_id"))
      .filter(col("ra") =!= col("rb") && abs(col("ra") - col("rb")) <= window)
      .select(col("center"), col("context"))
  }

  /** Trains SGNS and returns the input-side embedding matrix (nEntities×dim). */
  def train(spark: SparkSession, flat: DataFrame, nEntities: Int,
            cfg: SgConfig = SgConfig()): Array[Array[Double]] = {
    val pairRows: Array[(Int, Int)] =
      pairs(flat, cfg.window).collect().map(r => (r.getInt(0), r.getInt(1)))
    trainOnPairs(pairRows, nEntities, cfg)
  }

  /** Core SGNS loop — exposed separately for unit testing on tiny corpora. */
  def trainOnPairs(pairRows: Array[(Int, Int)], nEntities: Int, cfg: SgConfig): Array[Array[Double]] = {
    val rng = new Random(cfg.seed)
    def init() = Array.fill(nEntities, cfg.dim)((rng.nextDouble() - 0.5) / cfg.dim)
    val emb = init()   // input vectors (the product of this stage)
    val ctx = init()   // output vectors
    // unigram^0.75 negative-sampling table, as in word2vec
    val counts = new Array[Double](nEntities)
    pairRows.foreach { case (c, _) => counts(c) += 1 }
    val weights = counts.map(c => math.pow(c + 1.0, 0.75))
    val cum = weights.scanLeft(0.0)(_ + _).tail
    val total = cum.last
    def sampleNeg(): Int = {
      val x = rng.nextDouble() * total
      val i = java.util.Arrays.binarySearch(cum, x)
      val idx = if (i >= 0) i else -i - 1
      math.min(idx, nEntities - 1)
    }

    val order = pairRows.indices.toArray
    var epoch = 0
    while (epoch < cfg.epochs) {
      // deterministic shuffle per epoch
      val r = new Random(cfg.seed + epoch)
      var i = order.length - 1
      while (i > 0) { val j = r.nextInt(i + 1); val t = order(i); order(i) = order(j); order(j) = t; i -= 1 }
      val lr = cfg.lr * (1.0 - epoch.toDouble / cfg.epochs).max(0.1)
      order.foreach { pi =>
        val (center, context) = pairRows(pi)
        sgdStep(emb(center), ctx(context), 1.0, lr)
        var n = 0
        while (n < cfg.negatives) {
          val neg = sampleNeg()
          if (neg != context) sgdStep(emb(center), ctx(neg), 0.0, lr)
          n += 1
        }
      }
      epoch += 1
    }
    emb
  }

  private def sgdStep(w: Array[Double], c: Array[Double], label: Double, lr: Double): Unit = {
    var dot = 0.0
    var i = 0
    while (i < w.length) { dot += w(i) * c(i); i += 1 }
    val g = (1.0 / (1.0 + math.exp(-dot)) - label) * lr
    i = 0
    while (i < w.length) {
      val wi = w(i)
      w(i) -= g * c(i)
      c(i) -= g * wi
      i += 1
    }
  }
}
