package repro.linkpred

/** A fitted model scoring entity pairs; scores live in [0,1]. */
trait LinkScorer {
  def score(u: Int, v: Int): Double
  def scoreAll(pairs: Array[(Int, Int)]): Array[Double] = pairs.map { case (u, v) => score(u, v) }
}

/** A trainable link-prediction method (one Table II row). */
trait LinkPredictor {
  def name: String
  def fit(data: LinkPredData): LinkScorer
}

/** 1-D logistic calibration s ↦ σ(a·s + b), fit by gradient descent on the
  * training pairs. Gives embedding methods (dot-product scores on ℝ) a
  * probability-scale output comparable with the GNNs' sigmoid heads.
  */
object Calibration {
  def fit(raw: Array[Double], labels: Array[Double], iters: Int = 300, lr: Double = 0.5): (Double, Double) = {
    var a = 1.0; var b = 0.0
    val n = raw.length
    var it = 0
    while (it < iters) {
      var ga = 0.0; var gb = 0.0
      var i = 0
      while (i < n) {
        val p = 1.0 / (1.0 + math.exp(-(a * raw(i) + b)))
        val d = p - labels(i)
        ga += d * raw(i); gb += d
        i += 1
      }
      a -= lr * ga / n; b -= lr * gb / n
      it += 1
    }
    (a, b)
  }

  def apply(a: Double, b: Double, s: Double): Double = 1.0 / (1.0 + math.exp(-(a * s + b)))
}
