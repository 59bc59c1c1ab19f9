package repro.core

import repro.linkpred.{LinkPredData, LinkScorer}
import repro.nn._
import scala.util.Random

/** TRMP Stage III — the ensemble (paper §III-B3).
  *
  * Entity embeddings extracted from several weekly ALPC models are
  * concatenated (eq. 6): the pair sample (u,v) becomes the token sequence
  * [z_u^{t1} … z_u^{tW}, z_v^{t1} … z_v^{tW}], encoded by a multi-head
  * attention encoder, flattened, and classified by an MLP under cross
  * entropy. The fused per-entity embedding h_e (the weekly concat) is what
  * the user-preference module consumes.
  */
final case class EnsembleConfig(heads: Int = 2, epochs: Int = 30, lr: Double = 2e-2,
                                maxTrainPairs: Int = 6000, acceptMargin: Double = 0.75,
                                seed: Long = 101L)

final class EnsembleScorer(weekly: Seq[Tensor], mha: MultiHeadAttention, head: Mlp,
                           tokensPerPair: Int, structF: (Int, Int) => Array[Double],
                           acceptMargin: Double) extends LinkScorer {
  private val dim = weekly.head.cols

  /** Fused embedding h_e: the concatenation of the weekly z_e (eq. 6). */
  def fusedEmbedding(e: Int): Array[Double] = weekly.flatMap(_.row(e)).toArray

  private def logit(u: Int, v: Int): Double = {
    implicit val tape: Tape = new Tape
    val tokens = (weekly.map(z => z.row(u)) ++ weekly.map(z => z.row(v))).toIndexedSeq
    val x = Ad.const(Tensor.fromRows(tokens))
    val structT = Tensor.fromRows(Seq(structF(u, v)))
    head.forward(Ensemble.headInput(mha, x, 1, tokensPerPair, dim, structT)).v(0, 0)
  }

  def score(u: Int, v: Int): Double = 1.0 / (1.0 + math.exp(-logit(u, v)))
  def accept(u: Int, v: Int): Boolean = logit(u, v) > acceptMargin
}

object Ensemble {

  /** Head input for a batch: attended tokens flattened ‖ raw tokens flattened
    * (residual skip past the randomly-initialised attention) ‖ per-week
    * u∘v interactions (the similarity term the classifier actually needs —
    * same trick as GnnTraining.pairInput).
    */
  private[core] def headInput(mha: MultiHeadAttention, x: Node, batch: Int,
                              tokens: Int, dim: Int, struct: Tensor)(implicit tape: Tape): Node = {
    val w = tokens / 2
    val enc = mha.forward(x, tokens)
    val uIdx = Array.tabulate(batch * w)(i => (i / w) * tokens + (i % w))
    val vIdx = Array.tabulate(batch * w)(i => (i / w) * tokens + w + (i % w))
    val inter = Ad.reshape(
      Ad.hadamard(Ad.gatherRows(x, uIdx), Ad.gatherRows(x, vIdx)), batch, w * dim)
    Ad.concatCols(Ad.concatCols(
      Ad.concatCols(Ad.reshape(enc, batch, tokens * dim), Ad.reshape(x, batch, tokens * dim)),
      inter), Ad.const(struct))
  }

  /** Width of `headInput` for `tokens` tokens of width `dim` (+4 struct). */
  private[core] def headInputDim(tokens: Int, dim: Int): Int = (2 * tokens + tokens / 2) * dim + 4

  /** Trains the ensemble over `weeklyZ` (one embedding matrix per weekly ALPC
    * model; all n×dim) using the given split's train pairs/labels.
    */
  def fit(weeklyZ: Seq[Tensor], data: LinkPredData, cfg: EnsembleConfig = EnsembleConfig()): EnsembleScorer = {
    require(weeklyZ.nonEmpty, "ensemble needs at least one weekly model")
    val dim = weeklyZ.head.cols
    require(weeklyZ.forall(z => z.cols == dim), "weekly embedding dims differ")
    val w = weeklyZ.length
    val tokens = 2 * w
    val rng = new Random(cfg.seed)
    val mha = new MultiHeadAttention(dim, cfg.heads, rng, "ens.mha")
    val head = new Mlp(Seq(headInputDim(tokens, dim), dim, 1), rng, "ens.head")
    val opt = new Adam(mha.params ++ head.params, cfg.lr)

    // class-balanced training pairs (the 0.5 accept cut assumes a balanced
    // prior; the raw 1:3 ratio would bias the classifier toward rejecting
    // every relation), capped so ensemble cost stays bounded at bench scale
    val balanced = data.trainPos.map((_, 1.0)) ++
      data.trainNeg.take(data.trainPos.length).map((_, 0.0))
    val sampled = if (balanced.length <= cfg.maxTrainPairs) balanced
                  else rng.shuffle(balanced.toIndexedSeq).take(cfg.maxTrainPairs).toArray
    val pairs = sampled.map(_._1)
    val labels = sampled.map(_._2)

    val xRows = pairs.toIndexedSeq.flatMap { case (u, v) =>
      weeklyZ.map(z => z.row(u)) ++ weeklyZ.map(z => z.row(v))
    }
    val x = Tensor.fromRows(xRows)
    val sf = repro.linkpred.GnnTraining.structFeatures(data.trainGraph) _
    val structT = Tensor.fromRows(pairs.toIndexedSeq.map { case (u, v) => sf(u, v) })

    var e = 0
    while (e < cfg.epochs) {
      implicit val tape: Tape = new Tape
      val in = headInput(mha, Ad.const(x), pairs.length, tokens, dim, structT)
      val loss = Ad.bceWithLogits(head.forward(in), labels)
      opt.zeroGrad(); tape.backward(loss); opt.step()
      e += 1
    }
    new EnsembleScorer(weeklyZ, mha, head, tokens, sf, cfg.acceptMargin)
  }
}
