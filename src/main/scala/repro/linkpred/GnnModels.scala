package repro.linkpred

import repro.gnn._
import repro.graph.EntityGraph
import repro.nn._
import repro.world.EntityWorld
import scala.util.Random

/** Shared bits for the GNN-based Table II baselines: full-batch Adam training
  * of an encoder plus a pair-scoring MLP head, then a frozen-embedding scorer.
  */
object GnnTraining {

  /** Pair-head input [z_u ‖ z_v ‖ z_u∘z_v]: the element-wise interaction term
    * lets the scoring MLP express similarity directly instead of having to
    * learn it from the raw concat — essential for convergence at our epoch
    * budgets. Still the "neural network g(·)" of the paper's eq. 2.
    */
  def pairInput(z: Node, us: Array[Int], vs: Array[Int])(implicit t: Tape): Node = {
    val zu = Ad.gatherRows(z, us)
    val zv = Ad.gatherRows(z, vs)
    Ad.concatCols(Ad.concatCols(zu, zv), Ad.hadamard(zu, zv))
  }

  /** Width of `pairInput` given embedding width `d`. */
  def pairInputDim(d: Int): Int = 3 * d

  /** Scores pairs through a trained MLP over pairInput (+ optional extras). */
  final class PairMlpScorer(z: Tensor, head: Mlp,
                            extra: Option[(Int, Int) => Array[Double]] = None) extends LinkScorer {
    def score(u: Int, v: Int): Double = {
      implicit val tape: Tape = new Tape
      val base = pairInput(Ad.const(z), Array(u), Array(v))
      val in = extra match {
        case Some(f) => Ad.concatCols(base, Ad.const(Tensor.rowVec(f(u, v))))
        case None    => base
      }
      1.0 / (1.0 + math.exp(-head.forward(in).v(0, 0)))
    }
  }

  /** log1p-squashed structural features of a pair on the train graph. */
  def structFeatures(g: EntityGraph)(u: Int, v: Int): Array[Double] = Array(
    math.log1p(g.commonNeighbors(u, v).toDouble),
    math.log1p(g.adamicAdar(u, v)),
    g.jaccard(u, v),
    math.log1p(g.degree(u).toDouble * g.degree(v)),
  )
}

/** GeniePath link predictor — the paper's backbone trained with only the BCE
  * prediction loss (eq. 2); also the encoder ALPC builds on.
  */
final class GeniePathLP(dim: Int = 32, layers: Int = 2, k: Int = 8,
                        epochs: Int = 40, lr: Double = 2e-2, seed: Long = 71L) extends LinkPredictor {
  val name = "Geniepath"
  def fit(data: LinkPredData): LinkScorer = {
    val rng = new Random(seed)
    val feats = Tensor.fromRows(data.features.toIndexedSeq)
    val enc = new GeniePathEncoder(feats.cols, dim, layers, k, rng)
    val head = new Mlp(Seq(GnnTraining.pairInputDim(enc.outDim), dim, 1), rng, "gp.head")
    val opt = new Adam(enc.params ++ head.params, lr)
    val us = data.trainPairs.map(_._1)
    val vs = data.trainPairs.map(_._2)
    val labels = data.trainLabels
    var e = 0
    while (e < epochs) {
      implicit val tape: Tape = new Tape
      val z = enc.forward(feats, data.trainGraph, new Random(seed + e))
      val s = head.forward(GnnTraining.pairInput(z, us, vs))
      val loss = Ad.bceWithLogits(s, labels)
      opt.zeroGrad(); tape.backward(loss); opt.step()
      e += 1
    }
    implicit val tape: Tape = new Tape
    val z = enc.forward(feats, data.trainGraph, new Random(seed - 1)).v
    new GnnTraining.PairMlpScorer(z, head)
  }
}

/** VGAE (Kipf & Welling, 2016): graph-conv encoder + inner-product decoder,
  * trained on edge reconstruction. We use the deterministic autoencoder
  * variant (no reparameterisation) — the KL term is irrelevant to ranking at
  * this scale and the decoder/objective are unchanged.
  */
final class Vgae(dim: Int = 32, layers: Int = 2, k: Int = 8,
                 epochs: Int = 40, lr: Double = 2e-2, seed: Long = 73L) extends LinkPredictor {
  val name = "VGAE"
  def fit(data: LinkPredData): LinkScorer = {
    val rng = new Random(seed)
    val feats = Tensor.fromRows(data.features.toIndexedSeq)
    val enc = new MeanSageEncoder(feats.cols, dim, layers, k, rng, finalAct = "linear")
    val opt = new Adam(enc.params, lr)
    val us = data.trainPairs.map(_._1)
    val vs = data.trainPairs.map(_._2)
    val labels = data.trainLabels
    var e = 0
    while (e < epochs) {
      implicit val tape: Tape = new Tape
      val z = enc.forward(feats, data.trainGraph, new Random(seed + e))
      val s = Ad.rowDot(Ad.gatherRows(z, us), Ad.gatherRows(z, vs))
      val loss = Ad.bceWithLogits(s, labels)
      opt.zeroGrad(); tape.backward(loss); opt.step()
      e += 1
    }
    implicit val tape: Tape = new Tape
    val z = enc.forward(feats, data.trainGraph, new Random(seed - 1)).v
    new LinkScorer {
      def score(u: Int, v: Int): Double = {
        var dot = 0.0
        var i = 0
        while (i < z.cols) { dot += z(u, i) * z(v, i); i += 1 }
        1.0 / (1.0 + math.exp(-dot))
      }
    }
  }
}

/** CompGCN (Vashishth et al., 2019) over the two candidate-edge relation
  * types (co-occurrence / semantic), `mult` composition, MLP pair head.
  */
final class CompGcnLP(dim: Int = 32, layers: Int = 2, k: Int = 8,
                      epochs: Int = 40, lr: Double = 2e-2, seed: Long = 79L) extends LinkPredictor {
  val name = "CompGCN"
  def fit(data: LinkPredData): LinkScorer = {
    val rng = new Random(seed)
    val feats = Tensor.fromRows(data.features.toIndexedSeq)
    val enc = new CompGcnEncoder(feats.cols, dim, layers, k, nRels = 2, rng)
    val head = new Mlp(Seq(GnnTraining.pairInputDim(enc.outDim), dim, 1), rng, "cgcn.head")
    val opt = new Adam(enc.params ++ head.params, lr)
    val us = data.trainPairs.map(_._1)
    val vs = data.trainPairs.map(_._2)
    val labels = data.trainLabels
    var e = 0
    while (e < epochs) {
      implicit val tape: Tape = new Tape
      val z = enc.forward(feats, data.trainGraph, new Random(seed + e))
      val s = head.forward(GnnTraining.pairInput(z, us, vs))
      val loss = Ad.bceWithLogits(s, labels)
      opt.zeroGrad(); tape.backward(loss); opt.step()
      e += 1
    }
    implicit val tape: Tape = new Tape
    val z = enc.forward(feats, data.trainGraph, new Random(seed - 1)).v
    new GnnTraining.PairMlpScorer(z, head)
  }
}

/** PaGNN (Yang et al., ECML-PKDD 2021) — reduced faithful variant: a sampled
  * GNN encoder plus an *interactive* pair head that sees the element-wise
  * interaction z_u∘z_v and pairwise structural signals (the broadcast/
  * aggregate interaction of the full model collapsed into pair features).
  */
final class PaGnn(dim: Int = 32, layers: Int = 2, k: Int = 8,
                  epochs: Int = 40, lr: Double = 2e-2, seed: Long = 83L) extends LinkPredictor {
  val name = "PaGNN"
  def fit(data: LinkPredData): LinkScorer = {
    val rng = new Random(seed)
    val feats = Tensor.fromRows(data.features.toIndexedSeq)
    val enc = new MeanSageEncoder(feats.cols, dim, layers, k, rng)
    val sf = GnnTraining.structFeatures(data.trainGraph) _
    val head = new Mlp(Seq(3 * dim + 4, dim, 1), rng, "pagnn.head")
    val opt = new Adam(enc.params ++ head.params, lr)
    val us = data.trainPairs.map(_._1)
    val vs = data.trainPairs.map(_._2)
    val labels = data.trainLabels
    val structT = Tensor.fromRows(data.trainPairs.toIndexedSeq.map { case (u, v) => sf(u, v) })
    var e = 0
    while (e < epochs) {
      implicit val tape: Tape = new Tape
      val z = enc.forward(feats, data.trainGraph, new Random(seed + e))
      val zu = Ad.gatherRows(z, us); val zv = Ad.gatherRows(z, vs)
      val in = Ad.concatCols(Ad.concatCols(Ad.concatCols(zu, zv), Ad.hadamard(zu, zv)), Ad.const(structT))
      val loss = Ad.bceWithLogits(head.forward(in), labels)
      opt.zeroGrad(); tape.backward(loss); opt.step()
      e += 1
    }
    val z = { implicit val tape: Tape = new Tape; enc.forward(feats, data.trainGraph, new Random(seed - 1)).v }
    new LinkScorer {
      def score(u: Int, v: Int): Double = {
        implicit val t2: Tape = new Tape
        val zu = Ad.const(Tensor.rowVec(z.row(u)))
        val zv = Ad.const(Tensor.rowVec(z.row(v)))
        val in = Ad.concatCols(Ad.concatCols(Ad.concatCols(zu, zv), Ad.hadamard(zu, zv)),
                               Ad.const(Tensor.rowVec(sf(u, v))))
        1.0 / (1.0 + math.exp(-head.forward(in).v(0, 0)))
      }
    }
  }
}

/** SEAL (Zhang & Chen, NeurIPS 2018) — reduced faithful variant: instead of
  * extracting an enclosing subgraph per link and running a DGCNN, we feed the
  * DRNL-motivated structural descriptors of the (1-hop) enclosing subgraph
  * (CN, AA, Jaccard, preferential attachment) together with raw feature
  * similarities to an MLP. Captures SEAL's "structure around the pair"
  * signal at a fraction of the cost.
  */
final class Seal(hidden: Int = 16, epochs: Int = 200, lr: Double = 2e-2, seed: Long = 89L) extends LinkPredictor {
  val name = "SEAL"

  private def pairFeatures(data: LinkPredData)(u: Int, v: Int): Array[Double] =
    GnnTraining.structFeatures(data.trainGraph)(u, v) ++ Array(
      EntityWorld.cosine(data.featSe(u), data.featSe(v)),
      EntityWorld.cosine(data.featCo(u), data.featCo(v)),
    )

  def fit(data: LinkPredData): LinkScorer = {
    val rng = new Random(seed)
    val pf = pairFeatures(data) _
    val head = new Mlp(Seq(6, hidden, 1), rng, "seal")
    val opt = new Adam(head.params, lr)
    val x = Tensor.fromRows(data.trainPairs.toIndexedSeq.map { case (u, v) => pf(u, v) })
    val labels = data.trainLabels
    var e = 0
    while (e < epochs) {
      implicit val tape: Tape = new Tape
      val loss = Ad.bceWithLogits(head.forward(Ad.const(x)), labels)
      opt.zeroGrad(); tape.backward(loss); opt.step()
      e += 1
    }
    new LinkScorer {
      def score(u: Int, v: Int): Double = {
        implicit val tape: Tape = new Tape
        1.0 / (1.0 + math.exp(-head.forward(Ad.const(Tensor.rowVec(pf(u, v)))).v(0, 0)))
      }
    }
  }
}
