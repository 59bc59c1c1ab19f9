package repro.core

import repro.gnn.GeniePathEncoder
import repro.linkpred._
import repro.nn._
import repro.world.EntityWorld
import scala.util.Random

/** ALPC — Adaptive-threshold Link Prediction with Contrastive learning
  * (paper §III-B2), the ranking-stage model of TRMP.
  *
  * GeniePath encoder over the candidate graph with `[e^Se, e^Co]` features,
  * three joint objectives:
  *   - `L_pred`: BCE over the pair-scoring MLP `g([z_u ‖ z_v])` (eq. 2);
  *   - `L_th`:   per-source adaptive threshold ε_u = MLP(z_u), BCE on
  *               σ(s_uv − ε_u) (eq. 3);
  *   - `L_cl`:   InfoNCE over semantic anchor pairs ⟨e, e⁺⟩ with in-batch
  *               negatives (eq. 4);
  * total `L = L_pred + α·L_th + β·L_cl`, α = β = 1 (eq. 5).
  *
  * The ablations of Table II are flags: `useThreshold=false` → ALPC_th-,
  * `useContrastive=false` → ALPC_cl-.
  */
final case class AlpcConfig(
    dim: Int = 32,
    layers: Int = 2,
    k: Int = 8,
    epochs: Int = 40,
    lr: Double = 2e-2,
    alpha: Double = 1.0,
    beta: Double = 1.0,
    tau: Double = 0.2,
    /** semantic-cosine cut for forming ⟨e, e⁺⟩ anchor pairs */
    semAnchorThreshold: Double = 0.80,
    contrastBatch: Int = 128,
    /** logit-units margin for relation acceptance: keep iff s_uv − ε_u >
      * margin. The paper's threshold task is explicitly trained to "enlarge
      * the margin between prediction score s and threshold ε"; the published
      * graph keeps only relations clearing it.
      */
    acceptMargin: Double = 0.75,
    useThreshold: Boolean = true,
    useContrastive: Boolean = true,
    seed: Long = 97L,
)

/** The fitted model: frozen embeddings + heads. `score` is σ(s_uv) (AUC
  * metric); `acceptAdaptive` applies the per-source threshold (relation
  * truncation, the thing ACC measures).
  *
  * The pair head additionally sees the structural descriptors of the pair on
  * the train graph (CN/AA/Jaccard/PA): neighbourhood-overlap evidence is what
  * separates spurious candidate edges from real relations, and at our graph
  * sizes the GNN cannot reliably learn it from edge labels alone.
  */
final class AlpcScorer(val z: Tensor, head: Mlp, thHead: Option[Mlp],
                       structF: (Int, Int) => Array[Double],
                       acceptMargin: Double = 0.75) extends LinkScorer {

  private def logit(u: Int, v: Int): Double = {
    implicit val tape: Tape = new Tape
    val in = Ad.concatCols(
      GnnTraining.pairInput(Ad.const(z), Array(u), Array(v)),
      Ad.const(Tensor.rowVec(structF(u, v))))
    head.forward(in).v(0, 0)
  }

  def score(u: Int, v: Int): Double = 1.0 / (1.0 + math.exp(-logit(u, v)))

  /** The learned per-source-entity threshold ε_u (0 when the head is off). */
  def thresholdOf(u: Int): Double = thHead match {
    case Some(mlp) =>
      implicit val tape: Tape = new Tape
      mlp.forward(Ad.const(Tensor.rowVec(z.row(u)))).v(0, 0)
    case None => 0.0
  }

  /** Paper's truncation rule with margin: keep (u,v) iff s_uv − ε_u > margin. */
  def acceptAdaptive(u: Int, v: Int): Boolean = logit(u, v) - thresholdOf(u) > acceptMargin

  def embeddingOf(u: Int): Array[Double] = z.row(u)
}

final class Alpc(cfg: AlpcConfig = AlpcConfig()) extends LinkPredictor {
  val name: String =
    if (!cfg.useThreshold) "ALPC_th-" else if (!cfg.useContrastive) "ALPC_cl-" else "ALPC"

  /** Anchor pairs ⟨e, e⁺⟩: correlated (train-graph) pairs whose semantic
    * similarity clears the threshold; falls back to the top decile if the
    * absolute cut is too strict for the dataset.
    */
  private[core] def semanticAnchors(data: LinkPredData): Array[(Int, Int)] = {
    val withSim = data.trainPos.map { case (u, v) =>
      (u, v, EntityWorld.cosine(data.featSe(u), data.featSe(v)))
    }
    val strict = withSim.filter(_._3 >= cfg.semAnchorThreshold)
    val chosen =
      if (strict.length >= cfg.contrastBatch) strict
      else withSim.sortBy(-_._3).take(math.max(cfg.contrastBatch, withSim.length / 10))
    chosen.map { case (u, v, _) => (u, v) }
  }

  def fit(data: LinkPredData): AlpcScorer = {
    val rng = new Random(cfg.seed)
    val feats = Tensor.fromRows(data.features.toIndexedSeq)
    val enc = new GeniePathEncoder(feats.cols, cfg.dim, cfg.layers, cfg.k, rng)
    val sf = GnnTraining.structFeatures(data.trainGraph) _
    val head = new Mlp(Seq(GnnTraining.pairInputDim(enc.outDim) + 4, cfg.dim, 1), rng, "alpc.head")
    val thHead = new Mlp(Seq(enc.outDim, cfg.dim / 2, 1), rng, "alpc.th")
    val params = enc.params ++ head.params ++ (if (cfg.useThreshold) thHead.params else Seq.empty)
    val opt = new Adam(params, cfg.lr)

    val us = data.trainPairs.map(_._1)
    val vs = data.trainPairs.map(_._2)
    val labels = data.trainLabels
    val anchors = if (cfg.useContrastive) semanticAnchors(data) else Array.empty[(Int, Int)]

    // The threshold task sees a class-BALANCED pair set: with the 1:3
    // train ratio the negatives' gradient dominates and pushes every ε_u
    // above most true relations' scores — the truncated graph collapses.
    // ε is supposed to sit between each source's positive and negative
    // score modes (paper Fig. 5a), which balanced supervision gives.
    val thPairs = data.trainPos ++ data.trainNeg.take(data.trainPos.length)
    val thUs = thPairs.map(_._1)
    val thVs = thPairs.map(_._2)
    val thLabels = Array.fill(data.trainPos.length)(1.0) ++
      Array.fill(thPairs.length - data.trainPos.length)(0.0)

    val structTrain = Tensor.fromRows(data.trainPairs.toIndexedSeq.map { case (u, v) => sf(u, v) })
    val structTh = Tensor.fromRows(thPairs.toIndexedSeq.map { case (u, v) => sf(u, v) })
    def headIn(z: Node, us: Array[Int], vs: Array[Int], struct: Tensor)(implicit t: Tape): Node =
      Ad.concatCols(GnnTraining.pairInput(z, us, vs), Ad.const(struct))

    var e = 0
    while (e < cfg.epochs) {
      implicit val tape: Tape = new Tape
      val epochRng = new Random(cfg.seed + e)
      val z = enc.forward(feats, data.trainGraph, epochRng)
      val s = head.forward(headIn(z, us, vs, structTrain))
      var loss = Ad.bceWithLogits(s, labels)

      if (cfg.useThreshold) {
        val sTh = head.forward(headIn(z, thUs, thVs, structTh))
        val eps = thHead.forward(Ad.gatherRows(z, thUs))
        val lTh = Ad.bceWithLogits(Ad.sub(sTh, eps), thLabels)
        loss = Ad.add(loss, Ad.scale(lTh, cfg.alpha))
      }

      if (cfg.useContrastive && anchors.nonEmpty) {
        val batch = Array.fill(math.min(cfg.contrastBatch, anchors.length)) {
          anchors(epochRng.nextInt(anchors.length))
        }
        val za = Ad.gatherRows(z, batch.map(_._1))
        val zp = Ad.gatherRows(z, batch.map(_._2))
        val logits = Ad.scale(Ad.matmul(za, Ad.transpose(zp)), 1.0 / cfg.tau)
        loss = Ad.add(loss, Ad.scale(Ad.infoNceDiag(logits), cfg.beta))
      }

      opt.zeroGrad(); tape.backward(loss); opt.step()
      e += 1
    }

    // inference embeddings: average several stochastic forwards so the frozen
    // z is not hostage to one neighbour sample (absolute cuts like ε are
    // sensitive to that shift even though rankings are not)
    val z = {
      val samples = (1 to 3).map { i =>
        val t: Tape = new Tape
        enc.forward(feats, data.trainGraph, new Random(cfg.seed - i))(t).v
      }
      val acc = samples.head.copy()
      samples.tail.foreach(acc.addInPlace)
      acc.scaleInPlace(1.0 / samples.length)
      acc
    }
    new AlpcScorer(z, head, if (cfg.useThreshold) Some(thHead) else None, sf, cfg.acceptMargin)
  }
}
