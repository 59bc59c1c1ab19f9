package repro.nn

import scala.util.Random

/** Layer helpers over the autodiff ops: parameter containers + forward fns. */

/** Fully connected layer `act(X·W + b)`. */
final class Dense(inDim: Int, outDim: Int, act: String, rng: Random, name: String = "dense") {
  val w = new Param(Tensor.glorot(inDim, outDim, rng), s"$name.w")
  val b = new Param(Tensor.zeros(1, outDim), s"$name.b")

  def params: Seq[Param] = Seq(w, b)

  def forward(x: Node)(implicit t: Tape): Node = {
    val lin = Ad.addBias(Ad.matmul(x, Ad.leaf(w)), Ad.leaf(b))
    act match {
      case "relu"    => Ad.relu(lin)
      case "tanh"    => Ad.tanh(lin)
      case "sigmoid" => Ad.sigmoid(lin)
      case "linear"  => lin
      case other     => throw new IllegalArgumentException(s"unknown activation $other")
    }
  }
}

/** Multi-layer perceptron; hidden layers use ReLU, output is linear. */
final class Mlp(dims: Seq[Int], rng: Random, name: String = "mlp") {
  require(dims.length >= 2, "Mlp needs at least in/out dims")
  val layers: Seq[Dense] = dims.sliding(2).zipWithIndex.map { case (Seq(i, o), li) =>
    val act = if (li == dims.length - 2) "linear" else "relu"
    new Dense(i, o, act, rng, s"$name.$li")
  }.toSeq

  def params: Seq[Param] = layers.flatMap(_.params)
  def forward(x: Node)(implicit t: Tape): Node = layers.foldLeft(x)((h, l) => l.forward(h))
}

/** Multi-head self-attention encoder over T tokens per sample (used by the
  * TRMP ensemble stage). Input X is (B*T)×d sample-major; output same shape.
  */
final class MultiHeadAttention(dim: Int, heads: Int, rng: Random, name: String = "mha") {
  require(dim % heads == 0, s"dim $dim not divisible by heads $heads")
  private val dk = dim / heads
  val wq: Seq[Param] = (0 until heads).map(h => new Param(Tensor.glorot(dim, dk, rng), s"$name.q$h"))
  val wk: Seq[Param] = (0 until heads).map(h => new Param(Tensor.glorot(dim, dk, rng), s"$name.k$h"))
  val wv: Seq[Param] = (0 until heads).map(h => new Param(Tensor.glorot(dim, dk, rng), s"$name.v$h"))
  val wo = new Param(Tensor.glorot(dim, dim, rng), s"$name.o")

  def params: Seq[Param] = wq ++ wk ++ wv :+ wo

  def forward(x: Node, tokens: Int)(implicit t: Tape): Node = {
    val headOuts = (0 until heads).map { h =>
      val q = Ad.matmul(x, Ad.leaf(wq(h)))
      val k = Ad.matmul(x, Ad.leaf(wk(h)))
      val v = Ad.matmul(x, Ad.leaf(wv(h)))
      Ad.batchedAttention(q, k, v, tokens)
    }
    val cat = headOuts.reduceLeft((a, b) => Ad.concatCols(a, b))
    Ad.matmul(cat, Ad.leaf(wo))
  }
}
