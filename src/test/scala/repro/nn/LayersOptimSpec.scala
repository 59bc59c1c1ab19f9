package repro.nn

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class LayersOptimSpec extends AnyFunSuite {

  test("Dense forward shape and activation") {
    val rng = new Random(3)
    val d = new Dense(4, 3, "tanh", rng)
    implicit val tape: Tape = new Tape
    val out = d.forward(Ad.const(Tensor.glorot(5, 4, rng)))
    assert(out.v.rows == 5 && out.v.cols == 3)
    assert(out.v.data.forall(x => x >= -1 && x <= 1))
  }

  test("Dense rejects unknown activation") {
    val rng = new Random(3)
    val d = new Dense(2, 2, "swish", rng)
    implicit val tape: Tape = new Tape
    intercept[IllegalArgumentException](d.forward(Ad.const(Tensor.zeros(1, 2))))
  }

  test("MLP learns XOR with Adam") {
    val rng = new Random(5)
    val mlp = new Mlp(Seq(2, 8, 1), rng)
    val opt = new Adam(mlp.params, lr = 5e-2)
    val x = Tensor.fromRows(Seq(Array(0.0, 0.0), Array(0.0, 1.0), Array(1.0, 0.0), Array(1.0, 1.0)))
    val y = Array(0.0, 1.0, 1.0, 0.0)
    var lastLoss = Double.MaxValue
    (0 until 400).foreach { _ =>
      implicit val tape: Tape = new Tape
      val loss = Ad.bceWithLogits(mlp.forward(Ad.const(x)), y)
      opt.zeroGrad(); tape.backward(loss); opt.step()
      lastLoss = loss.v(0, 0)
    }
    assert(lastLoss < 0.1, s"XOR loss did not converge: $lastLoss")
    implicit val tape: Tape = new Tape
    val preds = mlp.forward(Ad.const(x)).v
    (0 until 4).foreach(i => assert((preds(i, 0) > 0) == (y(i) > 0.5), s"row $i misclassified"))
  }

  test("Adam decreases a quadratic loss monotonically-ish") {
    val p = new Param(Tensor.fill(1, 1, 5.0), "x")
    val opt = new Adam(Seq(p), lr = 0.1)
    val losses = (0 until 200).map { _ =>
      implicit val tape: Tape = new Tape
      val x = Ad.leaf(p)
      val loss = Ad.mean(Ad.hadamard(x, x))
      opt.zeroGrad(); tape.backward(loss); opt.step()
      loss.v(0, 0)
    }
    assert(losses.last < 1e-3, s"quadratic not minimised: ${losses.last}")
    assert(losses.head > losses.last)
  }

  test("gradient clipping bounds the applied update") {
    val p = new Param(Tensor.fill(1, 1, 0.0), "x")
    p.g.data(0) = 1e9
    val opt = new Adam(Seq(p), lr = 0.1, clipNorm = 1.0)
    opt.step()
    // after clipping, first Adam step magnitude ≈ lr
    assert(math.abs(p.v.data(0)) < 0.2)
  }

  test("MultiHeadAttention output shape and differentiability") {
    val rng = new Random(11)
    val mha = new MultiHeadAttention(dim = 8, heads = 2, rng)
    implicit val tape: Tape = new Tape
    val x = Ad.const(Tensor.glorot(6, 8, rng)) // B=2, T=3
    val out = mha.forward(x, tokens = 3)
    assert(out.v.rows == 6 && out.v.cols == 8)
    val loss = Ad.mean(Ad.hadamard(out, out))
    tape.backward(loss)
    assert(mha.params.exists(p => p.g.frobenius > 0), "no gradient reached MHA params")
  }

  test("MultiHeadAttention requires dim divisible by heads") {
    intercept[IllegalArgumentException](new MultiHeadAttention(7, 2, new Random(1)))
  }

  test("attention within one sample ignores other samples") {
    // two identical samples plus a third wildly different one: outputs of the
    // first two must match exactly since attention never crosses samples
    val rng = new Random(13)
    val mha = new MultiHeadAttention(4, 1, rng)
    val sample = Array.fill(2)(Array.fill(4)(rng.nextDouble()))
    val wild = Array.fill(2)(Array.fill(4)(rng.nextDouble() * 100))
    implicit val tape: Tape = new Tape
    val x1 = Tensor.fromRows(sample.toIndexedSeq ++ sample.toIndexedSeq ++ wild.toIndexedSeq)
    val out = mha.forward(Ad.const(x1), tokens = 2).v
    (0 until 2).foreach { r =>
      (0 until 4).foreach { c =>
        assert(math.abs(out(r, c) - out(r + 2, c)) < 1e-12)
      }
    }
  }
}
