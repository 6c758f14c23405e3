package repro.opt

import org.scalatest.funsuite.AnyFunSuite

/** The hand-rolled MLP under DDPG: backprop must agree with numerical
  * gradients for both parameters and inputs, and training must converge.
  */
class MlpSpec extends AnyFunSuite {

  test("parameter gradients agree with finite differences") {
    val net = new Mlp(Array(3, 5, 1), outTanh = false, seed = 1)
    val x = Array(0.3, -0.2, 0.8)
    def loss(): Double = { val o = net(x)(0); 0.5 * o * o }

    val (gw, gb) = net.zeroGrads()
    val tr = net.forward(x)
    net.backward(tr, Array(tr.output(0)), gw, gb) // dL/do = o
    val eps = 1e-6
    for (l <- net.w.indices; i <- net.w(l).indices; j <- net.w(l)(i).indices) {
      val orig = net.w(l)(i)(j)
      net.w(l)(i)(j) = orig + eps; val up = loss()
      net.w(l)(i)(j) = orig - eps; val dn = loss()
      net.w(l)(i)(j) = orig
      val num = (up - dn) / (2 * eps)
      assert(math.abs(num - gw(l)(i)(j)) < 1e-5, s"w($l)($i)($j): $num vs ${gw(l)(i)(j)}")
    }
  }

  test("input gradients agree with finite differences") {
    val net = new Mlp(Array(2, 4, 1), outTanh = false, seed = 2)
    val x = Array(0.1, -0.5)
    def loss(p: Array[Double]): Double = { val o = net(p)(0); 0.5 * o * o }
    val (gw, gb) = net.zeroGrads()
    val tr = net.forward(x)
    val gIn = net.backward(tr, Array(tr.output(0)), gw, gb)
    val eps = 1e-6
    for (i <- x.indices) {
      val up = loss(x.updated(i, x(i) + eps))
      val dn = loss(x.updated(i, x(i) - eps))
      val num = (up - dn) / (2 * eps)
      assert(math.abs(num - gIn(i)) < 1e-5)
    }
  }

  test("Adam training fits a small regression target") {
    val net = new Mlp(Array(2, 16, 1), outTanh = false, seed = 3)
    val rnd = new scala.util.Random(4)
    val data = Array.fill(64)(Array(rnd.nextDouble() * 2 - 1, rnd.nextDouble() * 2 - 1))
    def target(p: Array[Double]) = 0.5 * p(0) - 0.3 * p(1)
    for (_ <- 0 until 400) {
      val (gw, gb) = net.zeroGrads()
      for (p <- data) {
        val tr = net.forward(p)
        net.backward(tr, Array(2.0 * (tr.output(0) - target(p)) / data.length), gw, gb)
      }
      net.adamStep(gw, gb, 1e-2)
    }
    val mse = data.map(p => math.pow(net(p)(0) - target(p), 2)).sum / data.length
    assert(mse < 1e-3, s"mse=$mse")
  }

  test("tanh output head bounds actions to [-1, 1]") {
    val net = new Mlp(Array(3, 8, 2), outTanh = true, seed = 5)
    val rnd = new scala.util.Random(6)
    for (_ <- 0 until 50) {
      val o = net(Array.fill(3)(rnd.nextDouble() * 10 - 5))
      assert(o.forall(v => v >= -1 && v <= 1))
    }
  }

  test("soft target update moves weights by tau toward the source") {
    val a = new Mlp(Array(2, 3, 1), outTanh = false, seed = 7)
    val b = new Mlp(Array(2, 3, 1), outTanh = false, seed = 8)
    val before = b.w(0)(0)(0)
    val src = a.w(0)(0)(0)
    b.softUpdateFrom(a, 0.1)
    assert(math.abs(b.w(0)(0)(0) - (0.1 * src + 0.9 * before)) < 1e-12)
    b.copyFrom(a)
    assert(b.w(0)(0)(0) == a.w(0)(0)(0))
  }

  test("parameter count matches the architecture") {
    val net = new Mlp(Array(4, 8, 2), outTanh = true, seed = 9)
    assert(net.paramCount == 4 * 8 + 8 + 8 * 2 + 2)
  }
}
