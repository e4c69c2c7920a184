package repro.ml

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class MLPSpec extends AnyFunSuite {

  test("outputs are sigmoid-bounded in (0, 1)") {
    val net = new MLP(Array(4, 8, 8, 1), seed = 1)
    val rnd = new Random(2)
    for (_ <- 1 to 50) {
      val o = net.output(Array.fill(4)(rnd.nextGaussian() * 5))
      assert(o > 0.0 && o < 1.0)
    }
  }

  test("forward returns activations for every layer") {
    val net = new MLP(Array(3, 5, 1), seed = 3)
    val acts = net.forward(Array(1.0, 2.0, 3.0))
    assert(acts.length == 3)
    assert(acts(0).length == 3 && acts(1).length == 5 && acts(2).length == 1)
  }

  test("wrong input dimension rejected") {
    val net = new MLP(Array(3, 1), seed = 4)
    intercept[IllegalArgumentException](net.forward(Array(1.0)))
  }

  test("zeroGrads mirrors parameter shapes") {
    val net = new MLP(Array(4, 8, 8, 1), seed = 5)
    val g = net.zeroGrads()
    assert(g.length == net.params.length)
    g.zip(net.params).foreach { case (a, b) => assert(a.length == b.length) }
    assert(g.forall(_.forall(_ == 0.0)))
  }

  test("deterministic initialization per seed") {
    val a = new MLP(Array(3, 4, 1), seed = 7).params.map(_.toSeq).toSeq
    val b = new MLP(Array(3, 4, 1), seed = 7).params.map(_.toSeq).toSeq
    val c = new MLP(Array(3, 4, 1), seed = 8).params.map(_.toSeq).toSeq
    assert(a == b)
    assert(a != c)
  }

  test("backward gradient matches numeric differentiation") {
    val net = new MLP(Array(3, 4, 2, 1), seed = 9)
    val rnd = new Random(10)
    val x = Array.fill(3)(rnd.nextGaussian())
    // loss L = output (dOut = 1): gradient of params w.r.t. output value
    val grads = net.zeroGrads()
    val acts = net.forward(x)
    net.backward(acts, Array(1.0), grads)
    val eps = 1e-6
    for (a <- net.params.indices; i <- 0 until math.min(net.params(a).length, 10)) {
      val orig = net.params(a)(i)
      net.params(a)(i) = orig + eps
      val up = net.output(x)
      net.params(a)(i) = orig - eps
      val down = net.output(x)
      net.params(a)(i) = orig
      val numeric = (up - down) / (2 * eps)
      assert(math.abs(numeric - grads(a)(i)) < 1e-5,
        s"param block $a index $i: numeric=$numeric analytic=${grads(a)(i)}")
    }
  }

  test("backward accumulates across calls") {
    val net = new MLP(Array(2, 3, 1), seed = 11)
    val x = Array(0.5, -1.0)
    val g1 = net.zeroGrads()
    net.backward(net.forward(x), Array(1.0), g1)
    val g2 = net.zeroGrads()
    net.backward(net.forward(x), Array(1.0), g2)
    net.backward(net.forward(x), Array(1.0), g2)
    for (a <- g1.indices; i <- g1(a).indices) {
      assert(math.abs(g2(a)(i) - 2 * g1(a)(i)) < 1e-12)
    }
  }

  test("single-layer network with one output behaves like logistic regression") {
    val net = new MLP(Array(2, 1), seed = 12)
    val o = net.output(Array(0.0, 0.0))
    // zero input → sigmoid(bias) = sigmoid(0) = 0.5
    assert(math.abs(o - 0.5) < 1e-12)
  }

  // ---- Adam ----

  test("Adam minimizes a quadratic") {
    // minimize (p - 3)^2 via grad = 2(p - 3)
    val params = Array(Array(0.0))
    val adam = new Adam(Array(1), lr = 0.1)
    for (_ <- 1 to 500) {
      val g = Array(Array(2 * (params(0)(0) - 3.0)))
      adam.step(params, g)
    }
    assert(math.abs(params(0)(0) - 3.0) < 1e-3)
  }

  test("Adam handles multi-block parameters") {
    val params = Array(Array(5.0, -5.0), Array(1.0))
    val adam = new Adam(Array(2, 1), lr = 0.05)
    for (_ <- 1 to 2000) {
      val g = Array(Array(2 * params(0)(0), 2 * params(0)(1)), Array(2 * params(1)(0)))
      adam.step(params, g)
    }
    assert(params.flatten.forall(v => math.abs(v) < 1e-2))
  }

  test("Adam training reduces MLP loss on a toy classification task") {
    val net = new MLP(Array(2, 8, 1), seed = 13)
    val adam = new Adam(net, lr = 0.05)
    val rnd = new Random(14)
    val data = Array.fill(200) {
      val x = Array(rnd.nextGaussian(), rnd.nextGaussian())
      (x, if (x(0) + x(1) > 0) 1.0 else 0.0)
    }
    def loss(): Double = data.map { case (x, y) =>
      val o = net.output(x); -(y * math.log(o + 1e-12) + (1 - y) * math.log(1 - o + 1e-12))
    }.sum / data.length
    val before = loss()
    for (_ <- 1 to 100) {
      val grads = net.zeroGrads()
      for ((x, y) <- data) {
        val acts = net.forward(x)
        val o = acts(net.nLayers)(0)
        // d(-ylog(o)-(1-y)log(1-o))/do = (o-y)/(o(1-o))
        net.backward(acts, Array((o - y) / (o * (1 - o) + 1e-12)), grads)
      }
      grads.foreach(g => (0 until g.length).foreach(i => g(i) /= data.length))
      adam.step(net.params, grads)
    }
    val after = loss()
    assert(after < before * 0.5, s"before=$before after=$after")
  }
}
