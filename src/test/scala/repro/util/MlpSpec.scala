package repro.util

import org.scalatest.funsuite.AnyFunSuite

class MlpSpec extends AnyFunSuite {

  test("predict returns a probability distribution") {
    val net = new Mlp(Array(4, 16, 8, 3))
    val p = net.predict(Array(0.1, 0.2, 0.3, 0.4))
    assert(p.length == 3)
    assert(math.abs(p.sum - 1.0) < 1e-9)
    assert(p.forall(v => v >= 0 && v <= 1))
  }

  test("prediction is deterministic in the seed") {
    val a = new Mlp(Array(3, 16, 8, 2), seed = 5).predict(Array(1.0, 2.0, 3.0))
    val b = new Mlp(Array(3, 16, 8, 2), seed = 5).predict(Array(1.0, 2.0, 3.0))
    assert(a.sameElements(b))
  }

  test("different seeds give different nets") {
    val a = new Mlp(Array(3, 16, 8, 2), seed = 5).predict(Array(1.0, 2.0, 3.0))
    val b = new Mlp(Array(3, 16, 8, 2), seed = 6).predict(Array(1.0, 2.0, 3.0))
    assert(!a.sameElements(b))
  }

  test("backprop gradient matches finite differences (loss decreases along step)") {
    // A coarse but effective check: a single SGD step on one example must
    // reduce that example's loss for a small learning rate.
    val rng = new scala.util.Random(3)
    for (trial <- 0 until 10) {
      val net = new Mlp(Array(5, 16, 8, 4), seed = trial)
      val x = Array.fill(5)(rng.nextDouble())
      val y = {
        val raw = Array.fill(4)(rng.nextDouble())
        val s = raw.sum; raw.map(_ / s)
      }
      val before = net.loss(x, y)
      net.step(x, y, lr = 0.01)
      val after = net.loss(x, y)
      assert(after < before + 1e-12, s"trial $trial: $before -> $after")
    }
  }

  test("step returns the pre-update loss") {
    val net  = new Mlp(Array(2, 16, 8, 2), seed = 1)
    val x = Array(0.3, 0.7); val y = Array(1.0, 0.0)
    val l0 = net.loss(x, y)
    val reported = net.step(x, y, 0.001)
    assert(math.abs(l0 - reported) < 1e-9)
  }

  test("learns a separable mapping") {
    // Two input modes map to two distinct target histograms.
    val net = new Mlp(Array(2, 16, 8, 2), seed = 9)
    val data = (0 until 200).map { i =>
      if (i % 2 == 0) (Array(1.0, 0.0), Array(0.9, 0.1))
      else (Array(0.0, 1.0), Array(0.1, 0.9))
    }
    net.fit(data, epochs = 60, lr = 0.1)
    val pA = net.predict(Array(1.0, 0.0))
    val pB = net.predict(Array(0.0, 1.0))
    assert(pA(0) > 0.7, s"pA=${pA.toList}")
    assert(pB(1) > 0.7, s"pB=${pB.toList}")
  }

  test("fit returns a finite validation loss and handles empty data") {
    val net = new Mlp(Array(2, 4, 2))
    assert(net.fit(Nil).isNaN)
    val v = net.fit(Seq((Array(1.0, 0.0), Array(0.5, 0.5)),
                        (Array(0.0, 1.0), Array(0.5, 0.5))), epochs = 2)
    assert(!v.isNaN && v >= 0)
  }
}
