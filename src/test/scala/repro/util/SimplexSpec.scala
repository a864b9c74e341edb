package repro.util

import org.scalatest.funsuite.AnyFunSuite
import repro.util.Simplex._

class SimplexSpec extends AnyFunSuite {

  private def solve(c: Array[Double], cons: (Array[Double], Rel, Double)*) =
    Simplex.maximize(c, cons.map { case (a, r, b) => Constraint(a, r, b) })

  test("1-var trivial LP: max x s.t. x <= 5") {
    val r = solve(Array(1.0), (Array(1.0), Le, 5.0))
    assert(r.status == Optimal)
    assert(math.abs(r.objective - 5.0) < 1e-9)
    assert(math.abs(r.x(0) - 5.0) < 1e-9)
  }

  test("2-var textbook LP") {
    // max 3x + 5y s.t. x <= 4, 2y <= 12, 3x + 2y <= 18 → x=2, y=6, obj=36
    val r = solve(Array(3.0, 5.0),
      (Array(1.0, 0.0), Le, 4.0),
      (Array(0.0, 2.0), Le, 12.0),
      (Array(3.0, 2.0), Le, 18.0))
    assert(r.status == Optimal)
    assert(math.abs(r.objective - 36.0) < 1e-7)
    assert(math.abs(r.x(0) - 2.0) < 1e-7)
    assert(math.abs(r.x(1) - 6.0) < 1e-7)
  }

  test("equality constraint: max x+2y s.t. x+y = 3, y <= 2") {
    val r = solve(Array(1.0, 2.0),
      (Array(1.0, 1.0), Eq, 3.0),
      (Array(0.0, 1.0), Le, 2.0))
    assert(r.status == Optimal)
    assert(math.abs(r.objective - 5.0) < 1e-7) // x=1, y=2
  }

  test("ge constraint: min-like via max of negative") {
    // max -x s.t. x >= 2 → x = 2
    val r = solve(Array(-1.0), (Array(1.0), Ge, 2.0))
    assert(r.status == Optimal)
    assert(math.abs(r.x(0) - 2.0) < 1e-7)
  }

  test("infeasible LP is detected") {
    val r = solve(Array(1.0), (Array(1.0), Le, 1.0), (Array(1.0), Ge, 2.0))
    assert(r.status == Infeasible)
  }

  test("unbounded LP is detected") {
    val r = solve(Array(1.0), (Array(-1.0), Le, 1.0))
    assert(r.status == Unbounded)
  }

  test("negative rhs rows are normalized") {
    // x >= 1 expressed as -x <= -1; max -x → x=1
    val r = solve(Array(-1.0), (Array(-1.0), Le, -1.0))
    assert(r.status == Optimal)
    assert(math.abs(r.x(0) - 1.0) < 1e-7)
  }

  test("degenerate LP does not cycle (Bland)") {
    // Classic degeneracy example still terminates at the optimum.
    val r = solve(Array(10.0, -57.0, -9.0, -24.0),
      (Array(0.5, -5.5, -2.5, 9.0), Le, 0.0),
      (Array(0.5, -1.5, -0.5, 1.0), Le, 0.0),
      (Array(1.0, 0.0, 0.0, 0.0), Le, 1.0))
    assert(r.status == Optimal)
    assert(math.abs(r.objective - 1.0) < 1e-6)
  }

  test("zero-budget knob-plan-shaped LP picks only the free option") {
    // 2 categories × 2 configs; cost of config 0 is 0, config 1 is 1.
    // Budget 0 forces alpha on config 0 in both categories.
    val c = Array(0.2, 1.0, 0.3, 1.0) // qualities weighted by r=0.5 later
    val budget = Array(0.0, 0.5, 0.0, 0.5)
    val r = solve(c,
      (budget, Le, 0.0),
      (Array(1.0, 1.0, 0.0, 0.0), Eq, 1.0),
      (Array(0.0, 0.0, 1.0, 1.0), Eq, 1.0))
    assert(r.status == Optimal)
    assert(math.abs(r.x(0) - 1.0) < 1e-7)
    assert(math.abs(r.x(2) - 1.0) < 1e-7)
  }

  test("fractional multiple-choice knapsack matches greedy oracle on random instances") {
    val rng = new scala.util.Random(1234)
    for (trial <- 0 until 25) {
      val nC = 1 + rng.nextInt(3)
      val nK = 2 + rng.nextInt(4)
      val qual = Array.fill(nC, nK)(rng.nextDouble())
      val cost = Array.fill(nC, nK)(rng.nextDouble() * 10)
      // Make index 0 free so the instance is always feasible.
      for (c <- 0 until nC) cost(c)(0) = 0.0
      val rFreq = Array.fill(nC)(rng.nextDouble() + 0.1)
      val rSum = rFreq.sum
      for (c <- 0 until nC) rFreq(c) /= rSum
      val budget = rng.nextDouble() * 5

      val nVars = nC * nK
      val obj = Array.tabulate(nVars)(i => rFreq(i / nK) * qual(i / nK)(i % nK))
      val bRow = Array.tabulate(nVars)(i => rFreq(i / nK) * cost(i / nK)(i % nK))
      val cons = Seq(Constraint(bRow, Le, budget)) ++
        (0 until nC).map { c =>
          Constraint(Array.tabulate(nVars)(i => if (i / nK == c) 1.0 else 0.0), Eq, 1.0)
        }
      val lp = Simplex.maximize(obj, cons)
      assert(lp.status == Optimal, s"trial $trial not optimal")

      val greedy = greedyMckpLp(qual, cost, rFreq, budget)
      assert(math.abs(lp.objective - greedy) < 1e-6,
        s"trial $trial: lp=${lp.objective} greedy=$greedy")
    }
  }

  /** LP-relaxed MCKP greedy: per category, walk the (cost, qual) efficiency
    * frontier; globally apply upgrades in decreasing Δq/Δc order, taking the
    * last upgrade fractionally. Optimal for the LP relaxation.
    */
  private def greedyMckpLp(qual: Array[Array[Double]], cost: Array[Array[Double]],
                           r: Array[Double], budget: Double): Double = {
    val nC = qual.length
    var total = 0.0
    var spent = 0.0
    val frontier = (0 until nC).map { c =>
      val idx = qual(c).indices.sortBy(cost(c)(_))
      val f = scala.collection.mutable.ArrayBuffer[Int]()
      var bq = Double.NegativeInfinity
      for (k <- idx) if (qual(c)(k) > bq) { f += k; bq = qual(c)(k) }
      // Convexify: drop points not on the upper-left hull so steps are in
      // decreasing-efficiency order (matches LP optimality structure).
      var changed = true
      while (changed && f.length >= 3) {
        changed = false
        var i = 1
        while (i < f.length - 1 && !changed) {
          val (a, b, cc) = (f(i - 1), f(i), f(i + 1))
          val e1 = (qual(c)(b) - qual(c)(a)) / math.max(cost(c)(b) - cost(c)(a), 1e-12)
          val e2 = (qual(c)(cc) - qual(c)(b)) / math.max(cost(c)(cc) - cost(c)(b), 1e-12)
          if (e2 > e1 + 1e-12) { f.remove(i); changed = true }
          i += 1
        }
      }
      f.toVector
    }
    val level = Array.fill(nC)(0)
    for (c <- 0 until nC) {
      total += r(c) * qual(c)(frontier(c)(0))
      spent += r(c) * cost(c)(frontier(c)(0))
    }
    require(spent <= budget + 1e-9, "instance must start feasible")
    var progress = true
    while (progress) {
      progress = false
      var bestC = -1
      var bestEff = -1.0
      for (c <- 0 until nC if level(c) + 1 < frontier(c).length) {
        val a = frontier(c)(level(c)); val b = frontier(c)(level(c) + 1)
        val eff = (qual(c)(b) - qual(c)(a)) / math.max(cost(c)(b) - cost(c)(a), 1e-12)
        if (eff > bestEff) { bestEff = eff; bestC = c }
      }
      if (bestC >= 0) {
        val c = bestC
        val a = frontier(c)(level(c)); val b = frontier(c)(level(c) + 1)
        val dc = r(c) * (cost(c)(b) - cost(c)(a))
        val dq = r(c) * (qual(c)(b) - qual(c)(a))
        if (spent + dc <= budget + 1e-12) {
          spent += dc; total += dq; level(c) += 1; progress = true
        } else {
          val frac = (budget - spent) / dc
          if (frac > 0) total += frac * dq
          spent = budget
        }
      }
    }
    total
  }
}
