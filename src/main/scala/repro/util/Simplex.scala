package repro.util

/** Dense two-phase primal simplex.
  *
  * Solves  maximize cᵀx  subject to  Aᵢ x {≤,=,≥} bᵢ,  x ≥ 0.
  *
  * The knob planner's LP (Eq. 2–4 of the paper) has |C|·|K| variables and
  * 1 + |C| constraints — tiny — so a dense tableau with Bland's rule (which
  * precludes cycling) is both simple and fast. This replaces the paper's use
  * of SciPy's linprog.
  */
object Simplex {

  sealed trait Rel
  case object Le extends Rel
  case object Eq extends Rel
  case object Ge extends Rel

  /** One linear constraint `coeffs · x rel rhs`. */
  final case class Constraint(coeffs: Array[Double], rel: Rel, rhs: Double)

  sealed trait Status
  case object Optimal    extends Status
  case object Infeasible extends Status
  case object Unbounded  extends Status

  /** Solver result; `x` is meaningful only when `status == Optimal`. */
  final case class Result(status: Status, x: Array[Double], objective: Double)

  private val EPS = 1e-9

  /** Maximize `c · x` subject to `constraints`, x ≥ 0. */
  def maximize(c: Array[Double], constraints: Seq[Constraint]): Result = {
    val n = c.length
    require(constraints.forall(_.coeffs.length == n), "constraint arity mismatch")

    // Normalize to b >= 0 by flipping rows.
    val rows = constraints.map { con =>
      if (con.rhs < 0) {
        val flipped = con.rel match { case Le => Ge; case Ge => Le; case Eq => Eq }
        Constraint(con.coeffs.map(-_), flipped, -con.rhs)
      } else con
    }
    val m = rows.length

    // Column layout: [ structural(n) | slack/surplus(s) | artificial(a) | rhs ]
    val nSlack = rows.count(_.rel != Eq)
    val nArt   = rows.count(r => r.rel == Eq || r.rel == Ge)
    val width  = n + nSlack + nArt + 1
    val tab    = Array.ofDim[Double](m + 1, width) // last row = objective
    val basis  = Array.ofDim[Int](m)

    var slackIdx = n
    var artIdx   = n + nSlack
    val artCols  = Array.newBuilder[Int]
    for ((row, i) <- rows.zipWithIndex) {
      Array.copy(row.coeffs, 0, tab(i), 0, n)
      tab(i)(width - 1) = row.rhs
      row.rel match {
        case Le =>
          tab(i)(slackIdx) = 1.0; basis(i) = slackIdx; slackIdx += 1
        case Ge =>
          tab(i)(slackIdx) = -1.0; slackIdx += 1
          tab(i)(artIdx) = 1.0; basis(i) = artIdx; artCols += artIdx; artIdx += 1
        case Eq =>
          tab(i)(artIdx) = 1.0; basis(i) = artIdx; artCols += artIdx; artIdx += 1
      }
    }
    val artificials = artCols.result()

    // --- Phase 1: minimize sum of artificials (maximize negative sum). ---
    if (artificials.nonEmpty) {
      // Maximize W = −Σ artificials, i.e. c_art = −1 → initial reduced costs
      // −c = +1 at artificial columns, then price out the basic artificials.
      val obj = tab(m)
      java.util.Arrays.fill(obj, 0.0)
      artificials.foreach(j => obj(j) = 1.0)
      for (i <- 0 until m if artificials.contains(basis(i)))
        axpy(obj, tab(i), -1.0, width)
      pivotLoop(tab, basis, m, width)
      if (tab(m)(width - 1) < -1e-7)
        return Result(Infeasible, Array.fill(n)(0.0), 0.0)
      // Drive any artificial still basic (at zero) out of the basis.
      for (i <- 0 until m if artificials.contains(basis(i))) {
        val pivotCol = (0 until n + nSlack).find(j => math.abs(tab(i)(j)) > EPS)
        pivotCol match {
          case Some(j) => pivot(tab, basis, m, width, i, j)
          case None    => // redundant row; leave as-is (all-zero over real cols)
        }
      }
      // Erase artificial columns so phase 2 never re-enters them.
      for (i <- 0 to m; j <- artificials) tab(i)(j) = 0.0
    }

    // --- Phase 2: maximize c. Objective row holds reduced costs of (−c). ---
    val obj = tab(m)
    java.util.Arrays.fill(obj, 0.0)
    for (j <- 0 until n) obj(j) = -c(j)
    for (i <- 0 until m if basis(i) < n)
      axpy(obj, tab(i), c(basis(i)), width)

    if (!pivotLoop(tab, basis, m, width))
      return Result(Unbounded, Array.fill(n)(0.0), Double.PositiveInfinity)

    val x = Array.fill(n)(0.0)
    for (i <- 0 until m if basis(i) < n) x(basis(i)) = tab(i)(width - 1)
    Result(Optimal, x, tab(m)(width - 1))
  }

  /** dst += scale * src over `width` columns. */
  private def axpy(dst: Array[Double], src: Array[Double], scale: Double, width: Int): Unit = {
    var j = 0
    while (j < width) { dst(j) += scale * src(j); j += 1 }
  }

  /** Run Bland-rule pivots until optimal; false if unbounded. */
  private def pivotLoop(tab: Array[Array[Double]], basis: Array[Int], m: Int, width: Int): Boolean = {
    while (true) {
      // Entering: smallest-index column with negative reduced cost (Bland).
      var enter = -1
      var j = 0
      while (j < width - 1 && enter < 0) {
        if (tab(m)(j) < -EPS) enter = j
        j += 1
      }
      if (enter < 0) return true // optimal
      // Leaving: min ratio, ties by smallest basis index (Bland).
      var leave = -1
      var best  = Double.PositiveInfinity
      var i = 0
      while (i < m) {
        val a = tab(i)(enter)
        if (a > EPS) {
          val ratio = tab(i)(width - 1) / a
          if (ratio < best - EPS || (math.abs(ratio - best) <= EPS &&
              (leave < 0 || basis(i) < basis(leave)))) {
            best = ratio; leave = i
          }
        }
        i += 1
      }
      if (leave < 0) return false // unbounded
      pivot(tab, basis, m, width, leave, enter)
    }
    true
  }

  private def pivot(tab: Array[Array[Double]], basis: Array[Int], m: Int, width: Int,
                    row: Int, col: Int): Unit = {
    val p = tab(row)(col)
    var j = 0
    while (j < width) { tab(row)(j) /= p; j += 1 }
    var i = 0
    while (i <= m) {
      if (i != row && math.abs(tab(i)(col)) > EPS)
        axpy(tab(i), tab(row), -tab(i)(col), width)
      i += 1
    }
    basis(row) = col
  }
}
