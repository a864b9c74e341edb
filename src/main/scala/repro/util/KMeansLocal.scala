package repro.util

/** Deterministic Lloyd's KMeans with farthest-point ("kmeans++-style",
  * deterministic variant) seeding.
  *
  * Skyscraper clusters |K|-dimensional quality vectors — at most a few
  * thousand points of dimension ≤ 10 — so a driver-local implementation is
  * appropriate. The data-parallel part (computing the quality vectors over
  * segments × configurations) runs in Spark (`repro.core.QualityMatrix`).
  */
object KMeansLocal {

  /** Fitted model: `centers(c)(k)` = average quality of config k on category c. */
  final case class Model(centers: Array[Array[Double]]) {
    def k: Int = centers.length

    /** Full-vector nearest-center classification. */
    def classify(v: Array[Double]): Int = {
      var best = 0
      var bestD = Double.MaxValue
      var c = 0
      while (c < centers.length) {
        val d = sqDist(centers(c), v)
        if (d < bestD) { bestD = d; best = c }
        c += 1
      }
      best
    }

    /** Single-dimension classification (paper Eq. 5): nearest center along
      * dimension `dim` only — what the knob switcher can observe online.
      */
    def classifyByDim(dim: Int, value: Double): Int = {
      var best = 0
      var bestD = Double.MaxValue
      var c = 0
      while (c < centers.length) {
        val d = math.abs(centers(c)(dim) - value)
        if (d < bestD) { bestD = d; best = c }
        c += 1
      }
      best
    }

    /** Distance of v to its nearest center — drift / novel-content signal. */
    def nearestDistance(v: Array[Double]): Double =
      math.sqrt(centers.map(sqDist(_, v)).min)
  }

  private def sqDist(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0
    var i = 0
    while (i < a.length) { val d = a(i) - b(i); s += d * d; i += 1 }
    s
  }

  /** Fit `k` clusters on `points`; deterministic in (points, k). */
  def fit(points: Seq[Array[Double]], k: Int, maxIter: Int = 100): Model = {
    require(points.nonEmpty, "KMeans on empty point set")
    require(k >= 1, "k must be >= 1")
    val pts  = points.toArray
    val kEff = math.min(k, pts.length)

    // Farthest-point seeding from the point closest to the centroid.
    val dim = pts(0).length
    val mean = Array.ofDim[Double](dim)
    pts.foreach(p => (0 until dim).foreach(i => mean(i) += p(i) / pts.length))
    val centers = scala.collection.mutable.ArrayBuffer[Array[Double]]()
    centers += pts.minBy(sqDist(_, mean)).clone()
    while (centers.length < kEff)
      centers += pts.maxBy(p => centers.map(sqDist(_, p)).min).clone()

    val assign = Array.ofDim[Int](pts.length)
    var changed = true
    var iter = 0
    while (changed && iter < maxIter) {
      changed = false
      // Assignment step.
      var i = 0
      while (i < pts.length) {
        var best = 0; var bestD = Double.MaxValue
        var c = 0
        while (c < centers.length) {
          val d = sqDist(centers(c), pts(i))
          if (d < bestD) { bestD = d; best = c }
          c += 1
        }
        if (assign(i) != best) { assign(i) = best; changed = true }
        i += 1
      }
      // Update step; empty clusters keep their previous center.
      val sums   = Array.fill(centers.length)(Array.ofDim[Double](dim))
      val counts = Array.ofDim[Int](centers.length)
      i = 0
      while (i < pts.length) {
        val c = assign(i)
        var j = 0
        while (j < dim) { sums(c)(j) += pts(i)(j); j += 1 }
        counts(c) += 1
        i += 1
      }
      for (c <- centers.indices if counts(c) > 0)
        centers(c) = sums(c).map(_ / counts(c))
      iter += 1
    }
    Model(centers.map(_.clone()).toArray)
  }
}
