package repro.cluster

import repro.core.Matrix

/** Lloyd's k-means with k-means++ seeding — RECDEX's clustering substrate.
  *
  * The paper uses standard (Euclidean) k-means from Armadillo and notes that
  * minimizing L2 distance between user vectors approximates minimizing the
  * angular distance RECDEX actually cares about (§5.1). This implementation
  * is seeded and fully deterministic so index construction is reproducible.
  */
object KMeans {

  /** `centroids`: k x f; `assignments(i)`: cluster of row i; `iterations`:
    * Lloyd iterations actually run (<= maxIter). */
  final case class KMeansResult(centroids: Matrix, assignments: Array[Int], iterations: Int)
      extends Serializable

  /** Squared Euclidean distance between row `r` of `m` and vector `c`. */
  @inline private def sqDist(m: Matrix, r: Int, c: Array[Double]): Double = {
    var s = 0.0; val off = r * m.cols
    var j = 0
    while (j < m.cols) { val d = m.data(off + j) - c(j); s += d * d; j += 1 }
    s
  }

  /** Cluster the rows of `points` into `k` clusters. */
  def fit(points: Matrix, k: Int, seed: Long = 42, maxIter: Int = 25,
          tol: Double = 1e-6): KMeansResult = {
    require(k >= 1, s"k must be >= 1, got $k")
    val n = points.rows
    val f = points.cols
    val kk = math.min(k, n)
    val rng = new scala.util.Random(seed)

    // --- k-means++ seeding ---
    val centroids = new Array[Array[Double]](kk)
    centroids(0) = points.row(rng.nextInt(n))
    val minDist = Array.fill(n)(Double.MaxValue)
    var c = 1
    while (c < kk) {
      var i = 0
      var total = 0.0
      while (i < n) {
        val d = sqDist(points, i, centroids(c - 1))
        if (d < minDist(i)) minDist(i) = d
        total += minDist(i)
        i += 1
      }
      // sample proportional to squared distance (deterministic given seed)
      var target = rng.nextDouble() * total
      var pick = 0
      i = 0
      var acc = 0.0
      while (i < n && acc <= target) { acc += minDist(i); pick = i; i += 1 }
      centroids(c) = points.row(pick)
      c += 1
    }

    // --- Lloyd iterations ---
    val assign = new Array[Int](n)
    var iter = 0
    var moved = Double.MaxValue
    while (iter < maxIter && moved > tol) {
      // assignment step
      var i = 0
      while (i < n) {
        var best = 0
        var bestD = sqDist(points, i, centroids(0))
        var j = 1
        while (j < kk) {
          val d = sqDist(points, i, centroids(j))
          if (d < bestD) { bestD = d; best = j }
          j += 1
        }
        assign(i) = best
        i += 1
      }
      // update step
      val sums = Array.fill(kk)(new Array[Double](f))
      val counts = new Array[Int](kk)
      i = 0
      while (i < n) {
        val a = assign(i); counts(a) += 1
        val s = sums(a); val off = i * f
        var j = 0
        while (j < f) { s(j) += points.data(off + j); j += 1 }
        i += 1
      }
      moved = 0.0
      var j = 0
      while (j < kk) {
        if (counts(j) > 0) {
          val newC = sums(j)
          var d = 0
          var delta = 0.0
          while (d < f) {
            newC(d) /= counts(j)
            val diff = newC(d) - centroids(j)(d)
            delta += diff * diff
            d += 1
          }
          moved = math.max(moved, delta)
          centroids(j) = newC
        } else {
          // empty cluster: re-seed to a random point so every cluster is live
          centroids(j) = points.row(rng.nextInt(n))
          moved = Double.MaxValue
        }
        j += 1
      }
      iter += 1
    }

    // final assignment against the last centroids
    var i = 0
    while (i < n) {
      var best = 0
      var bestD = sqDist(points, i, centroids(0))
      var j = 1
      while (j < kk) {
        val d = sqDist(points, i, centroids(j))
        if (d < bestD) { bestD = d; best = j }
        j += 1
      }
      assign(i) = best
      i += 1
    }

    KMeansResult(Matrix.fromRows(centroids.toIndexedSeq), assign, iter)
  }
}
