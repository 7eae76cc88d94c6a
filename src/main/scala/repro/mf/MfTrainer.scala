package repro.mf

import repro.core.Matrix

/** Regularized SGD matrix factorization — the reproduction's "NOMAD".
  *
  * The paper trains explicit-feedback MF models (SGD/ALS variants) over
  * Netflix/Yahoo ratings while sweeping the L2 regularization λ, then shows
  * that λ controls how "indexable" the resulting factors are. We have no
  * proprietary ratings, so [[syntheticRatings]] plants a low-rank ground
  * truth and samples noisy ratings from it; [[train]] then runs plain
  * SGD on the objective
  *
  *   min Σ (r_ui − u·i)² + λ (Σ‖u‖² + Σ‖i‖²)
  *
  * exactly as in §3. What matters for the reproduction is preserved: larger
  * λ shrinks factor norms and concentrates user vectors angularly (making
  * indexes fast), smaller λ spreads them (making blocked MM win).
  */
object MfTrainer {

  /** A training triple (user, item, rating). */
  final case class Rating(user: Int, item: Int, rating: Double)

  /** A trained (or planted) factor model. */
  final case class Model(users: Matrix, items: Matrix) {
    def f: Int = users.cols
  }

  /** Sample `nRatings` (user, item, rating) triples from a planted rank-f
    * model plus Gaussian noise. Deterministic in the seed. */
  def syntheticRatings(nUsers: Int, nItems: Int, f: Int, nRatings: Int,
                       noise: Double = 0.5, seed: Long = 11): (IndexedSeq[Rating], Model) = {
    val rng = new scala.util.Random(seed)
    val trueU = Matrix.randn(nUsers, f, seed + 1, sigma = 1.0 / math.sqrt(f.toDouble))
    val trueI = Matrix.randn(nItems, f, seed + 2, sigma = 1.0 / math.sqrt(f.toDouble))
    val ratings = IndexedSeq.fill(nRatings) {
      val u = rng.nextInt(nUsers)
      val i = rng.nextInt(nItems)
      val r = trueU.rowDot(u, trueI.row(i)) * f + rng.nextGaussian() * noise
      Rating(u, i, r)
    }
    (ratings, Model(trueU, trueI))
  }

  /** Root-mean-square prediction error of `model` on `ratings`. */
  def rmse(model: Model, ratings: IndexedSeq[Rating]): Double = {
    var s = 0.0
    ratings.foreach { r =>
      val d = model.users.rowDot(r.user, model.items.row(r.item)) - r.rating
      s += d * d
    }
    math.sqrt(s / ratings.length)
  }

  /** SGD training. `lambda` is the L2 regularization from §3's objective. */
  def train(nUsers: Int, nItems: Int, f: Int, ratings: IndexedSeq[Rating],
            lambda: Double, epochs: Int = 10, lr: Double = 0.05,
            seed: Long = 13): Model = {
    val rng = new scala.util.Random(seed)
    val u = Matrix.randn(nUsers, f, seed + 1, sigma = 0.1)
    val it = Matrix.randn(nItems, f, seed + 2, sigma = 0.1)
    val order = ratings.indices.toArray
    var epoch = 0
    while (epoch < epochs) {
      // deterministic shuffle per epoch
      var i = order.length - 1
      while (i > 0) {
        val j = rng.nextInt(i + 1)
        val t = order(i); order(i) = order(j); order(j) = t
        i -= 1
      }
      val step = lr / (1.0 + 0.5 * epoch) // mild decay
      order.foreach { idx =>
        val r = ratings(idx)
        val uOff = r.user * f
        val iOff = r.item * f
        var dot = 0.0
        var d = 0
        while (d < f) { dot += u.data(uOff + d) * it.data(iOff + d); d += 1 }
        val err = r.rating - dot
        d = 0
        while (d < f) {
          val uv = u.data(uOff + d)
          val iv = it.data(iOff + d)
          u.data(uOff + d) = uv + step * (err * iv - lambda * uv)
          it.data(iOff + d) = iv + step * (err * uv - lambda * iv)
          d += 1
        }
      }
      epoch += 1
    }
    Model(u, it)
  }

  /** Mean L2 norm of the rows of a matrix (used to verify λ shrinks norms). */
  def meanRowNorm(m: Matrix): Double = m.rowNorms.sum / m.rows
}
