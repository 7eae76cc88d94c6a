package repro.mf

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Matrix

class MfSpec extends AnyFunSuite {

  private val (ratings, planted) =
    MfTrainer.syntheticRatings(nUsers = 300, nItems = 200, f = 8,
      nRatings = 20000, noise = 0.3, seed = 5)

  test("synthetic ratings are deterministic in the seed") {
    val (r2, _) = MfTrainer.syntheticRatings(300, 200, 8, 20000, 0.3, seed = 5)
    assert(ratings.take(100) == r2.take(100))
  }

  test("planted model RMSE equals the injected noise level") {
    val e = MfTrainer.rmse(planted.copy(
      users = new Matrix(planted.users.rows, planted.users.cols,
        planted.users.data.map(_ * planted.f)), // undo the 1/f score scale
    ), ratings)
    // predictions used rating = f * (u.i) + noise, so scaling users by f
    // recovers the planted predictor; its residual is exactly the noise.
    assert(math.abs(e - 0.3) < 0.05, s"planted rmse $e")
  }

  test("SGD training reduces RMSE far below the untrained model") {
    val untrained = MfTrainer.Model(
      Matrix.randn(300, 8, 1, sigma = 0.1), Matrix.randn(200, 8, 2, sigma = 0.1))
    val before = MfTrainer.rmse(untrained, ratings)
    val model = MfTrainer.train(300, 200, 8, ratings, lambda = 0.01, epochs = 8)
    val after = MfTrainer.rmse(model, ratings)
    assert(after < before * 0.6, s"before=$before after=$after")
  }

  test("training approaches the noise floor on enough data") {
    val model = MfTrainer.train(300, 200, 8, ratings, lambda = 0.005, epochs = 15)
    val e = MfTrainer.rmse(model, ratings)
    assert(e < 0.6, s"rmse $e") // noise floor is 0.3; allow optimization slack
  }

  test("higher lambda shrinks factor norms (the §3 mechanism)") {
    val lambdas = Seq(0.0, 0.05, 0.3)
    val norms = lambdas.map { l =>
      val m = MfTrainer.train(300, 200, 8, ratings, lambda = l, epochs = 6)
      MfTrainer.meanRowNorm(m.users) + MfTrainer.meanRowNorm(m.items)
    }
    assert(norms(0) > norms(1), s"norms $norms")
    assert(norms(1) > norms(2), s"norms $norms")
  }

  test("training is deterministic in the seed") {
    val small = ratings.filter(r => r.user < 100 && r.item < 60).take(3000)
    val a = MfTrainer.train(100, 60, 4, small, lambda = 0.01, epochs = 3, seed = 9)
    val b = MfTrainer.train(100, 60, 4, small, lambda = 0.01, epochs = 3, seed = 9)
    assert(a.users.data.toSeq == b.users.data.toSeq)
  }

  test("train rejects nothing but out-of-range indices surface immediately") {
    val bad = IndexedSeq(MfTrainer.Rating(5, 0, 1.0))
    assertThrows[ArrayIndexOutOfBoundsException](
      MfTrainer.train(3, 2, 4, bad, lambda = 0.0, epochs = 1))
  }
}

class ModelZooSpec extends AnyFunSuite {

  test("reference models have the documented shapes") {
    val models = ModelZoo.referenceModels()
    assert(models.size == 12)
    models.foreach { m =>
      assert(m.users.cols == m.f, m.name)
      assert(m.items.cols == m.f, m.name)
      assert(m.users.rows > 0 && m.items.rows > 0)
    }
    val netflix = models.find(_.name == "Netflix-NOMAD-f50").get
    assert(netflix.users.rows == ModelZoo.NetflixUsers)
    assert(netflix.items.rows == ModelZoo.NetflixItems)
    assert(netflix.paperUsers == 480189L)
  }

  test("factorModel is deterministic in the seed") {
    val (u1, i1) = ModelZoo.factorModel(50, 30, 8, 4, 0.3, 4, 0.3, 0.2, 0.2, seed = 3)
    val (u2, i2) = ModelZoo.factorModel(50, 30, 8, 4, 0.3, 4, 0.3, 0.2, 0.2, seed = 3)
    assert(u1.data.toSeq == u2.data.toSeq)
    assert(i1.data.toSeq == i2.data.toSeq)
  }

  test("concentrated models have smaller angular spread than diffuse ones") {
    def meanMaxAngleToCentroid(users: Matrix): Double = {
      // angle of each user to the global mean direction
      val mean = new Array[Double](users.cols)
      (0 until users.rows).foreach { r =>
        val off = r * users.cols
        (0 until users.cols).foreach(c => mean(c) += users.data(off + c))
      }
      val mn = math.sqrt(mean.map(x => x * x).sum)
      (0 until users.rows).map { r =>
        val d = users.rowDot(r, mean)
        math.acos(math.max(-1, math.min(1, d / (users.rowNorm(r) * mn))))
      }.sum / users.rows
    }
    val (diff, _) = ModelZoo.tiny(300, 10, 16, seed = 21, concentrated = false)
    val (conc, _) = ModelZoo.tiny(300, 10, 16, seed = 21, concentrated = true)
    assert(meanMaxAngleToCentroid(conc) < meanMaxAngleToCentroid(diff))
  }

  test("itemNormSigma controls the item norm spread") {
    def normSpread(m: Matrix): Double = {
      val ns = m.rowNorms
      val mean = ns.sum / ns.length
      math.sqrt(ns.map(x => (x - mean) * (x - mean)).sum / ns.length) / mean
    }
    val (_, flat) = ModelZoo.factorModel(10, 500, 8, 1, 0.5, 4, 0.5, 0.2, 0.05, seed = 4)
    val (_, heavy) = ModelZoo.factorModel(10, 500, 8, 1, 0.5, 4, 0.5, 0.2, 0.8, seed = 4)
    assert(normSpread(heavy) > 2 * normSpread(flat))
  }
}
