package repro.mips

import org.scalacheck.{Gen, Prop}
import org.scalatest.funsuite.AnyFunSuite
import repro.PropSupport
import repro.cluster.KMeans
import repro.core.Matrix

/** The pruning inequalities every index rests on, tested directly.
  *
  * These tests would catch a wrong bound even when the end-to-end result
  * happens to be right (e.g. a bound that is too loose is merely slow, but
  * one that is too tight silently drops true top-K items on *some* input —
  * the property tests hunt for exactly that input).
  */
class BoundSpec extends AnyFunSuite with PropSupport {

  private def dot(a: Array[Double], b: Array[Double]): Double =
    a.zip(b).map { case (x, y) => x * y }.sum
  private def norm(a: Array[Double]): Double = math.sqrt(dot(a, a))

  /** Eq. 3: r*_ci = ||i|| cos(theta_ic - theta_b) if theta_b < theta_ic else ||i||. */
  private def eq3Bound(item: Array[Double], c: Array[Double], thetaB: Double): Double = {
    val denom = norm(item) * norm(c)
    val cosv = if (denom > 0) math.max(-1.0, math.min(1.0, dot(item, c) / denom)) else 1.0
    val thetaIc = math.acos(cosv)
    if (thetaB < thetaIc) norm(item) * math.cos(thetaIc - thetaB) else norm(item)
  }

  checkProp("Lemma 5.1: Eq. 3 bound dominates the normalized rating for every " +
      "user in the cluster", minTests = 40) {
    Prop.forAll(Gen.choose(5, 60), Gen.choose(3, 40), Gen.choose(2, 10),
      Gen.choose(1, 5), Gen.choose(0L, 3000L)) { (nu, ni, f, c, seed) =>
      val users = Matrix.randn(nu, f, seed)
      val items = Matrix.randn(ni, f, seed + 1)
      val km = KMeans.fit(users, c, seed + 2)
      // theta_b per cluster
      val thetaB = Array.tabulate(km.centroids.rows) { j =>
        val cj = km.centroids.row(j)
        (0 until nu).filter(km.assignments(_) == j).map { u =>
          val ur = users.row(u)
          val denom = norm(ur) * norm(cj)
          math.acos(math.max(-1.0, math.min(1.0, dot(ur, cj) / denom)))
        }.foldLeft(0.0)(math.max)
      }
      (0 until nu).forall { u =>
        val ur = users.row(u)
        val j = km.assignments(u)
        val cj = km.centroids.row(j)
        (0 until ni).forall { i =>
          val bound = eq3Bound(items.row(i), cj, thetaB(j))
          val normalized = dot(ur, items.row(i)) / math.max(norm(ur), 1e-300)
          bound >= normalized - 1e-9
        }
      }
    }
  }

  test("Eq. 3 degenerates to ||i|| when theta_b covers the whole sphere") {
    val item = Array(3.0, 4.0)
    val c = Array(1.0, 0.0)
    assert(eq3Bound(item, c, math.Pi) == 5.0)
  }

  test("Eq. 3 with theta_b = 0 is the centroid's own normalized rating") {
    // With no distortion allowed, the bound must equal ||i|| cos(theta_ic) = c.i/||c||.
    val item = Array(1.0, 1.0)
    val c = Array(2.0, 0.0)
    val expect = dot(item, c) / norm(c)
    assert(math.abs(eq3Bound(item, c, 0.0) - expect) < 1e-12)
  }

  checkProp("Cauchy-Schwarz suffix bound (LEMP/FEXIPRO pruning) is a true upper bound",
      minTests = 50) {
    Prop.forAll(Gen.choose(2, 20), Gen.choose(1, 19), Gen.choose(0L, 3000L)) { (f, h0, seed) =>
      val h = math.min(h0, f - 1)
      val u = Matrix.randn(1, f, seed).row(0)
      val v = Matrix.randn(1, f, seed + 1).row(0)
      val partial = (0 until h).map(i => u(i) * v(i)).sum
      val uSuf = math.sqrt((h until f).map(i => u(i) * u(i)).sum)
      val vSuf = math.sqrt((h until f).map(i => v(i) * v(i)).sum)
      partial + uSuf * vSuf >= dot(u, v) - 1e-9
    }
  }

  checkProp("integer quantization bound (FEXIPRO-I) is a true upper bound",
      minTests = 50) {
    Prop.forAll(Gen.choose(1, 16), Gen.choose(0L, 3000L)) { (f, seed) =>
      val intMax = (1 << 15) - 1
      val u = Matrix.randn(1, f, seed).row(0)
      val v = Matrix.randn(1, f, seed + 1).row(0)
      def scaleOf(x: Array[Double]): Double = {
        val m = x.map(math.abs).max
        if (m > 0) intMax / m else 1.0
      }
      val su = scaleOf(u); val sv = scaleOf(v)
      val uq = u.map(x => math.round(x * su))
      val vq = v.map(x => math.round(x * sv).toInt)
      val acc = uq.zip(vq).map { case (a, b) => a * b }.sum
      val l1u = u.map(math.abs).sum
      val l1v = v.map(math.abs).sum
      val err = 0.5 * l1v / su + 0.5 * l1u / sv + 0.25 * f / (su * sv)
      acc.toDouble / (su * sv) + err >= dot(u, v) - 1e-12
    }
  }

  checkProp("FEXIPRO-R shift preserves per-user item ordering", minTests = 40) {
    Prop.forAll(Gen.choose(2, 10), Gen.choose(2, 15), Gen.choose(0L, 2000L)) { (f, ni, seed) =>
      val u = Matrix.randn(1, f, seed).row(0)
      val items = Matrix.randn(ni, f, seed + 1)
      val mins = Array.tabulate(f)(d => (0 until ni).map(items(_, d)).min)
      val origOrder = (0 until ni).sortBy(i => (-dot(u, items.row(i)), i))
      val shiftedOrder = (0 until ni).sortBy { i =>
        val shifted = items.row(i).zip(mins).map { case (x, m) => x - m }
        (-dot(u, shifted), i)
      }
      origOrder == shiftedOrder
    }
  }

  checkProp("LEMP length pruning: ||u||*||i|| dominates u.i", minTests = 50) {
    Prop.forAll(Gen.choose(1, 20), Gen.choose(0L, 3000L)) { (f, seed) =>
      val u = Matrix.randn(1, f, seed).row(0)
      val v = Matrix.randn(1, f, seed + 1).row(0)
      norm(u) * norm(v) >= dot(u, v) - 1e-12
    }
  }
}
