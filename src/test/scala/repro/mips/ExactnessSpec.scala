package repro.mips

import org.scalacheck.{Gen, Prop}
import org.scalatest.funsuite.AnyFunSuite
import repro.PropSupport
import repro.core.{BruteForceMM, Matrix, MipsSolver}
import repro.fexipro.Fexipro
import repro.lemp.LempIndex
import repro.mf.ModelZoo
import repro.recdex.Recdex

/** Every solver must return EXACT top-K results (Theorem 1 for RECDEX; the
  * pruning inequalities for LEMP/FEXIPRO). This suite grinds each solver
  * against the naive reference across model shapes, K values, and both
  * diffuse and concentrated vector distributions — the two regimes the paper
  * shows flip the performance ordering, and exactly where pruning bugs hide.
  */
class ExactnessSpec extends AnyFunSuite with PropSupport {
  import SolverTestSupport._

  private def solvers: Seq[(String, MipsSolver, Double)] = Seq(
    // (label, solver, score tolerance) — SVD-rotating solvers accumulate
    // ~1e-12-scale rotation error, so they get a looser tolerance.
    ("MM",             new BruteForceMM(userBlock = 64), 1e-9),
    ("LEMP",           new LempIndex(bucketSize = 32, prefixStep = 4), 1e-9),
    ("LEMP-big-bucket", new LempIndex(bucketSize = 1024, prefixStep = 16), 1e-9),
    ("FEXIPRO-SI",     new Fexipro(useReduction = false), 1e-7),
    ("FEXIPRO-SIR",    new Fexipro(useReduction = true), 1e-7),
    ("RECDEX",         new Recdex(numClusters = 4, blockSize = 16), 1e-9),
    ("RECDEX-noblock", new Recdex(numClusters = 4, blockSize = 0), 1e-9),
    ("RECDEX-C1",      new Recdex(numClusters = 1, blockSize = 8), 1e-9),
  )

  private val configs = Seq(
    // (nUsers, nItems, f, k, concentrated)
    (40, 30, 4, 1, false),
    (40, 30, 4, 5, false),
    (60, 50, 8, 3, true),
    (80, 100, 16, 10, false),
    (80, 100, 16, 10, true),
    (30, 25, 25, 25, false), // k == nItems: must return everything
    (50, 60, 32, 1, true),
    (120, 80, 10, 50, false),
  )

  for {
    (label, solver, tol) <- solvers
    (nu, ni, f, k, conc) <- configs
  } test(s"$label exact on users=$nu items=$ni f=$f k=$k concentrated=$conc") {
    val (users, items) = ModelZoo.tiny(nu, ni, f, seed = nu * 7L + ni * 3L + k, concentrated = conc)
    val expect = bruteForce(users, items, k)
    val got = solver.prepare(items).queryBatch(users, k)
    assertSame(got, expect, tol, s"$label/$nu/$ni/$f/$k")
  }

  for ((label, solver, tol) <- solvers)
    test(s"$label point query equals batch row (users=25 items=40 f=8 k=4)") {
      val (users, items) = ModelZoo.tiny(25, 40, 8, seed = 17)
      val prepared = solver.prepare(items)
      val expect = bruteForce(users, items, 4)
      (0 until users.rows by 5).foreach { u =>
        val got = prepared.query(users.row(u), u, 4)
        assertSame(Array(got), Array(expect(u)), tol, s"$label point u=$u")
      }
    }

  test("k larger than item count returns all items") {
    val (users, items) = ModelZoo.tiny(10, 6, 4, seed = 23)
    solvers.foreach { case (label, solver, tol) =>
      val got = solver.prepare(items).queryBatch(users, 6)
      val expect = bruteForce(users, items, 6)
      assertSame(got, expect, tol, s"$label k=|I|")
    }
  }

  test("single user, single item") {
    val users = Matrix.fromRows(Seq(Array(1.0, -2.0)))
    val items = Matrix.fromRows(Seq(Array(3.0, 0.5)))
    solvers.foreach { case (label, solver, _) =>
      val r = solver.prepare(items).queryBatch(users, 1)
      assert(r(0).ids.toSeq == Seq(0), label)
      assert(math.abs(r(0).scores(0) - 2.0) < 1e-9, label)
    }
  }

  test("items with zero vectors do not break pruning") {
    val users = Matrix.randn(20, 6, seed = 31)
    val itemRows = (0 until 30).map { i =>
      if (i % 7 == 0) new Array[Double](6) else Matrix.randn(1, 6, seed = 100 + i).row(0)
    }
    val items = Matrix.fromRows(itemRows)
    val expect = bruteForce(users, items, 5)
    solvers.foreach { case (label, solver, tol) =>
      assertSame(solver.prepare(items).queryBatch(users, 5), expect, tol, label)
    }
  }

  test("negative-dominated vectors (exercises FEXIPRO's reduction path)") {
    val users = Matrix.tabulate(15, 5)((r, c) => -1.0 - 0.1 * r - 0.05 * c)
    val items = Matrix.tabulate(25, 5)((r, c) => -0.5 - 0.07 * ((r + c) % 9))
    val expect = bruteForce(users, items, 3)
    solvers.foreach { case (label, solver, tol) =>
      assertSame(solver.prepare(items).queryBatch(users, 3), expect, tol, label)
    }
  }

  checkProp("property: LEMP exact on random shapes", minTests = 30) {
    exactProp(new LempIndex(bucketSize = 16, prefixStep = 4), 1e-9)
  }

  checkProp("property: FEXIPRO-SI exact on random shapes", minTests = 25) {
    exactProp(new Fexipro(useReduction = false), 1e-7)
  }

  checkProp("property: FEXIPRO-SIR exact on random shapes", minTests = 25) {
    exactProp(new Fexipro(useReduction = true), 1e-7)
  }

  checkProp("property: RECDEX exact on random shapes", minTests = 30) {
    exactProp(new Recdex(numClusters = 3, blockSize = 8), 1e-9)
  }

  private def exactProp(solver: MipsSolver, tol: Double): Prop =
    Prop.forAll(Gen.choose(2, 40), Gen.choose(2, 40), Gen.choose(2, 12),
      Gen.choose(1, 8), Gen.choose(0L, 5000L)) { (nu, ni, f, k0, seed) =>
      val k = math.min(k0, ni)
      val users = Matrix.randn(nu, f, seed)
      val items = Matrix.randn(ni, f, seed + 1)
      val expect = bruteForce(users, items, k)
      val got = solver.prepare(items).queryBatch(users, k)
      try { assertSame(got, expect, tol); true }
      catch { case e: Throwable => println(e.getMessage); false }
    }
}
