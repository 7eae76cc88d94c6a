package repro.recopt

import org.scalacheck.{Gen, Prop}
import org.scalatest.funsuite.AnyFunSuite
import repro.PropSupport
import repro.core.{Matrix, MipsSolver, PreparedMips, TopKHeap, TopKResult}
import repro.lemp.LempIndex
import repro.mf.ModelZoo
import repro.mips.SolverTestSupport
import repro.recdex.Recdex

class RecOptSpec extends AnyFunSuite with PropSupport {

  // ---- decision kernel ----

  test("decide picks the minimum estimated total") {
    val es = Seq(
      StrategyEstimate("A", 0, 10, 5, 1000),
      StrategyEstimate("B", 0, 10, 5, 500),
      StrategyEstimate("C", 0, 10, 5, 700))
    assert(RecOpt.decide(es).name == "B")
  }

  test("decide breaks exact ties on name (deterministic)") {
    val es = Seq(
      StrategyEstimate("Z", 0, 1, 1, 100),
      StrategyEstimate("A", 0, 1, 1, 100))
    assert(RecOpt.decide(es).name == "A")
  }

  test("decide rejects empty input") {
    assertThrows[IllegalArgumentException](RecOpt.decide(Seq.empty))
  }

  checkProp("property: decide always returns the argmin", minTests = 40) {
    Prop.forAll(Gen.nonEmptyListOf(Gen.chooseNum(1.0, 1e9))) { totals =>
      val es = totals.zipWithIndex.map { case (t, i) =>
        StrategyEstimate(s"s$i", 0, 0, 1, t)
      }
      RecOpt.decide(es).estTotalNanos == totals.min
    }
  }

  // ---- sample sizing ----

  test("minSampleForCache: 4x 1MiB over f=100 doubles is 5243 users") {
    // 4 * 1048576 / (100 * 8) = 5242.88 -> ceil = 5243
    assert(RecOpt.minSampleForCache(100, 1L << 20) == 5243)
  }

  test("minSampleForCache never below 1") {
    assert(RecOpt.minSampleForCache(1000000, 1) == 1)
  }

  test("sampleIndices respects the fraction and the cache floor") {
    val cfg = RecOptConfig(sampleFraction = 0.01, l2CacheBytes = 1L << 14) // 16 KiB
    val idx = RecOpt.sampleIndices(10000, 8, cfg)
    // floor = ceil(4*16384/64) = 1024 > 1% of 10000
    assert(idx.length == 1024)
    assert(idx.toSeq == idx.toSeq.sorted)
    assert(idx.distinct.length == idx.length)
    assert(idx.forall(i => i >= 0 && i < 10000))
  }

  test("sampleIndices clamps to the population") {
    val idx = RecOpt.sampleIndices(10, 4, RecOptConfig(sampleFraction = 0.5))
    assert(idx.length == 10)
  }

  test("sampleIndices deterministic in the seed") {
    val cfg = RecOptConfig(seed = 42)
    val a = RecOpt.sampleIndices(1000, 16, cfg)
    val b = RecOpt.sampleIndices(1000, 16, cfg)
    assert(a.toSeq == b.toSeq)
  }

  // ---- end-to-end serveAll: correctness regardless of which strategy wins ----

  for (conc <- Seq(false, true))
    test(s"serveAll returns exact results (concentrated=$conc)") {
      val (users, items) = ModelZoo.tiny(300, 150, 12, seed = 61, concentrated = conc)
      val expect = SolverTestSupport.bruteForce(users, items, 5)
      val (got, report) = RecOpt.serveAll(users, items, 5,
        Seq(new LempIndex(bucketSize = 32), new Recdex(numClusters = 4, blockSize = 16)),
        RecOptConfig(sampleFraction = 0.05, l2CacheBytes = 1L << 12))
      SolverTestSupport.assertSame(got, expect, 1e-9, s"recopt conc=$conc")
      assert(Seq("MM", "LEMP", "RECDEX").contains(report.chosen))
      assert(report.estimates.map(_.name).toSet == Set("MM", "LEMP", "RECDEX"))
      assert(report.sampleSize > 0 && report.sampleSize <= 300)
      assert(report.totalNanos > 0)
    }

  test("serveAll with no indexes degenerates to MM and still serves exactly") {
    val (users, items) = ModelZoo.tiny(100, 60, 8, seed = 67)
    val expect = SolverTestSupport.bruteForce(users, items, 3)
    val (got, report) = RecOpt.serveAll(users, items, 3, Seq.empty,
      RecOptConfig(sampleFraction = 0.05, l2CacheBytes = 1L << 10))
    SolverTestSupport.assertSame(got, expect, 1e-9)
    assert(report.chosen == "MM")
    assert(report.wastedNanos == 0L)
  }

  test("estimate extrapolates per-user cost to the population") {
    val (users, items) = ModelZoo.tiny(200, 80, 8, seed = 71)
    val sample = users.sliceRows(0, 50)
    val out = RecOpt.estimate(sample, items, 3, Seq(new LempIndex(bucketSize = 32)),
      totalUsers = 200, RecOptConfig())
    val mm = out.estimates.find(_.name == "MM").get
    // estTotal = perUser * totalUsers exactly, by construction
    assert(math.abs(mm.estTotalNanos - mm.perUserNanos * 200) < 1e-6 * mm.estTotalNanos + 1)
    val lemp = out.estimates.find(_.name == "LEMP").get
    assert(math.abs(lemp.estTotalNanos - (lemp.buildNanos + lemp.perUserNanos * 200)) <
      1e-6 * lemp.estTotalNanos + 1)
    assert(out.prepared.contains("MM") && out.prepared.contains("LEMP"))
  }

  /** A synthetic point-query index whose per-user time is deterministic and
    * far from MM's — the t-test must stop well before the full sample. */
  private class SlowFakeSolver(delayNanos: Long) extends MipsSolver {
    override def name: String = "SLOWFAKE"
    override def prepare(items: Matrix): PreparedMips = new PreparedMips {
      override def query(user: Array[Double], userId: Int, k: Int): TopKResult = {
        val end = System.nanoTime() + delayNanos
        while (System.nanoTime() < end) {} // spin: deterministic-ish delay
        val h = new TopKHeap(k)
        var i = 0
        while (i < items.rows) { h.offer(items.rowDot(i, user), i); i += 1 }
        h.result()
      }
    }
  }

  test("t-test stops early on a clearly slower point-query index") {
    val (users, items) = ModelZoo.tiny(400, 50, 8, seed = 73)
    val sample = users.sliceRows(0, 200)
    val out = RecOpt.estimate(sample, items, 3,
      Seq(new SlowFakeSolver(2000000L)), // 2 ms per query, ~1000x MM's per-user cost
      totalUsers = 400,
      RecOptConfig(minTTestUsers = 8, tTestAlpha = 0.05))
    val fake = out.estimates.find(_.name == "SLOWFAKE").get
    assert(fake.usersTimed < 200, s"t-test did not stop early: timed ${fake.usersTimed}")
    assert(out.chosen == "MM")
  }

  test("batch-only indexes are timed on the full sample (no early stop)") {
    val (users, items) = ModelZoo.tiny(300, 80, 8, seed = 79)
    val sample = users.sliceRows(0, 120)
    val out = RecOpt.estimate(sample, items, 3,
      Seq(new Recdex(numClusters = 3, blockSize = 8)), totalUsers = 300, RecOptConfig())
    val rd = out.estimates.find(_.name == "RECDEX").get
    assert(rd.usersTimed == 120)
  }

  test("user-indexed strategies build once over the full population " +
      "(C_I accounting) when the full user matrix is supplied") {
    val (users, items) = ModelZoo.tiny(400, 100, 8, seed = 97, concentrated = true)
    val sampleIdx = Array(5, 50, 120, 200, 333, 390)
    val sample = users.selectRows(sampleIdx)
    val out = RecOpt.estimate(sample, items, 3,
      Seq(new Recdex(numClusters = 3, blockSize = 8)), totalUsers = 400,
      RecOptConfig(), fullUsers = Some(users), sampleIdx = Some(sampleIdx))
    val rd = out.estimates.find(_.name == "RECDEX").get
    // only the sampled walks are extrapolated; construction sits in buildNanos
    assert(rd.usersTimed == sampleIdx.length)
    assert(rd.buildNanos > 0)
    assert(out.builtUserIndexes.contains("RECDEX"))
    // the sample results must be exact and row-aligned with sampleIdx
    val expect = SolverTestSupport.bruteForce(users, items, 3)
    val res = out.sampleResults("RECDEX")
    sampleIdx.indices.foreach { i =>
      SolverTestSupport.assertSame(Array(res(i)), Array(expect(sampleIdx(i))), 1e-9,
        s"sample row $i")
    }
  }

  test("serveAll reuses the built RECDEX user index for the remaining users") {
    val (users, items) = ModelZoo.tiny(350, 120, 10, seed = 103, concentrated = true)
    val expect = SolverTestSupport.bruteForce(users, items, 4)
    val (got, report) = RecOpt.serveAll(users, items, 4,
      Seq(new Recdex(numClusters = 4, blockSize = 16)),
      RecOptConfig(sampleFraction = 0.05, l2CacheBytes = 1L << 10))
    SolverTestSupport.assertSame(got, expect, 1e-9, "serveAll+userindex")
    assert(Seq("MM", "RECDEX").contains(report.chosen))
  }
}
