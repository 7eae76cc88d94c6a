package repro.recopt

import repro.core.{BruteForceMM, Matrix, MipsSolver, PreparedMips, TopKResult}
import repro.stats.TTest

/** Configuration for the RECOPT online optimizer (§4).
  *
  * @param sampleFraction fraction of users to time each strategy on (paper
  *                       uses 0.5–1%)
  * @param l2CacheBytes   assumed L2 cache size; the MM sample is grown until
  *                       the user block occupies at least 4x this (§4.1)
  * @param seed           PRNG seed for the user sample
  * @param tTestAlpha     p-value threshold for early stopping on point-query
  *                       indexes
  * @param minTTestUsers  users to time before the first t-test is attempted
  */
final case class RecOptConfig(
    sampleFraction: Double = 0.01,
    l2CacheBytes: Long = 1L << 20,
    seed: Long = 7,
    tTestAlpha: Double = 0.05,
    minTTestUsers: Int = 16,
)

/** Per-strategy runtime estimate produced from the sample. */
final case class StrategyEstimate(
    name: String,
    buildNanos: Long,
    perUserNanos: Double,
    usersTimed: Int,
    estTotalNanos: Double,
)

/** Everything the estimation phase produced: the estimates, the decision,
  * and — so the serve phase can reuse work — the prepared strategies and
  * whatever sample results each strategy already computed (entries may be
  * null where the t-test stopped early). */
final class EstimateOutcome(
    val estimates: Seq[StrategyEstimate],
    val chosen: String,
    val prepared: Map[String, PreparedMips],
    val sampleResults: Map[String, Array[TopKResult]],
    val builtUserIndexes: Map[String, repro.core.UserIndex],
    val mmSampleNanos: Long,
) {
  def chosenEstimate: StrategyEstimate = estimates.find(_.name == chosen).get
}

/** What RECOPT decided and what it cost to decide. */
final case class RecOptReport(
    chosen: String,
    estimates: Seq[StrategyEstimate],
    sampleSize: Int,
    totalUsers: Int,
    /** wall-clock spent on optimization that did NOT produce reused results
      * (losing strategies' builds + sample queries) */
    wastedNanos: Long,
    /** end-to-end wall-clock including optimization */
    totalNanos: Long,
)

/** RECOPT — the sampling-based MIPS serving optimizer (§4.1).
  *
  * Pipeline: (1) build every candidate index in full (construction is cheap
  * relative to traversal — Fig. 2); (2) time blocked MM on a random user
  * sample big enough to exhibit cache-blocking behaviour (≥ 4x L2);
  * (3) time each index on the sample — per-user with t-test early stopping
  * for point-query indexes, whole-sample for batch-only ones; (4) extrapolate
  * each strategy's total runtime, pick the minimum, serve the remaining
  * users with the winner and reuse the winner's sampled results.
  */
object RecOpt {

  /** Pure decision kernel: pick the strategy with the lowest estimated total
    * runtime (deterministic tie-break on name). Split out so decision logic
    * is testable without a wall clock. */
  def decide(estimates: Seq[StrategyEstimate]): StrategyEstimate = {
    require(estimates.nonEmpty, "no strategies to decide between")
    estimates.minBy(e => (e.estTotalNanos, e.name))
  }

  /** Minimum sample size such that the user block occupies >= 4x L2 (§4.1). */
  def minSampleForCache(f: Int, l2CacheBytes: Long): Int =
    math.max(1, math.ceil(4.0 * l2CacheBytes / (f.toLong * 8)).toInt)

  /** Pick the user sample: `sampleFraction` of users, but never below the
    * cache-occupancy floor. Returns sorted row indices. */
  def sampleIndices(totalUsers: Int, f: Int, cfg: RecOptConfig): Array[Int] = {
    val target = math.max(
      math.ceil(totalUsers * cfg.sampleFraction).toInt,
      math.min(totalUsers, minSampleForCache(f, cfg.l2CacheBytes)))
    val sampleSize = math.min(totalUsers, math.max(1, target))
    val rng = new scala.util.Random(cfg.seed)
    rng.shuffle((0 until totalUsers).toVector).take(sampleSize).sorted.toArray
  }

  /** Estimation phase: build every candidate, time it on the sample, decide.
    * `totalUsers` is the population the per-user costs extrapolate to (it
    * may exceed `sampleUsers.rows` when called from the Spark driver).
    *
    * When `fullUsers`/`sampleIdx` are supplied (the local batch path),
    * user-indexed strategies (RECDEX) build their user index over the FULL
    * population once (counted as construction cost, as in §4.2's C_I) and
    * only the sampled walks are extrapolated; the built index is returned so
    * serving reuses it. */
  def estimate(sampleUsers: Matrix, items: Matrix, k: Int,
               indexSolvers: Seq[MipsSolver], totalUsers: Int,
               cfg: RecOptConfig = RecOptConfig(),
               fullUsers: Option[Matrix] = None,
               sampleIdx: Option[Array[Int]] = None): EstimateOutcome = {
    val sampleSize = sampleUsers.rows
    val mm = new BruteForceMM()

    // --- time blocked MM on the sample ---
    val mmPrepared = mm.prepare(items)
    val mmStart = System.nanoTime()
    val mmSampleResults = mmPrepared.queryBatch(sampleUsers, k)
    val mmNanos = System.nanoTime() - mmStart
    val mmPerUser = mmNanos.toDouble / sampleSize
    val mmEstimate = StrategyEstimate("MM", 0L, mmPerUser, sampleSize,
      mmPerUser * totalUsers)

    var prepared = Map("MM" -> (mmPrepared: PreparedMips))
    var sampleRes = Map("MM" -> mmSampleResults)
    var builtIdx = Map.empty[String, repro.core.UserIndex]

    val indexEstimates = indexSolvers.map { solver =>
      val buildStart = System.nanoTime()
      val prep = solver.prepare(items)
      val buildNanos = System.nanoTime() - buildStart
      prepared += solver.name -> prep

      (prep, fullUsers, sampleIdx) match {
        case (ui: repro.core.UserIndexedMips, Some(all), Some(sIdx)) =>
          // user-indexed strategy: build ONCE over the full population
          // (construction cost C_I), extrapolate only the sampled walk
          val uStart = System.nanoTime()
          val userIndex = ui.buildUserIndex(all)
          val userBuildNanos = System.nanoTime() - uStart
          builtIdx += solver.name -> userIndex
          val qStart = System.nanoTime()
          val res = userIndex.querySubset(sIdx, k)
          val qNanos = System.nanoTime() - qStart
          sampleRes += solver.name -> res
          val perUser = qNanos.toDouble / sIdx.length
          StrategyEstimate(solver.name, buildNanos + userBuildNanos, perUser,
            sIdx.length, buildNanos + userBuildNanos + perUser * totalUsers)

        case _ if prep.batchOnly =>
          // batch the whole sample — per-user t-testing would hide the cache
          // effects batch strategies depend on (§4.1)
          val qStart = System.nanoTime()
          val res = prep.queryBatch(sampleUsers, k)
          val qNanos = System.nanoTime() - qStart
          sampleRes += solver.name -> res
          val perUser = qNanos.toDouble / sampleSize
          StrategyEstimate(solver.name, buildNanos, perUser, sampleSize,
            buildNanos + perUser * totalUsers)

        case _ =>
          // per-user timing with one-sample t-test against the MM mean
          val res = new Array[TopKResult](sampleSize)
          val times = new scala.collection.mutable.ArrayBuffer[Double](sampleSize)
          var i = 0
          var stopped = false
          while (i < sampleSize && !stopped) {
            val u = sampleUsers.row(i)
            val qs = System.nanoTime()
            res(i) = prep.query(u, i, k)
            times += (System.nanoTime() - qs).toDouble
            i += 1
            if (i >= cfg.minTTestUsers && i < sampleSize) {
              val p = TTest.oneSamplePValue(times.toIndexedSeq, mmPerUser)
              if (p < cfg.tTestAlpha) stopped = true
            }
          }
          sampleRes += solver.name -> res
          val perUser = times.sum / times.length
          StrategyEstimate(solver.name, buildNanos, perUser, times.length,
            buildNanos + perUser * totalUsers)
      }
    }

    val all = mmEstimate +: indexEstimates
    new EstimateOutcome(all, decide(all).name, prepared, sampleRes, builtIdx, mmNanos)
  }

  /** Serve exact top-K for every user, choosing between blocked MM and the
    * given index solvers. Returns per-user results (row-aligned with
    * `users`) plus the optimizer report. */
  def serveAll(users: Matrix, items: Matrix, k: Int,
               indexSolvers: Seq[MipsSolver],
               cfg: RecOptConfig = RecOptConfig()): (Array[TopKResult], RecOptReport) = {
    val t0 = System.nanoTime()
    val n = users.rows
    val sampleIdx = sampleIndices(n, users.cols, cfg)
    val sampleUsers = users.selectRows(sampleIdx)

    val est = estimate(sampleUsers, items, k, indexSolvers, n, cfg,
      fullUsers = Some(users), sampleIdx = Some(sampleIdx))

    // --- serve the remaining users with the winner, reusing sample results ---
    val out = new Array[TopKResult](n)
    val winnerSample = est.sampleResults(est.chosen)
    var i = 0
    while (i < sampleIdx.length) {
      if (winnerSample(i) != null) out(sampleIdx(i)) = winnerSample(i)
      i += 1
    }
    val remainingIdx = (0 until n).filter(out(_) == null).toArray
    if (remainingIdx.nonEmpty) {
      val remRes = est.builtUserIndexes.get(est.chosen) match {
        case Some(userIndex) => userIndex.querySubset(remainingIdx, k)
        case None => est.prepared(est.chosen).queryBatch(users.selectRows(remainingIdx), k)
      }
      var j = 0
      while (j < remainingIdx.length) { out(remainingIdx(j)) = remRes(j); j += 1 }
    }

    val totalNanos = System.nanoTime() - t0
    val wasted =
      (if (est.chosen == "MM") 0L else est.mmSampleNanos) +
        est.estimates.filter(e => e.name != "MM" && e.name != est.chosen)
          .map(e => e.buildNanos + (e.perUserNanos * e.usersTimed).toLong).sum

    (out, RecOptReport(est.chosen, est.estimates, sampleIdx.length, n, wasted, totalNanos))
  }
}
