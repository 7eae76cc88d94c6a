package repro.lemp

import repro.core.{Matrix, MipsSolver, PreparedMips, TopKHeap, TopKResult}

/** LEMP-LI — the SIGMOD 2015 / TODS 2016 baseline (Teflioudi et al.).
  *
  * Reimplementation of the retrieval variant the paper benchmarks
  * ("LEMP-LI": length-based + incremental pruning):
  *
  *  1. Items are sorted by L2 norm descending and partitioned into buckets
  *     of similar norm; each bucket is sized to stay cache-resident (the
  *     original sizes buckets to L3 — we use a fixed row count that keeps a
  *     bucket's vectors + norms within a few hundred KB).
  *  2. A query walks buckets in norm order. Once `||u|| * bucketMaxNorm`
  *     cannot beat the current k-th best score, the remaining buckets are
  *     pruned wholesale (length pruning — Cauchy–Schwarz).
  *  3. Inside a bucket, each item is first length-pruned with its own norm,
  *     then scored incrementally: exact partial inner product over a prefix
  *     of coordinates plus a Cauchy–Schwarz bound from precomputed suffix
  *     norms; when the bound falls below the heap threshold the item is
  *     abandoned (incremental pruning).
  *
  * The index is exact: pruning only discards items whose upper bound is
  * strictly below the admission threshold.
  */
final class LempIndex(val bucketSize: Int = 256, val prefixStep: Int = 8) extends MipsSolver {
  override def name: String = "LEMP"

  override def prepare(items: Matrix): PreparedMips = {
    val n = items.rows
    val f = items.cols
    val norms = items.rowNorms
    // sort item ids by norm descending (stable tie-break on id for determinism)
    val order = Array.tabulate(n)(identity).sortBy(i => (-norms(i), i))
    val sorted = items.selectRows(order)
    val sortedNorms = order.map(norms)

    // suffix norms: suffix(i)(p) = ||item_i[p..f)||, precomputed at prefixStep boundaries
    val checkpoints = (prefixStep until f by prefixStep).toArray
    val suffixNorms = new Array[Array[Double]](n)
    var i = 0
    while (i < n) {
      val off = i * f
      val sn = new Array[Double](checkpoints.length)
      var cIdx = checkpoints.length - 1
      var s = 0.0
      var p = f - 1
      while (p >= 0) {
        val v = sorted.data(off + p); s += v * v
        if (cIdx >= 0 && p == checkpoints(cIdx)) { sn(cIdx) = math.sqrt(s); cIdx -= 1 }
        p -= 1
      }
      suffixNorms(i) = sn
      i += 1
    }

    val nBuckets = (n + bucketSize - 1) / bucketSize
    val bucketStart = Array.tabulate(nBuckets)(_ * bucketSize)
    val bucketMaxNorm = Array.tabulate(nBuckets)(b => sortedNorms(bucketStart(b)))

    new LempPrepared(sorted, sortedNorms, suffixNorms, checkpoints, order,
      bucketStart, bucketMaxNorm, bucketSize, prefixStep)
  }
}

final class LempPrepared(
    sorted: Matrix,
    sortedNorms: Array[Double],
    suffixNorms: Array[Array[Double]],
    checkpoints: Array[Int],
    originalIds: Array[Int],
    bucketStart: Array[Int],
    bucketMaxNorm: Array[Double],
    bucketSize: Int,
    prefixStep: Int,
) extends PreparedMips {

  override def query(user: Array[Double], userId: Int, k: Int): TopKResult = {
    val f = sorted.cols
    val n = sorted.rows
    val uNorm = {
      var s = 0.0; var p = 0
      while (p < f) { s += user(p) * user(p); p += 1 }
      math.sqrt(s)
    }
    // user suffix norms at the same checkpoints
    val uSuffix = new Array[Double](checkpoints.length)
    locally {
      var cIdx = checkpoints.length - 1
      var s = 0.0
      var p = f - 1
      while (p >= 0) {
        s += user(p) * user(p)
        if (cIdx >= 0 && p == checkpoints(cIdx)) { uSuffix(cIdx) = math.sqrt(s); cIdx -= 1 }
        p -= 1
      }
    }

    val h = new TopKHeap(k)
    var b = 0
    var done = false
    while (b < bucketStart.length && !done) {
      // length pruning across buckets: best possible score in this (and all
      // later) buckets is ||u|| * maxNorm(bucket); strict < keeps ties exact.
      if (h.isFull && uNorm * bucketMaxNorm(b) < h.minScore) {
        done = true
      } else {
        val start = bucketStart(b)
        val end = math.min(start + bucketSize, n)
        var i = start
        var bucketDone = false
        while (i < end && !bucketDone) {
          // per-item length pruning; items in a bucket are norm-descending,
          // so the first prunable item prunes the bucket remainder.
          if (h.isFull && uNorm * sortedNorms(i) < h.minScore) {
            bucketDone = true
          } else {
            val score = incrementalDot(user, uSuffix, i, if (h.isFull) h.minScore else Double.NegativeInfinity)
            if (!score.isNaN) h.offer(score, originalIds(i))
            i += 1
          }
        }
        b += 1
      }
    }
    h.result()
  }

  /** Incremental inner product with Cauchy–Schwarz suffix pruning.
    * Returns NaN when the item is proven to fall strictly below `threshold`.
    */
  private def incrementalDot(user: Array[Double], uSuffix: Array[Double],
                             item: Int, threshold: Double): Double = {
    val f = sorted.cols
    val off = item * f
    val sn = suffixNorms(item)
    var s = 0.0
    var p = 0
    var cIdx = 0
    while (p < f) {
      val stop = math.min(p + prefixStep, f)
      while (p < stop) { s += user(p) * sorted.data(off + p); p += 1 }
      if (p < f && cIdx < checkpoints.length && p == checkpoints(cIdx)) {
        val bound = s + uSuffix(cIdx) * sn(cIdx)
        if (bound < threshold) return Double.NaN
        cIdx += 1
      }
    }
    s
  }
}
