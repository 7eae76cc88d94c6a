package repro.recdex

import repro.cluster.KMeans
import repro.core._

/** RECDEX — the paper's hardware-friendly exact MIPS index (§5).
  *
  * Construction (Algorithm 1, ConstructIndex — [[RecdexPrepared.buildUserIndex]]):
  *  1. k-means the user vectors into C clusters (C=8 in the paper).
  *  2. Per cluster j, compute θ_bj = max_{u ∈ C_j} arccos(u·c_j / ‖u‖‖c_j‖),
  *     the worst user-centroid angular distortion.
  *  3. Per cluster, compute for every item the Eq. 3 upper bound
  *     r*_ci = ‖i‖·cos(θ_ic − θ_b) if θ_b < θ_ic else ‖i‖, sort items by it
  *     descending, and materialize the sorted item vectors contiguously —
  *     the cluster's index list L_c (sequential walks are cache-friendly,
  *     mirroring LEMP's bucket layout).
  *
  * Querying (Algorithm 1, QueryIndex + §5.4 blocked head):
  *  - For each cluster, the first B items of L_c are scored for ALL the
  *    cluster's queried users at once with the blocked GEMM (work sharing —
  *    this is the "hardware-efficient execution" lesioned in Fig. 8).
  *  - Each user then walks the remainder of L_c with a bounded heap,
  *    terminating as soon as CBound(c, i, θ_b) < min(heap) — exactness is
  *    Theorem 1: the walk visits items in monotonically decreasing upper
  *    bound, and the bound dominates u·i/‖u‖ for every user in the cluster.
  *
  * Note the bound is on the NORMALIZED rating r* = u·i/‖u‖ (user norm is
  * rank-irrelevant); the walk therefore compares CBound·‖u‖ against
  * min(heap).
  *
  * RECDEX is a batch-only strategy (`batchOnly = true`): its index is built
  * over the query users, so per-user t-test sampling would mis-measure it
  * (§4.1). RECOPT instead builds the user index once over the full
  * population (construction cost C_I) and times the walk on a sample via
  * [[UserIndexedMips]].
  */
final class Recdex(val numClusters: Int = 8, val blockSize: Int = 4096,
                   val kmeansSeed: Long = 42, val kmeansMaxIter: Int = 20)
    extends MipsSolver {
  override def name: String = "RECDEX"

  override def prepare(items: Matrix): PreparedMips =
    new RecdexPrepared(items, numClusters, blockSize, kmeansSeed, kmeansMaxIter)
}

final class RecdexPrepared(items: Matrix, numClusters: Int, blockSize: Int,
                           kmeansSeed: Long, kmeansMaxIter: Int)
    extends PreparedMips with UserIndexedMips {

  private val itemNorms: Array[Double] = items.rowNorms

  override def batchOnly: Boolean = true

  /** Point queries degrade to a one-user cluster (θ_b = 0): an exact walk of
    * the per-user sorted list, i.e. Koenigstein's bound without relaxation.
    * Provided for interface completeness; RECOPT treats RECDEX as batchOnly. */
  override def query(user: Array[Double], userId: Int, k: Int): TopKResult =
    queryBatch(Matrix.fromRows(Seq(user)), k)(0)

  override def queryBatch(users: Matrix, k: Int): Array[TopKResult] =
    buildUserIndex(users).queryAll(k)

  /** Lesion hooks (Fig. 8): run with/without the §5.4 blocked work sharing. */
  def queryBatchImpl(users: Matrix, k: Int, shareBlocked: Boolean): Array[TopKResult] =
    buildUserIndexImpl(users).queryImpl(null, k, shareBlocked, null)

  /** Instrumented variant for the Fig. 8 lesion study: also returns the
    * average number of index entries visited per user (w-bar in Eq. 4),
    * counting both the blocked head and the walked tail. */
  def queryBatchCounting(users: Matrix, k: Int,
                         shareBlocked: Boolean): (Array[TopKResult], Double) = {
    val visited = new Array[Long](users.rows)
    val res = buildUserIndexImpl(users).queryImpl(null, k, shareBlocked, visited)
    (res, visited.sum.toDouble / math.max(1, users.rows))
  }

  override def buildUserIndex(users: Matrix): UserIndex = buildUserIndexImpl(users)

  def buildUserIndexImpl(users: Matrix): RecdexUserIndex = {
    val n = items.rows

    // --- ConstructIndex: cluster users ---
    val km = KMeans.fit(users, math.min(numClusters, users.rows), kmeansSeed, kmeansMaxIter)
    val centroids = km.centroids
    val nC = centroids.rows

    // group user rows by cluster
    val members = Array.fill(nC)(new scala.collection.mutable.ArrayBuffer[Int])
    var r = 0
    while (r < users.rows) { members(km.assignments(r)) += r; r += 1 }

    // θ_b per cluster = max user-centroid angle
    val userNorms = users.rowNorms
    val centroidNorms = centroids.rowNorms
    val thetaB = new Array[Double](nC)
    var j = 0
    while (j < nC) {
      var maxTheta = 0.0
      members(j).foreach { u =>
        val d = users.rowDot(u, centroids.row(j))
        val denom = userNorms(u) * centroidNorms(j)
        val cosv = if (denom > 0) math.max(-1.0, math.min(1.0, d / denom)) else 1.0
        val th = math.acos(cosv)
        if (th > maxTheta) maxTheta = th
      }
      thetaB(j) = maxTheta
      j += 1
    }

    // θ_ic for every (cluster, item) via one GEMM: centroids x items^T
    val ci = Gemm.abt(centroids, items) // nC x n

    // per-cluster Eq. 3 bounds, sort order, and materialized sorted items
    val clusterOrder = new Array[Array[Int]](nC)
    val clusterBounds = new Array[Array[Double]](nC) // aligned with the sorted order
    val clusterItems = new Array[Matrix](nC)
    j = 0
    while (j < nC) {
      if (members(j).nonEmpty) {
        val thB = thetaB(j)
        val cNorm = centroidNorms(j)
        val bounds = new Array[Double](n)
        var i = 0
        while (i < n) {
          val denom = cNorm * itemNorms(i)
          val cosv = if (denom > 0) math.max(-1.0, math.min(1.0, ci(j, i) / denom)) else 1.0
          val thIc = math.acos(cosv)
          bounds(i) =
            if (thB < thIc) itemNorms(i) * math.cos(thIc - thB) else itemNorms(i)
          i += 1
        }
        val order = Array.tabulate(n)(identity)
          .sortBy(i => (-bounds(i), i)) // descending bound, stable on id
        clusterOrder(j) = order
        clusterBounds(j) = order.map(bounds)
        clusterItems(j) = items.selectRows(order) // contiguous L_c
      }
      j += 1
    }

    new RecdexUserIndex(users, userNorms, members.map(_.toArray), clusterOrder,
      clusterBounds, clusterItems, blockSize)
  }

  /** The built per-user-batch index (Algorithm 1's L plus user grouping). */
  final class RecdexUserIndex(
      users: Matrix,
      userNorms: Array[Double],
      members: Array[Array[Int]],
      clusterOrder: Array[Array[Int]],
      clusterBounds: Array[Array[Double]],
      clusterItems: Array[Matrix],
      blockSize: Int,
  ) extends UserIndex {

    override def queryAll(k: Int): Array[TopKResult] =
      queryImpl(null, k, shareBlocked = blockSize > 0, null)

    override def querySubset(rows: Array[Int], k: Int): Array[TopKResult] = {
      val all = queryImpl(rows, k, shareBlocked = blockSize > 0, null)
      rows.map(all)
    }

    /** Lesion hook (Fig. 8): query with/without the §5.4 blocked head,
      * reusing this built index so only walk time is measured. */
    def queryAllLesion(k: Int, shareBlocked: Boolean): Array[TopKResult] =
      queryImpl(null, k, shareBlocked, null)

    /** Lesion hook with w-bar instrumentation. */
    def queryAllCounting(k: Int, shareBlocked: Boolean): (Array[TopKResult], Double) = {
      val visited = new Array[Long](users.rows)
      val res = queryImpl(null, k, shareBlocked, visited)
      (res, visited.sum.toDouble / math.max(1, users.rows))
    }

    /** Core walk. If `restrict` is non-null, only those user rows are served
      * (others stay null in the row-aligned output). */
    private[recdex] def queryImpl(restrict: Array[Int], k: Int, shareBlocked: Boolean,
                                  visited: Array[Long]): Array[TopKResult] = {
      val n = items.rows
      val out = new Array[TopKResult](users.rows)
      val wanted: java.util.BitSet =
        if (restrict == null) null
        else {
          val bs = new java.util.BitSet(users.rows)
          restrict.foreach(bs.set)
          bs
        }

      var j = 0
      while (j < members.length) {
        val clusterUsers0 = members(j)
        if (clusterUsers0 != null && clusterUsers0.nonEmpty && clusterOrder(j) != null) {
          val clusterUsers =
            if (wanted == null) clusterUsers0 else clusterUsers0.filter(wanted.get)
          if (clusterUsers.nonEmpty) {
            val order = clusterOrder(j)
            val bounds = clusterBounds(j)
            val sortedItems = clusterItems(j)
            val b = if (shareBlocked) math.min(math.max(blockSize, k), n) else 0
            val heaps = clusterUsers.map(_ => new TopKHeap(k))

            // --- §5.4 blocked head: GEMM the first B items for all users ---
            if (b > 0) {
              val headItems = sortedItems.sliceRows(0, b)
              val uBlock = users.selectRows(clusterUsers)
              val scores = Gemm.abt(uBlock, headItems) // |C_j| x b
              var ui = 0
              while (ui < clusterUsers.length) {
                val h = heaps(ui)
                val off = ui * b
                var p = 0
                while (p < b) { h.offer(scores.data(off + p), order(p)); p += 1 }
                ui += 1
              }
            }

            // --- per-user walk of the list remainder with CBound termination ---
            var ui = 0
            while (ui < clusterUsers.length) {
              val u = clusterUsers(ui)
              val h = heaps(ui)
              val uNorm = userNorms(u)
              val uRow = users.row(u)
              var p = b
              var stop = false
              while (p < n && !stop) {
                // CBound is on the normalized rating; compare against min(h)/‖u‖.
                if (h.isFull && bounds(p) * uNorm < h.minScore) {
                  stop = true
                } else {
                  h.offer(sortedItems.rowDot(p, uRow), order(p))
                  p += 1
                }
              }
              if (visited != null) visited(u) = p.toLong
              out(u) = h.result()
              ui += 1
            }
          }
        }
        j += 1
      }
      out
    }
  }
}
