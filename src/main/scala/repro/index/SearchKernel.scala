package repro.index

import repro.core._

/** Pre-assignment search [Broder et al., WSDM'14] (Section 3.2): every
  * iteration, for each centroid c_j, a ball-tree range search collects the
  * points within ½·min-other-centroid-distance of c_j — provably closest to
  * c_j — and assigns them in batch; leftovers fall back to a Lloyd scan.
  * k range searches per iteration make this slow for large k, matching its
  * low leaderboard rank in the paper.
  */
object SearchKernel extends Strategy {
  val name = "Search"
  val req: Req = Req(cc = true)

  def newState(points: Array[Array[Double]], k: Int, seed: Long): PartitionState =
    new SearchState(points, k, BallTree.build(points, 30, seed))
}

final class SearchState(points: Array[Array[Double]], k: Int, tree: BallTree)
    extends SequentialState(points, k) {

  private val done = new Array[Boolean](n)

  protected def assignAll(info: CentroidInfo): Unit = {
    val cs = info.centroids
    java.util.Arrays.fill(done, false)
    var j = 0
    while (j < k) {
      val thr = 0.5 * info.nearestOther(j)
      if (thr > 0 && !thr.isInfinity) {
        val hits = tree.rangeSearch(cs(j), thr, () => m.nodeAccess += 1, () => m.dist += 1)
        var z = 0
        while (z < hits.length) {
          val i = hits(z)
          if (!done(i)) { done(i) = true; reassign(i, j) }
          z += 1
        }
      }
      j += 1
    }
    var i = 0
    while (i < n) {
      if (!done(i)) {
        val x = points(i)
        var best = 0; var bd = cdist(x, cs(0))
        var j2 = 1
        while (j2 < k) {
          val dd = cdist(x, cs(j2))
          if (dd < bd) { bd = dd; best = j2 }
          j2 += 1
        }
        reassign(i, best)
      }
      i += 1
    }
  }
}
