package repro.core

/** Annular algorithm [Drake '13 / Hamerly & Drake '15]: Hamerly's bounds
  * plus, when a full re-scan is needed, the candidate centroids are limited
  * to an annulus around the origin: | ‖c‖ − ‖x‖ | ≤ R with
  * R = max(tightened ub, d(x, second-nearest-from-last-scan)) (Eq. 5).
  * Centroid norms are sorted once per iteration on the driver.
  */
object AnnuKernel extends Strategy {
  val name = "Annu"
  val req: Req = Req(cc = true, sortedNorms = true)

  def newState(points: Array[Array[Double]], k: Int, seed: Long): PartitionState =
    new AnnuState(points, k)
}

final class AnnuState(points: Array[Array[Double]], k: Int)
    extends SequentialState(points, k) {

  private val ub = new Array[Double](n)
  private val lb = new Array[Double](n)
  private val second = new Array[Int](n) // identity of second-nearest at last scan
  private val xNorm: Array[Double] = points.map(Geometry.norm)

  override protected def ubOf(i: Int): Double = ub(i)

  protected def assignAll(info: CentroidInfo): Unit = {
    val cs = info.centroids
    var i = 0
    while (i < n) {
      val x = points(i)
      if (info.iter == 1) {
        fullScan(i, x, cs)
      } else {
        val a = assign(i)
        ub(i) += info.drifts(a)
        lb(i) -= info.maxDriftOther(a)
        m.boundUpdate += 2; m.boundAccess += 2
        val thr = math.max(lb(i), info.sc(a))
        if (thr < ub(i)) {
          ub(i) = cdist(x, cs(a))
          if (thr < ub(i)) annularScan(i, x, info)
        }
      }
      i += 1
    }
  }

  private def fullScan(i: Int, x: Array[Double], cs: Array[Array[Double]]): Unit = {
    var best = -1; var d1 = Double.PositiveInfinity
    var sec = -1; var d2 = Double.PositiveInfinity
    var j = 0
    while (j < k) {
      val dd = cdist(x, cs(j))
      if (dd < d1) { d2 = d1; sec = best; d1 = dd; best = j }
      else if (dd < d2) { d2 = dd; sec = j }
      j += 1
    }
    ub(i) = d1; lb(i) = d2; second(i) = if (sec >= 0) sec else best
    m.boundUpdate += 2
    reassign(i, best)
  }

  /** Scan only centroids inside the annulus; both the true nearest and the
    * true second-nearest provably lie inside (see Section 4.3.1).
    */
  private def annularScan(i: Int, x: Array[Double], info: CentroidInfo): Unit = {
    val cs = info.centroids
    val dSecond = if (second(i) == assign(i)) ub(i) else cdist(x, cs(second(i)))
    val r = math.max(ub(i), dSecond)
    val lo = xNorm(i) - r
    val hi = xNorm(i) + r
    val sv = info.sortedNormVal
    val si = info.sortedNormIdx
    var from = lowerBound(sv, lo)
    var best = -1; var d1 = Double.PositiveInfinity
    var sec = -1; var d2 = Double.PositiveInfinity
    // The current assignee and old second are inside the annulus by
    // construction, so the scan below always sees >= 2 candidates (k >= 2).
    while (from < k && sv(from) <= hi) {
      val j = si(from)
      val dd = cdist(x, cs(j))
      if (dd < d1) { d2 = d1; sec = best; d1 = dd; best = j }
      else if (dd < d2) { d2 = dd; sec = j }
      from += 1
    }
    if (best < 0) { fullScan(i, x, cs); return } // numeric safety net
    ub(i) = d1; lb(i) = d2; second(i) = if (sec >= 0) sec else best
    m.boundUpdate += 2
    reassign(i, best)
  }

  /** First index with value >= key in a sorted array. */
  private def lowerBound(arr: Array[Double], key: Double): Int = {
    var lo = 0; var hi = arr.length
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (arr(mid) < key) lo = mid + 1 else hi = mid
    }
    lo
  }
}
