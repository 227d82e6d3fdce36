package repro.core

/** Exponion [Newling & Fleuret, ICML'16]: Hamerly's bounds plus, on bound
  * failure, candidates restricted to a ball around the ASSIGNED centroid:
  * ‖c_j − c_a‖ ≤ 2·ub + ‖c_a − c_a's nearest other‖ (Eq. 6), walked via
  * per-centroid neighbour lists sorted by inter-centroid distance.
  */
object ExpoKernel extends Strategy {
  val name = "Expo"
  val req: Req = Req(cc = true, neighbors = true)

  def newState(points: Array[Array[Double]], k: Int, seed: Long): PartitionState =
    new ExpoState(points, k)
}

final class ExpoState(points: Array[Array[Double]], k: Int)
    extends SequentialState(points, k) {

  private val ub = new Array[Double](n)
  private val lb = new Array[Double](n)

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
          if (thr < ub(i)) exponionScan(i, x, info)
        }
      }
      i += 1
    }
  }

  private def fullScan(i: Int, x: Array[Double], cs: Array[Array[Double]]): Unit = {
    var best = -1; var d1 = Double.PositiveInfinity; var d2 = Double.PositiveInfinity
    var j = 0
    while (j < k) {
      val dd = cdist(x, cs(j))
      if (dd < d1) { d2 = d1; d1 = dd; best = j }
      else if (dd < d2) d2 = dd
      j += 1
    }
    ub(i) = d1; lb(i) = d2
    m.boundUpdate += 2
    reassign(i, best)
  }

  private def exponionScan(i: Int, x: Array[Double], info: CentroidInfo): Unit = {
    val cs = info.centroids
    val a = assign(i)
    val ubT = ub(i) // already tightened to the exact distance d(x, c_a)
    val no = info.nearestOther(a)
    val radius = 2.0 * ubT + no
    val nb = info.neighbors(a) // sorted by cc(a, ·) ascending; nb(0) == a
    var best = -1; var d1 = Double.PositiveInfinity; var d2 = Double.PositiveInfinity
    var z = 0
    var go = true
    while (go && z < nb.length) {
      val j = nb(z)
      if (info.cc(a)(j) > radius) go = false
      else {
        val dd = if (j == a) { ubT } else cdist(x, cs(j))
        if (dd < d1) { d2 = d1; d1 = dd; best = j }
        else if (dd < d2) d2 = dd
        z += 1
      }
    }
    // Centroids outside the ball satisfy d(x,c_j) >= ubT + nearestOther(a).
    val outsideLb = ubT + no
    ub(i) = d1
    lb(i) = math.min(d2, outsideLb)
    m.boundUpdate += 2
    reassign(i, best)
  }
}
