package repro.core

/** The unaccelerated baseline [Lloyd '82]: every iteration computes all n·k
  * distances in assignment and rescans all n points in refinement.
  */
object LloydKernel extends Strategy {
  val name = "Lloyd"
  val req: Req = Req()

  def newState(points: Array[Array[Double]], k: Int, seed: Long): PartitionState =
    new LloydState(points, k)
}

final class LloydState(points: Array[Array[Double]], k: Int)
    extends SequentialState(points, k) {

  override protected def incrementalRefine: Boolean = false

  protected def assignAll(info: CentroidInfo): Unit = {
    val cs = info.centroids
    var i = 0
    while (i < n) {
      val x = points(i)
      var best = 0
      var bd = cdist(x, cs(0))
      var j = 1
      while (j < k) {
        val dd = cdist(x, cs(j))
        if (dd < bd) { bd = dd; best = j }
        j += 1
      }
      reassign(i, best)
      i += 1
    }
  }
}
