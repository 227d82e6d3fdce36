package repro.unik

import repro.core._
import repro.index.{BallNode, BallTree}

/** UniK (Section 5): index nodes and points flow through ONE pruning
  * pipeline. An object o (node with radius r, or point with r = 0) carries
  * an upper bound on d(pivot, assigned centroid) and Yinyang-style group
  * lower bounds; the global/group/local tests add a ±r margin (Eqs. 10–11),
  * whole nodes are assigned when the two-nearest gap ≥ 2r (Eq. 9), split
  * nodes hand their bounds to children via the parent-child pivot distance
  * ψ (Eq. 12), and refinement is incremental over cluster sum vectors
  * (Section 5.1.2).
  *
  * Traversal knobs (Section 5.3): `Multiple` re-enters the tree from the
  * root every iteration; `Single` keeps the surviving objects in their
  * clusters and drift-updates their bounds; `Adaptive` times iteration 1
  * (root) against iteration 2 (clusters) and keeps the winner.
  */
sealed trait UniKMode
object UniKMode {
  case object Adaptive extends UniKMode
  case object Single extends UniKMode
  case object Multiple extends UniKMode
}

final class UniKStrategy(mode: UniKMode = UniKMode.Adaptive, capacity: Int = 30)
    extends Strategy {
  val name: String = mode match {
    case UniKMode.Adaptive => "UniK"
    case UniKMode.Single   => "UniK-single"
    case UniKMode.Multiple => "UniK-multiple"
  }
  val req: Req = Req(groups = true)

  def newState(points: Array[Array[Double]], k: Int, seed: Long): PartitionState =
    new UniKState(points, k, BallTree.build(points, capacity, seed), mode)
}

object UniKStrategy {
  val default = new UniKStrategy()
}

final class UniKState(points: Array[Array[Double]], k: Int, val tree: BallTree,
                      mode: UniKMode)
    extends PartitionState {

  private val n = points.length
  private val d = if (n == 0) 0 else points(0).length
  private val assign = Array.fill(n)(-1)
  val m = new Metrics

  private var t = 0 // #groups, fixed after iteration 1
  // Persistent bounds, indexed by node id / point index.
  private var nodeUb: Array[Double] = null
  private var nodeGlb: Array[Double] = null  // nodeCount × t
  private var nodeCluster: Array[Int] = null // -1: not a tracked object
  private var ptUb: Array[Double] = null
  private var ptGlb: Array[Double] = null    // n × t
  private val nodesById = new Array[BallNode](math.max(1, tree.nodeCount))
  locally {
    def walk(nd: BallNode): Unit = {
      if (nd != null) { nodesById(nd.id) = nd; if (!nd.isLeaf) { walk(nd.left); walk(nd.right) } }
    }
    if (tree.root != null) walk(tree.root)
  }

  // Cluster object lists: value v > 0 encodes node id v-1; v < 0 point ~v.
  private var lists: Array[scala.collection.mutable.ArrayBuffer[Int]] = null

  // Incremental refinement state.
  private val sums = Array.ofDim[Double](k, math.max(d, 1))
  private val counts = new Array[Long](k)
  private var moved = 0L
  // pending sum-vector ops applied in the refine phase
  private val opVec = new scala.collection.mutable.ArrayBuffer[Array[Double]]
  private val opNum = new scala.collection.mutable.ArrayBuffer[Long]
  private val opFrom = new scala.collection.mutable.ArrayBuffer[Int]
  private val opTo = new scala.collection.mutable.ArrayBuffer[Int]
  private val opPoint = new scala.collection.mutable.ArrayBuffer[Boolean]

  private var iter1Nanos = -1L
  private var iter2Nanos = -1L
  private var chosenSingle = true

  // scratch
  private var gMin: Array[Double] = null
  private var gMinIdx: Array[Int] = null
  private var gMin2: Array[Double] = null
  private var gScanned: Array[Boolean] = null

  def step(info: CentroidInfo): Partials = {
    if (t == 0) {
      t = info.groups.nGroups
      nodeUb = new Array[Double](tree.nodeCount)
      nodeGlb = new Array[Double](tree.nodeCount * t)
      nodeCluster = Array.fill(tree.nodeCount)(-1)
      ptUb = new Array[Double](n)
      ptGlb = new Array[Double](n * t)
      lists = Array.fill(k)(new scala.collection.mutable.ArrayBuffer[Int])
      gMin = new Array[Double](t); gMinIdx = new Array[Int](t); gMin2 = new Array[Double](t)
      gScanned = new Array[Boolean](t)
    }
    moved = 0
    opVec.clear(); opNum.clear(); opFrom.clear(); opTo.clear(); opPoint.clear()

    val useRoot = info.iter match {
      case 1 => true
      case 2 => mode == UniKMode.Multiple
      case _ =>
        mode match {
          case UniKMode.Multiple => true
          case UniKMode.Single   => false
          case UniKMode.Adaptive =>
            if (iter2Nanos >= 0) !chosenSingle else false
        }
    }

    val t0 = System.nanoTime()
    if (useRoot) rootTraversal(info) else clusterPass(info)
    val t1 = System.nanoTime()
    if (!useRoot) applyOps() // incremental refinement
    val t2 = System.nanoTime()

    if (info.iter == 1) iter1Nanos = t1 - t0
    if (info.iter == 2 && mode == UniKMode.Adaptive) {
      iter2Nanos = t1 - t0
      chosenSingle = iter2Nanos <= iter1Nanos
    }

    new Partials(Geometry.copy2(sums), counts.clone(), null, moved, n.toLong,
      m.snapshot(), t1 - t0, t2 - t1)
  }

  // ------------------------------------------------------------------
  // Root traversal: candidate filtering + (on iteration 1) bound seeding.
  // ------------------------------------------------------------------
  private def rootTraversal(info: CentroidInfo): Unit = {
    val cs = info.centroids
    val gi = info.groups
    val seed = info.iter == 1 // bounds/lists only needed before a cluster pass
    var j = 0
    while (j < k) {
      java.util.Arrays.fill(sums(j), 0.0); counts(j) = 0
      if (seed) lists(j).clear()
      j += 1
    }

    val carry0 = Array.fill(t)(Double.PositiveInfinity)

    def rec(nd: BallNode, cand: Array[Int], carry: Array[Double]): Unit = {
      m.nodeAccess += 1
      val dBuf = new Array[Double](cand.length)
      var best = -1; var d1 = Double.PositiveInfinity; var d2 = Double.PositiveInfinity
      var c = 0
      while (c < cand.length) {
        m.dist += 1
        val dd = Geometry.dist(nd.pivot, cs(cand(c)))
        dBuf(c) = dd
        if (dd < d1) { d2 = d1; d1 = dd; best = cand(c) }
        else if (dd < d2) d2 = dd
        c += 1
      }
      val thr = d1 + 2.0 * nd.radius
      var kept = 0
      c = 0
      while (c < cand.length) { if (dBuf(c) <= thr) kept += 1; c += 1 }

      if (kept == 1) {
        // whole node assigned to `best`
        bulkAssign(nd, best)
        Geometry.addTo(sums(best), nd.sv); counts(best) += nd.num
        if (seed) {
          nodeUb(nd.id) = d1
          seedGroupBounds(nodeGlb, nd.id * t, cand, dBuf, carry, best, gi)
          nodeCluster(nd.id) = best
          lists(best) += (nd.id + 1)
        }
        return
      }

      val next = new Array[Int](kept)
      val nextD = new Array[Double](kept)
      var w = 0
      c = 0
      while (c < cand.length) {
        if (dBuf(c) <= thr) { next(w) = cand(c); nextD(w) = dBuf(c); w += 1 }
        c += 1
      }

      if (nd.isLeaf) {
        var z = nd.start
        while (z < nd.end) {
          val i = tree.perm(z)
          val x = points(i)
          val pBuf = new Array[Double](next.length)
          var bj = next(0); var pd1 = Double.PositiveInfinity
          var c2 = 0
          while (c2 < next.length) {
            m.dist += 1; m.pointAccess += 1
            val dd = Geometry.dist(x, cs(next(c2)))
            pBuf(c2) = dd
            if (dd < pd1) { pd1 = dd; bj = next(c2) }
            c2 += 1
          }
          if (assign(i) != bj) { assign(i) = bj; moved += 1 }
          Geometry.addTo(sums(bj), x); counts(bj) += 1
          if (seed) {
            ptUb(i) = pd1
            // Carry degrades from the leaf pivot to the point by the point's
            // own pivot distance ψ_x = pointPsi(i) (Eq. 12 with r = 0).
            val carryHere = new Array[Double](t)
            var g = 0
            while (g < t) { carryHere(g) = carry(g) - tree.pointPsi(i); g += 1 }
            // dropped candidates at THIS node: bound via their pivot dists
            c2 = 0
            while (c2 < cand.length) {
              if (dBuf(c2) > thr) {
                val g2 = gi.of(cand(c2))
                val v = dBuf(c2) - tree.pointPsi(i)
                if (v < carryHere(g2)) carryHere(g2) = v
              }
              c2 += 1
            }
            seedGroupBounds(ptGlb, i * t, next, pBuf, carryHere, bj, gi)
            lists(bj) += -(i + 1)
          }
          z += 1
        }
        return
      }

      // internal node: recurse with per-child degraded carry
      val droppedMin = Array.fill(t)(Double.PositiveInfinity)
      c = 0
      while (c < cand.length) {
        if (dBuf(c) > thr) {
          val g2 = gi.of(cand(c))
          if (dBuf(c) < droppedMin(g2)) droppedMin(g2) = dBuf(c)
        }
        c += 1
      }
      def childCarry(child: BallNode): Array[Double] = {
        val out = new Array[Double](t)
        var g = 0
        while (g < t) {
          out(g) = math.min(carry(g), droppedMin(g)) - child.psi
          g += 1
        }
        out
      }
      rec(nd.left, next, childCarry(nd.left))
      rec(nd.right, next, childCarry(nd.right))
    }

    if (tree.root != null) rec(tree.root, Array.tabulate(k)(identity), carry0)
  }

  /** glb(g) = min( carry(g), min over scanned j∈g, j≠assigned of d(pivot,c_j) ). */
  private def seedGroupBounds(store: Array[Double], base: Int, cand: Array[Int],
                              dBuf: Array[Double], carry: Array[Double], assigned: Int,
                              gi: GroupInfo): Unit = {
    var g = 0
    while (g < t) { store(base + g) = carry(g); g += 1 }
    var c = 0
    while (c < cand.length) {
      val j = cand(c)
      if (j != assigned) {
        val g2 = gi.of(j)
        if (dBuf(c) < store(base + g2)) store(base + g2) = dBuf(c)
      }
      c += 1
    }
    m.boundUpdate += t
  }

  // ------------------------------------------------------------------
  // Cluster pass (index-single): drift-update bounds, test, split, move.
  // ------------------------------------------------------------------
  private def clusterPass(info: CentroidInfo): Unit = {
    val gi = info.groups
    val newLists = Array.fill(k)(new scala.collection.mutable.ArrayBuffer[Int])
    val stack = new scala.collection.mutable.ArrayBuffer[Int]

    var cl = 0
    while (cl < k) {
      val objs = lists(cl)
      var z = 0
      while (z < objs.length) {
        stack += objs(z)
        z += 1
      }
      while (stack.nonEmpty) {
        val obj = stack.remove(stack.length - 1)
        processObject(obj, cl, info, gi, newLists, stack)
      }
      cl += 1
    }
    lists = newLists
  }

  private def processObject(obj: Int, cl: Int, info: CentroidInfo, gi: GroupInfo,
                            newLists: Array[scala.collection.mutable.ArrayBuffer[Int]],
                            stack: scala.collection.mutable.ArrayBuffer[Int]): Unit = {
    val cs = info.centroids
    val isNode = obj > 0
    val nd = if (isNode) nodesById(obj - 1) else null
    val pi = if (isNode) -1 else -obj - 1
    val r = if (isNode) nd.radius else 0.0
    val base = if (isNode) nd.id * t else pi * t
    val bounds = if (isNode) nodeGlb else ptGlb
    val pivot = if (isNode) nd.pivot else points(pi)

    // drift-update
    var ub = (if (isNode) nodeUb(nd.id) else ptUb(pi)) + info.drifts(cl)
    var minGlb = Double.PositiveInfinity
    var g = 0
    while (g < t) {
      bounds(base + g) -= gi.maxDrift(g)
      if (bounds(base + g) < minGlb) minGlb = bounds(base + g)
      g += 1
    }
    m.boundUpdate += t + 1
    m.boundAccess += t + 1

    // Eq. 10 global test with radius margin
    if (minGlb - r > ub + r) {
      if (isNode) { nodeUb(nd.id) = ub; newLists(cl) += obj }
      else { ptUb(pi) = ub; newLists(cl) += obj }
      return
    }

    // tighten: exact distance pivot → current centroid
    m.dist += 1
    if (isNode) m.nodeAccess += 1 else m.pointAccess += 1
    val dOld = Geometry.dist(pivot, cs(cl))
    ub = dOld
    if (minGlb - r > ub + r) {
      if (isNode) { nodeUb(nd.id) = ub; newLists(cl) += obj }
      else { ptUb(pi) = ub; newLists(cl) += obj }
      return
    }

    // group scan with margin (Eq. 11)
    var d1 = dOld; var best = cl; var d2 = Double.PositiveInfinity
    var g2 = 0
    while (g2 < t) { gMin(g2) = Double.PositiveInfinity; gMinIdx(g2) = -1; gMin2(g2) = Double.PositiveInfinity; gScanned(g2) = false; g2 += 1 }
    g2 = 0
    while (g2 < t) {
      m.boundAccess += 1
      if (bounds(base + g2) - r < d1 + r) {
        gScanned(g2) = true
        val mem = gi.members(g2)
        var z = 0
        while (z < mem.length) {
          val j = mem(z)
          if (j != cl) {
            m.dist += 1
            if (!isNode) m.pointAccess += 1
            val dd = Geometry.dist(pivot, cs(j))
            if (dd < gMin(g2)) { gMin2(g2) = gMin(g2); gMin(g2) = dd; gMinIdx(g2) = j }
            else if (dd < gMin2(g2)) gMin2(g2) = dd
            if (dd < d1) { d2 = d1; d1 = dd; best = j }
            else if (dd < d2) d2 = dd
          }
          z += 1
        }
      }
      g2 += 1
    }

    if (isNode && d2 - d1 < 2.0 * r) {
      // Eq. 9 failed: split the node, children inherit bounds via ψ (Eq. 12)
      nodeCluster(nd.id) = -1
      pushOp(nd.sv, nd.num, cl, -1, isPoint = false) // remove node sv from cl
      if (nd.isLeaf) {
        var z = nd.start
        while (z < nd.end) {
          val i = tree.perm(z)
          ptUb(i) = ub + tree.pointPsi(i)
          var g3 = 0
          while (g3 < t) { ptGlb(i * t + g3) = bounds(base + g3) - tree.pointPsi(i); g3 += 1 }
          m.boundUpdate += t + 1
          // point keeps cluster cl until its own test says otherwise; its
          // vector must re-enter cl's sums (the node sv covered it before)
          pushOp(points(i), 1, -1, cl, isPoint = true)
          stack += -(i + 1)
          z += 1
        }
      } else {
        def inherit(child: BallNode): Unit = {
          nodeUb(child.id) = ub + child.psi
          var g3 = 0
          while (g3 < t) { nodeGlb(child.id * t + g3) = bounds(base + g3) - child.psi; g3 += 1 }
          m.boundUpdate += t + 1
          nodeCluster(child.id) = cl
          pushOp(child.sv, child.num, -1, cl, isPoint = false)
          stack += (child.id + 1)
        }
        inherit(nd.left)
        inherit(nd.right)
      }
      return
    }

    // assigned (node with enough gap, or point)
    if (best != cl) {
      if (isNode) {
        pushOp(nd.sv, nd.num, cl, best, isPoint = false)
        bulkAssign(nd, best)
        nodeCluster(nd.id) = best
      } else {
        pushOp(points(pi), 1, cl, best, isPoint = true)
        if (assign(pi) != best) { assign(pi) = best; moved += 1 }
      }
      // fold the old centroid's exact distance into its group bound
      val gOld = gi.of(cl)
      if (dOld < gMin(gOld)) { gMin2(gOld) = gMin(gOld); gMin(gOld) = dOld; gMinIdx(gOld) = cl }
      else if (dOld < gMin2(gOld)) gMin2(gOld) = dOld
    }
    // Scanned groups now have EXACT member distances (minus the assignee):
    // overwrite their bounds with the exact min. An unscanned group that
    // regains the old centroid may only take a min with its stored bound.
    val gOldGrp = gi.of(cl)
    var g4 = 0
    while (g4 < t) {
      val candidate = if (gMinIdx(g4) == best) gMin2(g4) else gMin(g4)
      if (gScanned(g4)) {
        bounds(base + g4) = candidate; m.boundUpdate += 1
      } else if (g4 == gOldGrp && best != cl && candidate < bounds(base + g4)) {
        bounds(base + g4) = candidate; m.boundUpdate += 1
      }
      g4 += 1
    }
    if (isNode) { nodeUb(nd.id) = d1 } else { ptUb(pi) = d1 }
    m.boundUpdate += 1
    newLists(best) += obj
  }

  private def bulkAssign(nd: BallNode, j: Int): Unit = {
    var z = nd.start
    while (z < nd.end) {
      val i = tree.perm(z)
      if (assign(i) != j) { assign(i) = j; moved += 1 }
      z += 1
    }
  }

  private def pushOp(vec: Array[Double], num: Long, from: Int, to: Int, isPoint: Boolean): Unit = {
    opVec += vec; opNum += num; opFrom += from; opTo += to; opPoint += isPoint
  }

  private def applyOps(): Unit = {
    var z = 0
    while (z < opVec.length) {
      val v = opVec(z)
      if (opFrom(z) >= 0) { Geometry.subFrom(sums(opFrom(z)), v); counts(opFrom(z)) -= opNum(z) }
      if (opTo(z) >= 0) { Geometry.addTo(sums(opTo(z)), v); counts(opTo(z)) += opNum(z) }
      if (opPoint(z)) m.pointAccess += 1
      z += 1
    }
  }

  def finalSse(centroids: Array[Array[Double]]): Double = {
    var s = 0.0; var i = 0
    while (i < n) { s += Geometry.distSq(points(i), centroids(assign(i))); i += 1 }
    s
  }

  def assignments: Array[Int] = assign.clone()
}
