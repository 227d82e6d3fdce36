package repro.index

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{Geometry, TestData}

class KdTreeSpec extends AnyFunSuite {

  private val pts = TestData.mixture(400, 5, 8, 0.04, 51L)
  private val tree = KdTree.build(pts)

  test("bounding boxes contain their points") {
    def check(nd: KdNode): Unit = {
      var z = nd.start
      while (z < nd.end) {
        val x = pts(tree.perm(z))
        x.indices.foreach { i =>
          assert(x(i) >= nd.lo(i) - 1e-12 && x(i) <= nd.hi(i) + 1e-12)
        }
        z += 1
      }
      if (!nd.isLeaf) { check(nd.left); check(nd.right) }
    }
    check(tree.root)
  }

  test("sum vectors are exact") {
    def check(nd: KdNode): Unit = {
      val sv = new Array[Double](pts(0).length)
      var z = nd.start
      while (z < nd.end) { Geometry.addTo(sv, pts(tree.perm(z))); z += 1 }
      sv.indices.foreach(i => assert(math.abs(sv(i) - nd.sv(i)) < 1e-9))
      if (!nd.isLeaf) { check(nd.left); check(nd.right) }
    }
    check(tree.root)
  }

  test("leaves hold single points (no capacity parameter)") {
    def leaves(nd: KdNode): Seq[KdNode] =
      if (nd.isLeaf) Seq(nd) else leaves(nd.left) ++ leaves(nd.right)
    // duplicates may share a leaf; on this continuous data all leaves are singletons
    assert(leaves(tree.root).forall(_.num == 1))
  }

  test("kd-tree has many more nodes than a capacity-30 Ball-tree") {
    val ball = BallTree.build(pts, capacity = 30)
    assert(tree.nodeCount > ball.nodeCount * 3,
      s"kd ${tree.nodeCount} vs ball ${ball.nodeCount}")
  }

  test("duplicate-heavy input terminates with multi-point leaves") {
    val dup = Array.fill(64)(Array(1.0, 2.0, 3.0))
    val t = KdTree.build(dup)
    assert(t.root.num == 64)
  }
}
