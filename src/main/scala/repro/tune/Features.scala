package repro.tune

import repro.index.BallTree

/** Meta-features of a clustering task (Table 1): basic (n, k, d), tree-level
  * (height, node counts, imbalance), and leaf-level (radius, parent
  * distance ψ, covered points) statistics of the built Ball-tree, each
  * normalized exactly as the paper's "Normalize" column prescribes.
  */
object Features {

  val basicNames: Seq[String] = Seq("n", "k", "d")
  val treeNames: Seq[String] = Seq("h", "nInternal", "nLeaf", "muH", "sigmaH")
  val leafNames: Seq[String] = Seq("muR", "sigmaR", "muPsi", "sigmaPsi", "muLp", "sigmaLp")
  val allNames: Seq[String] = basicNames ++ treeNames ++ leafNames

  /** Index ranges into the feature vector for the three Table-5 ablations. */
  val basicSlice: Range = 0 until 3
  val treeSlice: Range = 0 until 8
  val leafSlice: Range = 0 until 14

  def extract(n: Int, k: Int, d: Int, tree: BallTree): Array[Double] = {
    val f = tree.capacity.toDouble
    val leaves = tree.leaves
    val denomH = math.max(1.0, math.log(math.max(2.0, n / f)) / math.log(2.0))
    val denomN = math.max(1.0, n / f)
    val rootR = if (tree.root == null || tree.root.radius == 0) 1.0 else tree.root.radius

    def stats(xs: Seq[Double]): (Double, Double) =
      if (xs.isEmpty) (0.0, 0.0)
      else {
        val mu = xs.sum / xs.size
        val s2 = xs.map(x => (x - mu) * (x - mu)).sum / xs.size
        (mu, math.sqrt(s2))
      }

    val heights = leaves.map(_.height.toDouble)
    val radii = leaves.map(_.radius)
    val psis = leaves.map(_.psi)
    val lps = leaves.map(_.num.toDouble)
    val (muH, sdH) = stats(heights)
    val (muR, sdR) = stats(radii)
    val (muPsi, sdPsi) = stats(psis)
    val (muLp, sdLp) = stats(lps)
    val depth = if (heights.isEmpty) 0.0 else heights.max

    Array(
      // basic (log-scaled so tree models split sensibly and linear models behave)
      math.log1p(n.toDouble),
      math.log1p(k.toDouble),
      math.log1p(d.toDouble),
      // tree
      depth / denomH,
      (tree.nodeCount - tree.leafCount) / denomN,
      tree.leafCount / denomN,
      muH / denomH,
      sdH / denomH,
      // leaf
      muR / rootR,
      sdR / rootR,
      muPsi / rootR,
      sdPsi / rootR,
      muLp / f,
      sdLp / f
    )
  }
}
