package repro.ml

import repro.tensor._

/** Gradient-boosted regression trees: a small histogram-based trainer plus
  * Hummingbird-style tensor inference.
  *
  * The paper's §6.7 experiment embeds a trained GBT (128 trees, depth 8)
  * into a SQL query. No sklearn/MLlib exists in this container, so the
  * trainer is implemented here (squared loss, greedy splits over 64-bin
  * feature histograms); inference follows Hummingbird's tree-traversal
  * compilation: each tree is a perfect binary tree stored as arrays, and a
  * batch of rows descends all trees level-by-level with vectorized
  * gather/compare ops — no per-row control flow (DC1).
  */
final case class Tree(feature: Array[Int], threshold: Array[Double], leaf: Array[Double], depth: Int)

final case class GbtModel(trees: Array[Tree], bias: Double, learningRate: Double) {

  /** Tensor inference: level-synchronous traversal over all rows. */
  def predict(features: Array[F64Tensor]): F64Tensor = {
    val n = features.headOption.map(_.length).getOrElse(0)
    val out = new Array[Double](n)
    java.util.Arrays.fill(out, bias)
    trees.foreach { t =>
      val idx = new Array[Int](n)
      var level = 0
      while (level < t.depth) {
        // One vectorized gather+compare per level (Hummingbird GEMM-free mode).
        ExecCtx.current.device.parallelRanges(n) { (s, e) =>
          var i = s
          while (i < e) {
            val node = idx(i)
            val f = t.feature(node)
            idx(i) = 2 * node + (if (features(f).data(i) < t.threshold(node)) 1 else 2)
            i += 1
          }
        }
        Profile.rec("treeLevel", OpClass.Gather, n, n * 21L)
        level += 1
      }
      val base = (1 << t.depth) - 1
      ExecCtx.current.device.parallelRanges(n) { (s, e) =>
        var i = s
        while (i < e) { out(i) += learningRate * t.leaf(idx(i) - base); i += 1 }
      }
      Profile.rec("treeLeaf", OpClass.Gather, n, n * 16L)
    }
    F64Tensor(out)
  }

  /** Row-at-a-time traversal (the Spark/MLlib-style baseline). */
  def predictRow(row: Array[Double]): Double = {
    var acc = bias
    trees.foreach { t =>
      var node = 0
      var level = 0
      while (level < t.depth) {
        node = 2 * node + (if (row(t.feature(node)) < t.threshold(node)) 1 else 2)
        level += 1
      }
      acc += learningRate * t.leaf(node - ((1 << t.depth) - 1))
    }
    acc
  }
}

object Gbt {

  private val Bins = 64

  /** Fit a squared-loss GBT: each round fits one depth-limited tree to the
    * residuals with greedy variance-reduction splits on binned features.
    */
  def fit(features: Array[Array[Double]], target: Array[Double],
          nTrees: Int = 128, depth: Int = 8, learningRate: Double = 0.1,
          seed: Long = 0): GbtModel = {
    val n = target.length
    val nf = features.length
    require(features.forall(_.length == n), "ragged features")

    // Quantize features once: bin edges from per-feature min/max.
    val mins = features.map(f => if (n == 0) 0.0 else f.min)
    val maxs = features.map(f => if (n == 0) 1.0 else f.max)
    val binned = Array.tabulate(nf) { fi =>
      val lo = mins(fi); val span = math.max(maxs(fi) - lo, 1e-12)
      features(fi).map(v => math.min(Bins - 1, ((v - lo) / span * Bins).toInt))
    }
    def unbin(fi: Int, b: Int): Double =
      mins(fi) + (b + 1).toDouble / Bins * math.max(maxs(fi) - mins(fi), 1e-12)

    val bias = if (n == 0) 0.0 else target.sum / n
    val residual = target.map(_ - bias)
    val trees = new Array[Tree](nTrees)

    var t = 0
    while (t < nTrees) {
      val tree = fitTree(binned, residual, depth, unbin)
      // Update residuals with this tree's (shrunk) predictions.
      val nodeOf = assign(binned, tree)
      val base = (1 << depth) - 1
      var i = 0
      while (i < n) { residual(i) -= learningRate * tree.leaf(nodeOf(i) - base); i += 1 }
      trees(t) = tree
      t += 1
    }
    GbtModel(trees, bias, learningRate)
  }

  private def assign(binned: Array[Array[Int]], t: Tree): Array[Int] = {
    val n = if (binned.isEmpty) 0 else binned(0).length
    val idx = new Array[Int](n)
    var level = 0
    while (level < t.depth) {
      var i = 0
      while (i < n) {
        val node = idx(i)
        val f = t.feature(node)
        val go = binned(f)(i).toDouble < binThresholdToBin(t, node)
        idx(i) = 2 * node + (if (go) 1 else 2)
        i += 1
      }
      level += 1
    }
    idx
  }

  // The trainer stores real-valued thresholds; training-side assignment uses
  // the bin-space image cached alongside.
  private val binSpace = new java.util.IdentityHashMap[Tree, Array[Double]]()
  private def binThresholdToBin(t: Tree, node: Int): Double = binSpace.get(t)(node)

  private def fitTree(binned: Array[Array[Int]], grad: Array[Double], depth: Int,
                      unbin: (Int, Int) => Double): Tree = {
    val n = grad.length
    val nf = binned.length
    val nInternal = (1 << depth) - 1
    val feature = new Array[Int](nInternal)
    val thr     = new Array[Double](nInternal)
    val thrBin  = new Array[Double](nInternal)
    val leaf    = new Array[Double](1 << depth)

    val nodeOf = new Array[Int](n) // current node per row, level by level
    var level = 0
    var levelStart = 0
    while (level < depth) {
      val levelNodes = 1 << level
      // Per node on this level: histogram of (sum, count) per (feature, bin).
      val sums = Array.ofDim[Double](levelNodes, nf, Bins)
      val cnts = Array.ofDim[Int](levelNodes, nf, Bins)
      var i = 0
      while (i < n) {
        val local = nodeOf(i) - (levelStart - 0)
        if (local >= 0 && local < levelNodes) {
          var f = 0
          while (f < nf) {
            sums(local)(f)(binned(f)(i)) += grad(i)
            cnts(local)(f)(binned(f)(i)) += 1
            f += 1
          }
        }
        i += 1
      }
      // Choose the best split per node (max variance reduction).
      var node = 0
      while (node < levelNodes) {
        val abs = levelStart + node
        var bestGain = 0.0
        var bestF = 0
        var bestB = Bins / 2
        var f = 0
        while (f < nf) {
          var leftSum = 0.0; var leftCnt = 0
          var totSum = 0.0; var totCnt = 0
          var b = 0
          while (b < Bins) { totSum += sums(node)(f)(b); totCnt += cnts(node)(f)(b); b += 1 }
          b = 0
          while (b < Bins - 1) {
            leftSum += sums(node)(f)(b); leftCnt += cnts(node)(f)(b)
            val rightCnt = totCnt - leftCnt
            if (leftCnt > 0 && rightCnt > 0) {
              val rightSum = totSum - leftSum
              val gain = leftSum * leftSum / leftCnt + rightSum * rightSum / rightCnt -
                totSum * totSum / math.max(totCnt, 1)
              if (gain > bestGain) { bestGain = gain; bestF = f; bestB = b }
            }
            b += 1
          }
          f += 1
        }
        feature(abs) = bestF
        thrBin(abs)  = bestB + 1.0 // rows with bin < thrBin go left
        thr(abs)     = unbin(bestF, bestB)
        node += 1
      }
      // Re-descend every row from the root with the splits chosen so far
      // (simple and correct; nodeOf holds absolute node ids).
      i = 0
      while (i < n) {
        var cur = 0
        var l = 0
        while (l <= level) {
          val f = feature(cur)
          cur = 2 * cur + (if (binned(f)(i) < thrBin(cur)) 1 else 2)
          l += 1
        }
        nodeOf(i) = cur
        i += 1
      }
      levelStart = levelStart * 2 + 1
      level += 1
    }

    // Leaves: mean gradient per reached leaf.
    val base = nInternal
    val leafSum = new Array[Double](1 << depth)
    val leafCnt = new Array[Int](1 << depth)
    var i = 0
    while (i < n) {
      val l = nodeOf(i) - base
      leafSum(l) += grad(i); leafCnt(l) += 1
      i += 1
    }
    var l = 0
    while (l < leaf.length) { leaf(l) = if (leafCnt(l) == 0) 0.0 else leafSum(l) / leafCnt(l); l += 1 }

    val t = Tree(feature, thr, leaf, depth)
    binSpace.put(t, thrBin)
    t
  }
}
