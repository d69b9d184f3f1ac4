package repro.ml

/** CART-style regression tree with variance-reduction splits.
  *
  * Candidate thresholds come from per-feature quantiles of the node's rows
  * (at most `bins` per feature) — exact enough for cost-model data while
  * keeping depth-15 trees (the paper's decision-tree setting) fast.
  */
object RegressionTree {

  sealed trait Node extends Serializable
  final case class Leaf(value: Double) extends Node
  final case class Split(feature: Int, threshold: Double, left: Node, right: Node) extends Node

  final case class Model(root: Node) extends Regressor {
    override def predict(x: Array[Double]): Double = {
      var n = root
      while (true) {
        n match {
          case Leaf(v)                => return v
          case Split(f, t, l, r)      => n = if (x(f) <= t) l else r
        }
      }
      0.0 // unreachable
    }
  }
}

final case class RegressionTree(
    maxDepth: Int = 15,
    minLeaf: Int = 2,
    bins: Int = 32,
    /** If set, consider only this many randomly chosen features per split (for forests). */
    featureSubset: Option[Int] = None,
    seed: Long = 17,
) extends Trainer {
  import RegressionTree._

  override def name: String = "Decision Tree"

  override def fit(xs: Array[Array[Double]], ys: Array[Double]): Model = {
    require(xs.nonEmpty, "empty training set")
    val rng = new scala.util.Random(seed)
    Model(build(xs, ys, xs.indices.toArray, 0, rng))
  }

  private def mean(ys: Array[Double], idx: Array[Int]): Double = {
    var s = 0.0; var i = 0
    while (i < idx.length) { s += ys(idx(i)); i += 1 }
    s / idx.length
  }

  private def sse(ys: Array[Double], idx: Array[Int]): Double = {
    val m = mean(ys, idx)
    var s = 0.0; var i = 0
    while (i < idx.length) { val d = ys(idx(i)) - m; s += d * d; i += 1 }
    s
  }

  private def build(
      xs: Array[Array[Double]], ys: Array[Double], idx: Array[Int],
      depth: Int, rng: scala.util.Random): Node = {
    if (depth >= maxDepth || idx.length < 2 * minLeaf) return Leaf(mean(ys, idx))
    val parentSse = sse(ys, idx)
    if (parentSse < 1e-12) return Leaf(mean(ys, idx))

    val d = xs(0).length
    val feats: Array[Int] = featureSubset match {
      case Some(k) if k < d => rng.shuffle((0 until d).toList).take(k).toArray
      case _                => (0 until d).toArray
    }

    var bestGain = 0.0
    var bestFeat = -1
    var bestThr = 0.0
    for (f <- feats) {
      val vals = idx.map(i => xs(i)(f)).sorted
      // quantile thresholds (midpoints between distinct neighbours)
      val cand = (1 until bins).iterator
        .map(b => vals((b * (vals.length - 1)) / bins))
        .distinct
        .toArray
      for (thr <- cand) {
        var ln = 0; var ls = 0.0; var lss = 0.0
        var rn = 0; var rs = 0.0; var rss = 0.0
        var i = 0
        while (i < idx.length) {
          val y = ys(idx(i))
          if (xs(idx(i))(f) <= thr) { ln += 1; ls += y; lss += y * y }
          else { rn += 1; rs += y; rss += y * y }
          i += 1
        }
        if (ln >= minLeaf && rn >= minLeaf) {
          val childSse = (lss - ls * ls / ln) + (rss - rs * rs / rn)
          val gain = parentSse - childSse
          if (gain > bestGain) { bestGain = gain; bestFeat = f; bestThr = thr }
        }
      }
    }
    if (bestFeat < 0) return Leaf(mean(ys, idx))
    val (li, ri) = idx.partition(i => xs(i)(bestFeat) <= bestThr)
    Split(bestFeat, bestThr, build(xs, ys, li, depth + 1, rng), build(xs, ys, ri, depth + 1, rng))
  }
}
