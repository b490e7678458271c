package repro.tasks

import scala.util.Random

import repro.util.{LinAlg, Stats}

/** Deterministic in-memory learners backing the predictive tasks.
  *
  * The paper trains scikit-learn random forests / AutoML pipelines; the
  * search only observes the resulting utility scalar, so any deterministic
  * learner with the same qualitative behaviour (utility rises when a
  * predictive column is added, is flat for irrelevant ones) preserves the
  * experiment. Missing values (failed joins) are mean-imputed.
  */
object Learners {

  /** Dense design matrix from optional feature columns with mean
    * imputation for missing entries (failed joins).
    */
  def designMatrix(features: Vector[Array[Option[Double]]]): Array[Array[Double]] = {
    val n = if (features.isEmpty) 0 else features.head.length
    val means = features.map { col =>
      val present = col.flatten
      if (present.isEmpty) 0.0 else present.sum / present.length
    }
    Array.tabulate(n) { i =>
      features.indices.map(j => features(j)(i).getOrElse(means(j))).toArray
    }
  }

  /** Deterministic train/validation split by row-index hash. */
  def split(n: Int, validFrac: Double, seed: Long): (Array[Int], Array[Int]) = {
    val rnd = new Random(seed)
    val shuffled = rnd.shuffle((0 until n).toVector)
    val nValid = math.max(1, (n * validFrac).toInt)
    (shuffled.drop(nValid).toArray.sorted, shuffled.take(nValid).toArray.sorted)
  }

  // ---------------------------------------------------------------- forest

  /** One node of a depth-bounded CART tree. */
  sealed trait Node
  final case class Leaf(value: Double) extends Node
  final case class Split(feature: Int, threshold: Double, left: Node, right: Node) extends Node

  /** A bagged ensemble of depth-bounded variance-reduction trees — the
    * random-forest-lite used by classification ([0,1] targets, majority
    * leaf) and regression (mean leaf) tasks.
    */
  final case class Forest(trees: Vector[Node]) {
    def predictRow(x: Array[Double]): Double = {
      var s = 0.0
      trees.foreach { t => s += eval(t, x) }
      s / trees.length
    }

    private def eval(node: Node, x: Array[Double]): Double = node match {
      case Leaf(v) => v
      case Split(f, thr, l, r) => if (x(f) <= thr) eval(l, x) else eval(r, x)
    }
  }

  final case class ForestConfig(
      nTrees: Int = 12,
      maxDepth: Int = 3,
      minLeaf: Int = 5,
      featureFrac: Double = 0.7,
      seed: Long = 11,
  )

  def trainForest(x: Array[Array[Double]], y: Array[Double], cfg: ForestConfig = ForestConfig()): Forest = {
    require(x.length == y.length && x.nonEmpty, "empty or mismatched training data")
    val nFeat = x.head.length
    val trees = (0 until cfg.nTrees).map { t =>
      val rnd = new Random(cfg.seed * 1013904223L + t)
      val rows = Array.fill(x.length)(rnd.nextInt(x.length))
      val feats = rnd
        .shuffle((0 until nFeat).toVector)
        .take(math.max(1, math.ceil(nFeat * cfg.featureFrac).toInt))
      grow(x, y, rows, feats, cfg, depth = 0, rnd)
    }.toVector
    Forest(trees)
  }

  private def grow(
      x: Array[Array[Double]], y: Array[Double],
      rows: Array[Int], feats: Vector[Int],
      cfg: ForestConfig, depth: Int, rnd: Random,
  ): Node = {
    val ys = rows.map(y)
    val meanY = Stats.mean(ys)
    if (depth >= cfg.maxDepth || rows.length < 2 * cfg.minLeaf || Stats.std(ys) < 1e-9)
      return Leaf(meanY)

    // Best split over quartile thresholds of each candidate feature.
    var best: Option[(Int, Double, Double)] = None // (feature, threshold, score)
    val parentSse = ys.map(v => (v - meanY) * (v - meanY)).sum
    feats.foreach { f =>
      val vals = rows.map(i => x(i)(f)).sorted
      val thresholds = Vector(0.25, 0.5, 0.75).map(q => vals(math.min(vals.length - 1, (q * vals.length).toInt))).distinct
      thresholds.foreach { thr =>
        val (l, r) = rows.partition(i => x(i)(f) <= thr)
        if (l.length >= cfg.minLeaf && r.length >= cfg.minLeaf) {
          val ml = Stats.mean(l.map(y)); val mr = Stats.mean(r.map(y))
          val sse = l.map(i => (y(i) - ml) * (y(i) - ml)).sum + r.map(i => (y(i) - mr) * (y(i) - mr)).sum
          val gain = parentSse - sse
          if (best.forall(_._3 < gain) && gain > 1e-12) best = Some((f, thr, gain))
        }
      }
    }
    best match {
      case None => Leaf(meanY)
      case Some((f, thr, _)) =>
        val (l, r) = rows.partition(i => x(i)(f) <= thr)
        Split(f, thr, grow(x, y, l, feats, cfg, depth + 1, rnd), grow(x, y, r, feats, cfg, depth + 1, rnd))
    }
  }

  // ----------------------------------------------------------------- ridge

  /** Ridge regression with intercept (features standardised internally). */
  final case class RidgeModel(weights: Array[Double], intercept: Double, means: Array[Double], stds: Array[Double]) {
    def predictRow(x: Array[Double]): Double = {
      var s = intercept
      var j = 0
      while (j < weights.length) {
        val std = if (stds(j) < 1e-12) 1.0 else stds(j)
        s += weights(j) * ((x(j) - means(j)) / std)
        j += 1
      }
      s
    }
  }

  def trainRidge(x: Array[Array[Double]], y: Array[Double], lambda: Double = 1.0): RidgeModel = {
    require(x.nonEmpty, "empty training data")
    val p = x.head.length
    val means = Array.tabulate(p)(j => Stats.mean(x.map(_(j))))
    val stds = Array.tabulate(p)(j => Stats.std(x.map(_(j))))
    val xs = x.map(row => Array.tabulate(p)(j => (row(j) - means(j)) / (if (stds(j) < 1e-12) 1.0 else stds(j))))
    val my = Stats.mean(y)
    val w = if (p == 0) Array.empty[Double] else LinAlg.ridge(xs, y.map(_ - my), lambda)
    RidgeModel(w, my, means, stds)
  }
}
