package repro.core

import scala.util.Random

/** Algorithm 2: ε-cover of the candidate augmentations in profile space.
  *
  * Greedy k-center (Gonzalez) that keeps adding centers until every
  * augmentation is within `epsilon` of its center under the paper's
  * distance `d(P1, P2) = max_i |r1_i − r2_i|` (L∞ over profile values).
  */
object ClusterPartition {

  /** L∞ distance between two profile vectors. */
  def distance(a: Array[Double], b: Array[Double]): Double = {
    require(a.length == b.length, "profile dimension mismatch")
    var m = 0.0
    var i = 0
    while (i < a.length) { m = math.max(m, math.abs(a(i) - b(i))); i += 1 }
    m
  }

  /** A partition of candidate indices into clusters around center indices. */
  final case class Clustering(centers: Vector[Int], assignment: Array[Int]) {
    def nClusters: Int = centers.length
    def clusterOf(i: Int): Int = assignment(i)
    def members(c: Int): Vector[Int] = assignment.indices.filter(assignment(_) == c).toVector
  }

  /** Partition `vectors` into clusters of radius ≤ epsilon. Deterministic
    * given `seed` (the paper picks the first center at random).
    */
  def cluster(vectors: Vector[Array[Double]], epsilon: Double, seed: Long = 7): Clustering = {
    require(vectors.nonEmpty, "nothing to cluster")
    require(epsilon > 0, "epsilon must be positive")
    val n = vectors.length
    val rnd = new Random(seed)
    var centers = Vector(rnd.nextInt(n))
    val assignment = Array.fill(n)(0)
    val distToCenter = Array.tabulate(n)(i => distance(vectors(i), vectors(centers.head)))

    var farthest = distToCenter.indices.maxBy(distToCenter)
    while (distToCenter(farthest) > epsilon) {
      val c = farthest
      centers = centers :+ c
      val ci = centers.length - 1
      var i = 0
      while (i < n) {
        val d = distance(vectors(i), vectors(c))
        if (d < distToCenter(i)) { distToCenter(i) = d; assignment(i) = ci }
        i += 1
      }
      farthest = distToCenter.indices.maxBy(distToCenter)
    }
    Clustering(centers, assignment)
  }

  /** The "no clustering" degenerate partition (ablation variant Nc). */
  def singletons(n: Int): Clustering =
    Clustering((0 until n).toVector, Array.tabulate(n)(identity))
}
