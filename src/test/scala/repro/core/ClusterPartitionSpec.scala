package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}

import repro.PropSupport

class ClusterPartitionSpec extends AnyFunSuite with PropSupport {

  private val vecGen: Gen[Array[Double]] = Gen.listOfN(3, Gen.choose(0.0, 1.0)).map(_.toArray)

  test("distance is L-infinity") {
    assert(ClusterPartition.distance(Array(0.0, 0.5), Array(0.3, 0.6)) == 0.3)
  }

  test("distance rejects mismatched dimensions") {
    intercept[IllegalArgumentException](ClusterPartition.distance(Array(0.0), Array(0.0, 1.0)))
  }

  test("distance is symmetric and zero on identical vectors") {
    checkProp(Prop.forAll(vecGen, vecGen) { (a, b) =>
      ClusterPartition.distance(a, b) == ClusterPartition.distance(b, a) &&
        ClusterPartition.distance(a, a) == 0.0
    })
  }

  test("every point ends within epsilon of its center (the ε-cover invariant)") {
    checkProp(Prop.forAll(Gen.listOfN(40, vecGen), Gen.choose(0.05, 0.5)) { (vs, eps) =>
      val vectors = vs.toVector
      val c = ClusterPartition.cluster(vectors, eps, seed = 3)
      vectors.indices.forall { i =>
        ClusterPartition.distance(vectors(i), vectors(c.centers(c.clusterOf(i)))) <= eps + 1e-12
      }
    })
  }

  test("assignment is a partition (every point assigned to an existing cluster)") {
    checkProp(Prop.forAll(Gen.listOfN(30, vecGen)) { vs =>
      val c = ClusterPartition.cluster(vs.toVector, 0.2, seed = 5)
      vs.indices.forall(i => c.clusterOf(i) >= 0 && c.clusterOf(i) < c.nClusters) &&
        (0 until c.nClusters).map(c.members(_).size).sum == vs.size
    })
  }

  test("identical vectors collapse to one cluster") {
    val vs = Vector.fill(10)(Array(0.4, 0.4))
    val c = ClusterPartition.cluster(vs, 0.05)
    assert(c.nClusters == 1)
    assert(c.members(0).size == 10)
  }

  test("well-separated groups get separate clusters") {
    val vs = Vector.fill(5)(Array(0.0, 0.0)) ++ Vector.fill(5)(Array(1.0, 1.0))
    val c = ClusterPartition.cluster(vs, 0.1)
    assert(c.nClusters == 2)
    assert(c.members(c.clusterOf(0)).toSet == Set(0, 1, 2, 3, 4))
  }

  test("smaller epsilon gives at least as many clusters") {
    val rnd = new scala.util.Random(11)
    val vs = Vector.fill(60)(Array(rnd.nextDouble(), rnd.nextDouble()))
    val coarse = ClusterPartition.cluster(vs, 0.4, seed = 1).nClusters
    val fine = ClusterPartition.cluster(vs, 0.05, seed = 1).nClusters
    assert(fine >= coarse)
  }

  test("clustering is deterministic in the seed") {
    val rnd = new scala.util.Random(12)
    val vs = Vector.fill(30)(Array(rnd.nextDouble(), rnd.nextDouble()))
    val a = ClusterPartition.cluster(vs, 0.2, seed = 9)
    val b = ClusterPartition.cluster(vs, 0.2, seed = 9)
    assert(a.centers == b.centers && a.assignment.toSeq == b.assignment.toSeq)
  }

  test("cluster count is bounded by the ε-packing bound (Lemma 2 shape)") {
    val rnd = new scala.util.Random(13)
    val vs = Vector.fill(200)(Array(rnd.nextDouble()))
    val eps = 0.1
    val c = ClusterPartition.cluster(vs, eps, seed = 2)
    // 1-D unit interval: centers are pairwise > eps apart → at most 1/eps + 1.
    assert(c.nClusters <= (1.0 / eps).toInt + 1)
  }

  test("centers are pairwise more than epsilon apart") {
    val rnd = new scala.util.Random(14)
    val vs = Vector.fill(80)(Array(rnd.nextDouble(), rnd.nextDouble()))
    val eps = 0.15
    val c = ClusterPartition.cluster(vs, eps, seed = 4)
    for (i <- c.centers.indices; j <- c.centers.indices if i < j)
      assert(ClusterPartition.distance(vs(c.centers(i)), vs(c.centers(j))) > eps)
  }

  test("singletons puts every candidate in its own cluster") {
    val c = ClusterPartition.singletons(5)
    assert(c.nClusters == 5)
    (0 until 5).foreach(i => assert(c.clusterOf(i) == i && c.members(i) == Vector(i)))
  }

  test("cluster rejects empty input and non-positive epsilon") {
    intercept[IllegalArgumentException](ClusterPartition.cluster(Vector.empty, 0.1))
    intercept[IllegalArgumentException](ClusterPartition.cluster(Vector(Array(0.1)), 0.0))
  }
}
