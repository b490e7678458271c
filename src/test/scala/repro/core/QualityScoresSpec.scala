package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.profile.Profiles

class QualityScoresSpec extends AnyFunSuite {

  private val names = Vector("corr", "mi", "embed", "meta", "overlap")

  /** n candidates with given profile vectors. */
  private def setup(vectors: Vector[Array[Double]], epsilon: Double = 0.2) = {
    val cands = vectors.indices.map(i => Candidate(i, Vector(JoinEdge("key", s"t$i", "key")), "v")).toVector
    val profiles = Profiles(names, vectors.indices.map(i => i -> vectors(i)).toMap)
    val clustering = ClusterPartition.cluster(vectors, epsilon, seed = 1)
    (cands, profiles, new QualityScores(profiles, cands, clustering))
  }

  test("initial weights are uniform and scores equal mean profile value") {
    val (cands, _, qs) = setup(Vector(Array(1.0, 0.0, 0.0, 0.0, 0.0), Array(0.2, 0.2, 0.2, 0.2, 0.2)))
    assert(qs.weightsSnapshot.toSeq == Seq.fill(5)(0.2))
    assert(math.abs(qs.profileScore(cands(0)) - 0.2) < 1e-12)
    assert(math.abs(qs.profileScore(cands(1)) - 0.2) < 1e-12)
  }

  test("utility score of an observed candidate is its recorded gain") {
    val (cands, _, qs) = setup(Vector(Array(0.5, 0.5, 0.5, 0.5, 0.5), Array(0.9, 0.9, 0.9, 0.9, 0.9)))
    qs.record(cands(0), 0.3)
    assert(qs.utilityScore(cands(0)) == 0.3)
  }

  test("negative gains are clamped to zero") {
    val (cands, _, qs) = setup(Vector(Array(0.5, 0.5, 0.5, 0.5, 0.5)))
    qs.record(cands(0), -0.4)
    assert(qs.utilityScore(cands(0)) == 0.0)
  }

  test("gain propagates to cluster mates scaled by (1 - distance)") {
    val a = Array(0.50, 0.5, 0.5, 0.5, 0.5)
    val b = Array(0.55, 0.5, 0.5, 0.5, 0.5) // same cluster at eps=0.2, d=0.05
    val (cands, _, qs) = setup(Vector(a, b))
    qs.record(cands(0), 0.4)
    assert(math.abs(qs.utilityScore(cands(1)) - 0.95 * 0.4) < 1e-9)
  }

  test("no propagation across clusters") {
    val (cands, _, qs) = setup(Vector(Array(0.1, 0.1, 0.1, 0.1, 0.1), Array(0.9, 0.9, 0.9, 0.9, 0.9)))
    qs.record(cands(0), 0.4)
    assert(qs.utilityScore(cands(1)) == 0.0)
  }

  test("inhomogeneous clusters stop propagating (P2 fallback)") {
    val close = Vector(
      Array(0.50, 0.5, 0.5, 0.5, 0.5),
      Array(0.52, 0.5, 0.5, 0.5, 0.5),
      Array(0.54, 0.5, 0.5, 0.5, 0.5),
    )
    val (cands, _, qs) = setup(close)
    qs.record(cands(0), 0.5)
    qs.record(cands(1), 0.0) // disagreement 0.5 > tolerance → flag
    assert(qs.isInhomogeneous(0) || qs.isInhomogeneous(1) || qs.isInhomogeneous(2))
    assert(qs.utilityScore(cands(2)) == 0.0)
  }

  test("weights refit identifies the informative profile (Lemma 4 shape)") {
    val rnd = new scala.util.Random(21)
    val vectors = Vector.fill(40)(Array.fill(5)(rnd.nextDouble()))
    val (cands, _, qs) = setup(vectors, epsilon = 0.01)
    // Gain is exactly the corr profile (index 0): importance should concentrate there.
    vectors.indices.foreach(i => qs.record(cands(i), vectors(i)(0)))
    val w = qs.weightsSnapshot
    assert(w(0) > 0.5, s"corr weight should dominate, got ${w.toSeq}")
    assert(math.abs(w.map(math.abs).sum - 1.0) < 1e-9)
  }

  test("a profile that anti-predicts gain gets a negative weight") {
    val rnd = new scala.util.Random(23)
    val vectors = Vector.fill(40)(Array.fill(5)(rnd.nextDouble()))
    val cands = vectors.indices.map(i => Candidate(i, Vector(JoinEdge("key", s"t$i", "key")), "v")).toVector
    val profiles = Profiles(names, vectors.indices.map(i => i -> vectors(i)).toMap)
    val clustering = ClusterPartition.cluster(vectors, 0.01, seed = 1)
    val qs = new QualityScores(profiles, cands, clustering)
    // Gain DECREASES in profile 2 (embed): candidates with high embed are useless.
    vectors.indices.foreach(i => qs.record(cands(i), math.max(0.0, 0.9 - vectors(i)(2))))
    assert(qs.weightsSnapshot(2) < 0.0)
  }

  test("profile score uses learned weights") {
    val rnd = new scala.util.Random(22)
    val vectors = Vector.fill(40)(Array.fill(5)(rnd.nextDouble()))
    val (cands, _, qs) = setup(vectors, epsilon = 0.01)
    vectors.indices.foreach(i => qs.record(cands(i), vectors(i)(0)))
    val hi = Candidate(100, Vector(JoinEdge("key", "hi", "key")), "v")
    val lo = Candidate(101, Vector(JoinEdge("key", "lo", "key")), "v")
    val profiles2 = Profiles(names,
      (vectors.indices.map(i => i -> vectors(i)) ++ Seq(100 -> Array(0.9, 0.1, 0.1, 0.1, 0.1), 101 -> Array(0.1, 0.9, 0.9, 0.9, 0.9))).toMap)
    val clustering = ClusterPartition.cluster(vectors, 0.01, seed = 1)
    val qs2 = new QualityScores(profiles2, cands, clustering)
    vectors.indices.foreach(i => qs2.record(cands(i), vectors(i)(0)))
    assert(qs2.profileScore(hi) > qs2.profileScore(lo))
  }

  test("score is the sum of profile and utility components") {
    val (cands, _, qs) = setup(Vector(Array(0.4, 0.4, 0.4, 0.4, 0.4)))
    qs.record(cands(0), 0.25)
    assert(math.abs(qs.score(cands(0)) - (qs.profileScore(cands(0)) + 0.25)) < 1e-12)
  }

  test("observations counter tracks recorded queries") {
    val (cands, _, qs) = setup(Vector(Array(0.4, 0.4, 0.4, 0.4, 0.4), Array(0.6, 0.6, 0.6, 0.6, 0.6)))
    assert(qs.observations == 0)
    qs.record(cands(0), 0.1)
    qs.record(cands(1), 0.2)
    assert(qs.observations == 2)
  }
}
