package repro.util

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}

import repro.PropSupport

class LinAlgSpec extends AnyFunSuite with PropSupport {

  test("solve identity returns b") {
    val x = LinAlg.solve(Array(Array(1.0, 0.0), Array(0.0, 1.0)), Array(3.0, -2.0))
    assert(x.toSeq == Seq(3.0, -2.0))
  }

  test("solve 2x2 system") {
    // 2x + y = 5; x + 3y = 10 → x = 1, y = 3.
    val x = LinAlg.solve(Array(Array(2.0, 1.0), Array(1.0, 3.0)), Array(5.0, 10.0))
    assert(math.abs(x(0) - 1.0) < 1e-9 && math.abs(x(1) - 3.0) < 1e-9)
  }

  test("solve requires pivoting") {
    // First pivot is 0 — partial pivoting must swap rows.
    val x = LinAlg.solve(Array(Array(0.0, 1.0), Array(1.0, 0.0)), Array(7.0, 9.0))
    assert(math.abs(x(0) - 9.0) < 1e-9 && math.abs(x(1) - 7.0) < 1e-9)
  }

  test("solve rejects singular matrices") {
    intercept[IllegalArgumentException] {
      LinAlg.solve(Array(Array(1.0, 2.0), Array(2.0, 4.0)), Array(1.0, 2.0))
    }
  }

  test("solve rejects non-square input") {
    intercept[IllegalArgumentException] {
      LinAlg.solve(Array(Array(1.0, 2.0, 3.0), Array(1.0, 2.0, 3.0)), Array(1.0, 2.0))
    }
  }

  test("solve random SPD systems round-trip") {
    val gen = Gen.listOfN(9, Gen.choose(-3.0, 3.0))
    checkProp(Prop.forAll(gen, Gen.listOfN(3, Gen.choose(-3.0, 3.0))) { (m, bv) =>
      val a = m.grouped(3).map(_.toArray).toArray
      // Make SPD: A^T A + I.
      val spd = Array.tabulate(3, 3)((i, j) =>
        (0 until 3).map(k => a(k)(i) * a(k)(j)).sum + (if (i == j) 1.0 else 0.0))
      val x = LinAlg.solve(spd.map(_.clone()), bv.toArray)
      val back = spd.map(row => LinAlg.dot(row, x))
      back.indices.forall(i => math.abs(back(i) - bv(i)) < 1e-6)
    })
  }

  test("ridge recovers weights of a noiseless linear model") {
    val rnd = new scala.util.Random(5)
    val x = Array.fill(200)(Array.fill(3)(rnd.nextGaussian()))
    val wTrue = Array(2.0, -1.0, 0.5)
    val y = x.map(row => LinAlg.dot(row, wTrue))
    val w = LinAlg.ridge(x, y, 1e-6)
    w.indices.foreach(i => assert(math.abs(w(i) - wTrue(i)) < 1e-3))
  }

  test("ridge shrinks towards zero with large lambda") {
    val rnd = new scala.util.Random(6)
    val x = Array.fill(100)(Array.fill(2)(rnd.nextGaussian()))
    val y = x.map(row => row(0) * 3.0)
    val w = LinAlg.ridge(x, y, 1e6)
    assert(math.abs(w(0)) < 0.01 && math.abs(w(1)) < 0.01)
  }

  test("ridge requires positive lambda") {
    intercept[IllegalArgumentException](LinAlg.ridge(Array(Array(1.0)), Array(1.0), 0.0))
  }

  test("ridge rejects ragged design matrix") {
    intercept[IllegalArgumentException] {
      LinAlg.ridge(Array(Array(1.0, 2.0), Array(1.0)), Array(1.0, 2.0), 1.0)
    }
  }

  test("dot product") {
    assert(LinAlg.dot(Array(1.0, 2.0, 3.0), Array(4.0, 5.0, 6.0)) == 32.0)
  }

  test("cosine of identical vectors is 1") {
    assert(math.abs(LinAlg.cosine(Array(1.0, 2.0), Array(1.0, 2.0)) - 1.0) < 1e-12)
  }

  test("cosine of orthogonal vectors is 0") {
    assert(math.abs(LinAlg.cosine(Array(1.0, 0.0), Array(0.0, 1.0))) < 1e-12)
  }

  test("cosine of zero vector is 0") {
    assert(LinAlg.cosine(Array(0.0, 0.0), Array(1.0, 1.0)) == 0.0)
  }
}
