package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.PropHelpers

class VectorOpsSpec extends AnyFunSuite with PropHelpers {

  test("dot of orthogonal unit vectors is zero") {
    assert(VectorOps.dot(Array(1.0, 0.0), Array(0.0, 1.0)) == 0.0)
  }

  test("dot is symmetric") {
    forAllVectors(8) { a =>
      val b = a.map(_ * 2 - 1)
      assertApprox(VectorOps.dot(a, b), VectorOps.dot(b, a), 1e-12, "dot symmetry")
    }
  }

  test("dot rejects mismatched dimensions") {
    intercept[IllegalArgumentException](VectorOps.dot(Array(1.0), Array(1.0, 2.0)))
  }

  test("norm of zero vector is zero") {
    assert(VectorOps.norm(Array(0.0, 0.0, 0.0)) == 0.0)
  }

  test("norm of a unit basis vector is one") {
    assert(VectorOps.norm(Array(0.0, 1.0, 0.0)) == 1.0)
  }

  test("cosine of identical vectors is one") {
    forAllVectors(16) { a =>
      assertApprox(VectorOps.cosine(a, a), 1.0, 1e-9, "self cosine")
    }
  }

  test("cosine of opposite vectors is minus one") {
    forAllVectors(16) { a =>
      assertApprox(VectorOps.cosine(a, a.map(-_)), -1.0, 1e-9, "opposite cosine")
    }
  }

  test("cosine is bounded in [-1, 1]") {
    forAllVectors(8, n = 100) { a =>
      val b = a.reverse
      val c = VectorOps.cosine(a, b)
      assert(c >= -1.0 - 1e-9 && c <= 1.0 + 1e-9)
    }
  }

  test("cosine with zero vector is zero, not NaN") {
    assert(VectorOps.cosine(Array(0.0, 0.0), Array(1.0, 2.0)) == 0.0)
  }

  test("cosine is scale-invariant") {
    forAllVectors(12) { a =>
      val b = a.map(x => x + 0.5)
      assertApprox(VectorOps.cosine(a, b), VectorOps.cosine(a.map(_ * 3.0), b.map(_ * 0.1)),
        1e-9, "scale invariance")
    }
  }

  test("addInPlace accumulates") {
    val a = Array(1.0, 2.0)
    VectorOps.addInPlace(a, Array(3.0, -1.0))
    assert(a.toSeq == Seq(4.0, 1.0))
  }

  test("scaleInPlace scales") {
    val a = Array(2.0, -4.0)
    VectorOps.scaleInPlace(a, 0.5)
    assert(a.toSeq == Seq(1.0, -2.0))
  }

  test("normalized returns a unit vector") {
    forAllVectors(10) { a =>
      assertApprox(VectorOps.norm(VectorOps.normalized(a)), 1.0, 1e-9, "unit norm")
    }
  }

  test("normalized of zero vector stays zero") {
    assert(VectorOps.normalized(Array(0.0, 0.0)).toSeq == Seq(0.0, 0.0))
  }

  test("normalized does not mutate its input") {
    val a = Array(3.0, 4.0)
    VectorOps.normalized(a)
    assert(a.toSeq == Seq(3.0, 4.0))
  }

  test("angle of identical vectors is zero") {
    forAllVectors(6) { a =>
      assertApprox(VectorOps.angle(a, a), 0.0, 1e-6, "self angle")
    }
  }

  test("angle of orthogonal vectors is pi/2") {
    assertApprox(VectorOps.angle(Array(1.0, 0.0), Array(0.0, 5.0)), math.Pi / 2, 1e-9, "ortho")
  }

  test("angle matches acos of cosine") {
    forAllVectors(10) { a =>
      val b = a.map(x => x * 0.7 + 0.1)
      assertApprox(VectorOps.angle(a, b), math.acos(VectorOps.cosine(a, b)), 1e-9, "acos")
    }
  }
}
