package repro.ml

import org.scalatest.funsuite.AnyFunSuite

class VecSpec extends AnyFunSuite {
  private val eps = 1e-12

  test("zeros") { assert(Vec.zeros(4).toSeq == Seq(0.0, 0.0, 0.0, 0.0)) }

  test("dot of orthogonal vectors is 0") {
    assert(Vec.dot(Array(1.0, 0.0), Array(0.0, 5.0)) == 0.0)
  }

  test("dot basic") {
    assert(math.abs(Vec.dot(Array(1.0, 2.0, 3.0), Array(4.0, 5.0, 6.0)) - 32.0) < eps)
  }

  test("dot rejects length mismatch") {
    intercept[IllegalArgumentException](Vec.dot(Array(1.0), Array(1.0, 2.0)))
  }

  test("axpyI adds scaled vector in place") {
    val a = Array(1.0, 2.0)
    Vec.axpyI(a, 2.0, Array(3.0, 4.0))
    assert(a.toSeq == Seq(7.0, 10.0))
  }

  test("scaleI") {
    val a = Array(1.0, -2.0)
    Vec.scaleI(a, 3.0)
    assert(a.toSeq == Seq(3.0, -6.0))
  }

  test("add does not mutate inputs") {
    val a = Array(1.0); val b = Array(2.0)
    val c = Vec.add(a, b)
    assert(c.toSeq == Seq(3.0) && a(0) == 1.0 && b(0) == 2.0)
  }

  test("sub") { assert(Vec.sub(Array(5.0, 1.0), Array(2.0, 4.0)).toSeq == Seq(3.0, -3.0)) }

  test("had is element-wise product") {
    assert(Vec.had(Array(2.0, 3.0), Array(4.0, -1.0)).toSeq == Seq(8.0, -3.0))
  }

  test("l2sq and l2") {
    assert(math.abs(Vec.l2sq(Array(3.0, 4.0)) - 25.0) < eps)
    assert(math.abs(Vec.l2(Array(3.0, 4.0)) - 5.0) < eps)
  }

  test("distSq is symmetric and zero at identity") {
    val a = Array(1.0, 2.0, 3.0); val b = Array(0.0, -1.0, 5.0)
    assert(math.abs(Vec.distSq(a, b) - Vec.distSq(b, a)) < eps)
    assert(Vec.distSq(a, a) == 0.0)
    assert(math.abs(Vec.distSq(a, b) - (1.0 + 9.0 + 4.0)) < eps)
  }

  test("cosine of parallel vectors is 1") {
    assert(math.abs(Vec.cosine(Array(1.0, 2.0), Array(2.0, 4.0)) - 1.0) < 1e-9)
  }

  test("cosine of opposite vectors is -1") {
    assert(math.abs(Vec.cosine(Array(1.0, 0.0), Array(-2.0, 0.0)) + 1.0) < 1e-9)
  }

  test("cosine with zero vector is 0") {
    assert(Vec.cosine(Array(0.0, 0.0), Array(1.0, 1.0)) == 0.0)
  }

  test("mean") {
    val m = Vec.mean(Seq(Array(1.0, 2.0), Array(3.0, 6.0)))
    assert(m.toSeq == Seq(2.0, 4.0))
  }

  test("mean of empty rejects") {
    intercept[IllegalArgumentException](Vec.mean(Seq.empty))
  }

  test("concat") {
    assert(Vec.concat(Array(1.0), Array(2.0, 3.0), Array(4.0)).toSeq == Seq(1.0, 2.0, 3.0, 4.0))
  }

  test("tanhI") {
    val a = Array(0.0, 100.0, -100.0)
    Vec.tanhI(a)
    assert(a(0) == 0.0 && math.abs(a(1) - 1.0) < 1e-9 && math.abs(a(2) + 1.0) < 1e-9)
  }

  test("triangle inequality for l2 (scalacheck)") {
    val gen = org.scalacheck.Gen.listOfN(6, org.scalacheck.Gen.choose(-10.0, 10.0))
    val prop = org.scalacheck.Prop.forAll(gen) { xs =>
      val a = xs.take(3).toArray
      val b = xs.drop(3).toArray
      math.sqrt(Vec.distSq(a, b)) <= Vec.l2(a) + Vec.l2(b) + 1e-9
    }
    assert(org.scalacheck.Test.check(org.scalacheck.Test.Parameters.default, prop).passed)
  }
}
