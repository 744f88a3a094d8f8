package repro.ml

import org.scalatest.funsuite.AnyFunSuite
import repro.util.Rnd

class KMeansSpec extends AnyFunSuite {

  private def cluster(center: Array[Double], n: Int, seed: Long): IndexedSeq[Array[Double]] = {
    val g = new Rnd.Gen(seed)
    IndexedSeq.fill(n)(center.indices.map(i => center(i) + 0.1 * g.nextGaussian()).toArray)
  }

  test("ppSeeds returns k distinct indices") {
    val pts = cluster(Array(0.0, 0.0), 50, 1)
    val seeds = KMeans.ppSeeds(pts, 5, 2)
    assert(seeds.length == 5)
    assert(seeds.distinct.length == 5)
    assert(seeds.forall(i => i >= 0 && i < 50))
  }

  test("ppSeeds caps k at n") {
    val pts = cluster(Array(0.0), 3, 1)
    assert(KMeans.ppSeeds(pts, 10, 2).length == 3)
  }

  test("ppSeeds spreads across well-separated clusters") {
    val pts = cluster(Array(0.0, 0.0), 30, 1) ++ cluster(Array(100.0, 0.0), 30, 2) ++
              cluster(Array(0.0, 100.0), 30, 3)
    val seeds = KMeans.ppSeeds(pts, 3, 4)
    val regions = seeds.map { i =>
      val p = pts(i)
      if (p(0) > 50) "x" else if (p(1) > 50) "y" else "o"
    }.toSet
    assert(regions.size == 3, s"seeds fell in regions $regions")
  }

  test("ppSeeds handles identical points") {
    val pts = IndexedSeq.fill(10)(Array(1.0, 2.0))
    val seeds = KMeans.ppSeeds(pts, 3, 5)
    assert(seeds.length == 3 && seeds.distinct.length == 3)
  }

  test("ppSeeds on single point") {
    assert(KMeans.ppSeeds(IndexedSeq(Array(1.0)), 1, 6).toSeq == Seq(0))
  }

  test("ppSeeds rejects empty input") {
    intercept[IllegalArgumentException](KMeans.ppSeeds(IndexedSeq.empty, 1, 0))
  }

  test("fit recovers two separated clusters") {
    val pts = cluster(Array(0.0, 0.0), 40, 1) ++ cluster(Array(10.0, 10.0), 40, 2)
    val (cents, assign) = KMeans.fit(pts, 2, 3)
    assert(cents.length == 2)
    // points of each true cluster share an assignment
    assert(assign.take(40).distinct.length == 1)
    assert(assign.drop(40).distinct.length == 1)
    assert(assign(0) != assign(40))
    val near = cents.map(c => math.min(Vec.distSq(c, Array(0.0, 0.0)), Vec.distSq(c, Array(10.0, 10.0))))
    assert(near.forall(_ < 1.0))
  }

  test("fit assignment maps every point to its nearest centroid") {
    val g = new Rnd.Gen(9)
    val pts = IndexedSeq.fill(60)(Array(g.nextGaussian(), g.nextGaussian(), g.nextGaussian()))
    val (cents, assign) = KMeans.fit(pts, 4, 10)
    pts.indices.foreach { i =>
      val mine = Vec.distSq(pts(i), cents(assign(i)))
      cents.indices.foreach { c =>
        assert(mine <= Vec.distSq(pts(i), cents(c)) + 1e-9)
      }
    }
  }

  test("fit is deterministic in seed") {
    val pts = cluster(Array(0.0, 0.0), 30, 1) ++ cluster(Array(5.0, 5.0), 30, 2)
    val (c1, a1) = KMeans.fit(pts, 3, 7)
    val (c2, a2) = KMeans.fit(pts, 3, 7)
    assert(a1.toSeq == a2.toSeq)
    assert(c1.map(_.toSeq).toSeq == c2.map(_.toSeq).toSeq)
  }
}
