package repro.ml.rkmeans

import org.scalatest.funsuite.AnyFunSuite

class WeightedKMeansSpec extends AnyFunSuite {

  test("two well-separated clusters are recovered") {
    val pts = Array(Array(0.0), Array(1.0), Array(2.0), Array(100.0), Array(101.0), Array(102.0))
    val ws = Array.fill(6)(1.0)
    val m = WeightedKMeans.fit(pts, ws, k = 2)
    val cs = m.centroids.map(_(0)).sorted
    assert(math.abs(cs(0) - 1.0) < 1e-9 && math.abs(cs(1) - 101.0) < 1e-9)
    assert(m.cost == 4.0) // 2 clusters x variance 2 each
  }

  test("weights shift the centroid") {
    val pts = Array(Array(0.0), Array(10.0))
    val ws = Array(3.0, 1.0)
    val m = WeightedKMeans.fit(pts, ws, k = 1)
    assert(math.abs(m.centroids(0)(0) - 2.5) < 1e-9)
  }

  test("k >= #points puts a centroid on every point") {
    val pts = Array(Array(1.0, 2.0), Array(5.0, 5.0), Array(9.0, 0.0))
    val m = WeightedKMeans.fit(pts, Array(1.0, 1.0, 1.0), k = 5)
    assert(m.cost < 1e-12)
  }

  test("fit is deterministic for a fixed seed") {
    val rng = new scala.util.Random(1)
    val pts = Array.fill(50)(Array(rng.nextDouble() * 10, rng.nextDouble() * 10))
    val ws = Array.fill(50)(1.0 + rng.nextInt(5))
    val a = WeightedKMeans.fit(pts, ws, k = 4, seed = 9)
    val b = WeightedKMeans.fit(pts, ws, k = 4, seed = 9)
    assert(a.centroids.map(_.toSeq).toSeq == b.centroids.map(_.toSeq).toSeq)
    assert(a.cost == b.cost)
  }

  test("cost never increases across refits with the model's own centroids") {
    val rng = new scala.util.Random(2)
    val pts = Array.fill(40)(Array(rng.nextDouble() * 10))
    val ws = Array.fill(40)(1.0)
    val m = WeightedKMeans.fit(pts, ws, k = 3)
    assert(WeightedKMeans.cost(pts, ws, m.centroids) == m.cost)
  }

  test("assign picks the nearest centroid") {
    val m = WeightedKMeans.Model(Array(Array(0.0), Array(10.0)), 0.0, 1)
    assert(m.assign(Array(1.0)) == 0)
    assert(m.assign(Array(9.0)) == 1)
  }

  test("cost of a single centroid equals the weighted variance around it") {
    val pts = Array(Array(0.0), Array(4.0))
    val ws = Array(1.0, 1.0)
    assert(WeightedKMeans.cost(pts, ws, Array(Array(2.0))) == 8.0)
  }

  test("multi-dimensional clustering separates the diagonal") {
    val pts = Array(Array(0.0, 0.0), Array(0.5, 0.5), Array(10.0, 10.0), Array(10.5, 10.5))
    val m = WeightedKMeans.fit(pts, Array.fill(4)(1.0), k = 2)
    val cs = m.centroids.map(_.toSeq).sortBy(_.head)
    assert(cs(0) == Seq(0.25, 0.25) && cs(1) == Seq(10.25, 10.25))
  }

  test("zero-weight points do not attract centroids") {
    val pts = Array(Array(0.0), Array(1.0), Array(1000.0))
    val ws = Array(1.0, 1.0, 0.0)
    val m = WeightedKMeans.fit(pts, ws, k = 1)
    assert(math.abs(m.centroids(0)(0) - 0.5) < 1e-9)
  }

  test("empty input is rejected") {
    assertThrows[IllegalArgumentException](WeightedKMeans.fit(Array.empty, Array.empty, k = 2))
  }

  test("mismatched weights are rejected") {
    assertThrows[IllegalArgumentException](
      WeightedKMeans.fit(Array(Array(1.0)), Array(1.0, 2.0), k = 1))
  }

  test("k-means++ seeding returns min(k, #points) distinct-index centroids") {
    val pts = Array(Array(1.0), Array(2.0))
    val seeds = WeightedKMeans.seedPlusPlus(pts, Array(1.0, 1.0), k = 5, seed = 1)
    assert(seeds.length == 2)
  }
}
