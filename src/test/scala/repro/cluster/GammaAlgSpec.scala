package repro.cluster

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** The standard-setting gamma-algorithms: quality on separable mixtures,
  * weight handling, discrete variants, edge cases. Pure driver-side — no
  * Spark needed.
  */
class GammaAlgSpec extends AnyFunSuite {
  import Weighted._

  /** 2-D mixture of `k` well-separated Gaussians. */
  private def mixture(k: Int, perCluster: Int, rng: Random): (Array[Pt], Array[Pt]) = {
    val trueCenters = Array.tabulate(k)(i => Array(100.0 * i, 50.0 * (i % 2)))
    val pts = trueCenters.flatMap(c =>
      Array.fill(perCluster)(Array(c(0) + rng.nextGaussian(), c(1) + rng.nextGaussian())))
    (pts, trueCenters)
  }

  test("k-means recovers well-separated clusters (cost near noise floor)") {
    val rng = new Random(1)
    val (pts, trueCenters) = mixture(4, 200, rng)
    val w = Array.fill(pts.length)(1.0)
    val got = KMeansAlg().cluster(pts, w, 4, rng)
    val cost = Weighted.cost(pts, w, got, Means)
    val ideal = Weighted.cost(pts, w, trueCenters, Means)
    assert(cost <= 1.3 * ideal, s"cost=$cost ideal=$ideal")
  }

  test("k-median recovers well-separated clusters") {
    val rng = new Random(2)
    val (pts, trueCenters) = mixture(4, 200, rng)
    val w = Array.fill(pts.length)(1.0)
    val got = KMedianAlg().cluster(pts, w, 4, rng)
    val cost = Weighted.cost(pts, w, got, Median)
    val ideal = Weighted.cost(pts, w, trueCenters, Median)
    assert(cost <= 1.3 * ideal, s"cost=$cost ideal=$ideal")
  }

  test("weights matter: heavy point pulls the 1-center solution") {
    val pts = Array(Array(0.0), Array(10.0))
    val w = Array(1.0, 99.0)
    val c = KMeansAlg().cluster(pts, w, 1, new Random(3))
    assert(c.length == 1)
    assert(math.abs(c(0)(0) - 9.9) < 0.2) // weighted centroid
  }

  test("k-median 1-center of a weighted line is the weighted median") {
    val pts = Array(Array(0.0), Array(1.0), Array(10.0))
    val w = Array(1.0, 5.0, 1.0)
    val c = KMedianAlg().cluster(pts, w, 1, new Random(4))
    assert(math.abs(c(0)(0) - 1.0) < 0.3, s"got ${c(0)(0)}")
  }

  test("discrete k-means returns centers that are input points") {
    val rng = new Random(5)
    val (pts, _) = mixture(3, 50, rng)
    val w = Array.fill(pts.length)(1.0)
    val got = KMeansAlg(discrete = true).cluster(pts, w, 3, rng)
    val set = pts.map(_.toSeq).toSet
    got.foreach(c => assert(set.contains(c.toSeq)))
  }

  test("discrete k-median returns centers that are input points") {
    val rng = new Random(6)
    val (pts, _) = mixture(3, 50, rng)
    val w = Array.fill(pts.length)(1.0)
    val got = KMedianAlg(discrete = true).cluster(pts, w, 3, rng)
    val set = pts.map(_.toSeq).toSet
    got.foreach(c => assert(set.contains(c.toSeq)))
  }

  test("discrete cost is at most ~4x (means) / ~2x (median) the geometric cost") {
    val rng = new Random(7)
    val (pts, _) = mixture(3, 100, rng)
    val w = Array.fill(pts.length)(1.0)
    val geoMeans = Weighted.cost(pts, w, KMeansAlg().cluster(pts, w, 3, rng), Means)
    val disMeans = Weighted.cost(pts, w, KMeansAlg(discrete = true).cluster(pts, w, 3, rng), Means)
    assert(disMeans <= 4.5 * geoMeans)
    val geoMed = Weighted.cost(pts, w, KMedianAlg().cluster(pts, w, 3, rng), Median)
    val disMed = Weighted.cost(pts, w, KMedianAlg(discrete = true).cluster(pts, w, 3, rng), Median)
    assert(disMed <= 2.5 * geoMed)
  }

  test("k >= number of points returns (at most) all points with zero-ish cost") {
    val pts = Array(Array(1.0), Array(2.0), Array(3.0))
    val w = Array(1.0, 1.0, 1.0)
    for (alg <- Seq[GammaAlg](KMeansAlg(), KMedianAlg())) {
      val c = alg.cluster(pts, w, 5, new Random(8))
      assert(c.nonEmpty && c.length <= 5)
      assert(Weighted.cost(pts, w, c, alg.objective) < 1e-6)
    }
  }

  test("k = 1 on identical points returns that point") {
    val pts = Array.fill(10)(Array(7.0, 7.0))
    val w = Array.fill(10)(1.0)
    val c = KMeansAlg().cluster(pts, w, 1, new Random(9))
    assert(dist(c(0), Array(7.0, 7.0)) < 1e-9)
  }

  test("deterministic given the same seed") {
    val rng1 = new Random(10); val rng2 = new Random(10)
    val (pts, _) = mixture(3, 80, new Random(11))
    val w = Array.fill(pts.length)(1.0)
    val a = KMeansAlg().cluster(pts, w, 3, rng1)
    val b = KMeansAlg().cluster(pts, w, 3, rng2)
    assert(a.map(_.toSeq).toSeq == b.map(_.toSeq).toSeq)
  }

  test("zero-weight points do not attract centers") {
    val pts = Array(Array(0.0), Array(1000.0))
    val w = Array(1.0, 0.0)
    val c = KMeansAlg().cluster(pts, w, 1, new Random(12))
    assert(math.abs(c(0)(0)) < 1.0)
  }

  test("more centers never cost more (k monotonicity, same data)") {
    val rng = new Random(13)
    val (pts, _) = mixture(4, 60, rng)
    val w = Array.fill(pts.length)(1.0)
    val c2 = Weighted.cost(pts, w, KMeansAlg().cluster(pts, w, 2, new Random(14)), Means)
    val c6 = Weighted.cost(pts, w, KMeansAlg().cluster(pts, w, 6, new Random(14)), Means)
    assert(c6 <= c2 * 1.05)
  }
}
