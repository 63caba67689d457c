package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.cluster.{Means, Median}
import scala.util.Random

/** Unit tests for the subspace plumbing and grid parameters shared by
  * Algorithms 1 and 2.
  */
class SubSpaceSpec extends AnyFunSuite {

  test("project extracts the right global dims in order") {
    val t = Array(10.0, 11.0, 12.0, 13.0)
    assert(SubSpace.project(t, Array(2, 0)).toSeq == Seq(12.0, 10.0))
    assert(SubSpace.project(t, Array(3)).toSeq == Seq(13.0))
  }

  test("lift constrains only the sub-dims, half-open above") {
    val b = Box(Array(1.0, 2.0), Array(3.0, 4.0))
    val (lo, hi) = SubSpace.lift(b, Array(1, 3), 4)
    assert(lo(0).isNegInfinity && hi(0).isPosInfinity)
    assert(lo(2).isNegInfinity && hi(2).isPosInfinity)
    assert(lo(1) == 1.0 && hi(1) == math.nextDown(3.0))
    assert(lo(3) == 2.0 && hi(3) == math.nextDown(4.0))
  }

  test("phiFor: median is r/(alpha n), means is sqrt(r/(alpha n))") {
    assert(math.abs(SubSpace.phiFor(Median, 200.0, 2.0, 100.0) - 1.0) < 1e-12)
    assert(math.abs(SubSpace.phiFor(Means, 400.0, 4.0, 100.0) - 1.0) < 1e-12)
  }

  test("phiFor never returns a non-positive phi") {
    assert(SubSpace.phiFor(Median, 0.0, 2.0, 100.0) > 0)
    assert(SubSpace.phiFor(Means, 0.0, 2.0, 100.0) > 0)
  }

  test("ringRatio: alpha*n for median, sqrt(alpha*n) for means") {
    assert(SubSpace.ringRatio(Median, 2.0, 50.0) == 100.0)
    assert(math.abs(SubSpace.ringRatio(Means, 2.0, 50.0) - 10.0) < 1e-12)
  }

  test("ring coverage: any tuple at distance <= r from its center has a cell") {
    // with phi = r/(alpha n) and jMax from ringRatio, Q_jMax's half-side
    // 2^(jMax-1) phi covers alpha*n*phi = r
    val alpha = 2.0; val n = 1000.0; val r = 500.0
    val phi = SubSpace.phiFor(Median, r, alpha, n)
    val jMax = ExpGrid.jMaxFor(SubSpace.ringRatio(Median, alpha, n))
    assert(math.pow(2.0, jMax - 1) * phi >= r * 0.999)
  }

  test("condition (3) rejects a cell strictly closer to another center") {
    val x1 = Array(0.0, 0.0)
    val x2 = Array(100.0, 100.0)
    // a tiny cell hugging x2 is not processed for x1
    val cell = Box(Array(99.0, 99.0), Array(99.5, 99.5))
    assert(!SubSpace.condition3(x1, Array(x1, x2), cell))
    assert(SubSpace.condition3(x2, Array(x1, x2), cell))
  }

  test("condition (3) accepts ties within diam slack") {
    val x1 = Array(0.0, 0.0)
    val x2 = Array(10.0, 0.0)
    val cell = Box(Array(4.0, -1.0), Array(6.0, 1.0)) // straddles the midline
    assert(SubSpace.condition3(x1, Array(x1, x2), cell))
    assert(SubSpace.condition3(x2, Array(x1, x2), cell))
  }

  test("CoreConf eps' splits match the paper") {
    val c = CoreConf(epsilon = 0.68)
    assert(math.abs(c.epsPrime - 0.17) < 1e-12)
    assert(math.abs(c.epsPrimeFast - 0.02) < 1e-12)
  }

  test("ExpGrid rejects invalid parameters") {
    intercept[IllegalArgumentException](new ExpGrid(Array(0.0), 0.0, 8, 10))
    intercept[IllegalArgumentException](new ExpGrid(Array(0.0), 1.0, 3, 10))
  }

  test("cellsOfRing with cellsPerSide % 4 == 0 removes the exact inner hole") {
    val g = new ExpGrid(Array(0.0, 0.0), 1.0, 8, 10)
    val ring1 = g.cellsOfRing(0, 1).toSeq
    // Q_0 spans cells with coords in [-2, 1] at ring-1 resolution; none of
    // the enumerated ring-1 cells may lie fully inside it
    ring1.foreach { k =>
      assert(!k.coords.forall(c => c >= -2 && c < 2), s"hole cell leaked: $k")
    }
    // and all of ring 0 plus ring 1 covers every point of Q_1
    val rng = new Random(1)
    (1 to 200).foreach { _ =>
      val p = Array(rng.nextDouble() * 2 - 1, rng.nextDouble() * 2 - 1) // in Q_1
      val key = g.cellOf(0, p)
      assert(key.j <= 1)
      assert(g.cellsOfRing(0, key.j).contains(key), s"missing cell for ${p.toSeq}")
    }
  }

  test("cells within one ring are disjoint (distinct keys => disjoint boxes)") {
    val g = new ExpGrid(Array(0.0, 0.0), 1.0, 8, 10)
    val cells = g.cellsOfRing(0, 2).toSeq
    val boxes = cells.map(g.boxOf)
    for (i <- boxes.indices; j <- (i + 1) until boxes.size) {
      val a = boxes(i); val b = boxes(j)
      // half-open boxes: shared faces are fine, interiors must not overlap
      val overlap = a.lo.indices.forall(d =>
        math.min(a.hi(d), b.hi(d)) - math.max(a.lo(d), b.lo(d)) > 1e-12)
      assert(!overlap, s"cells $i and $j overlap")
    }
  }
}
