package repro.baselines

import repro.{SparkSpec, TestData}
import repro.cluster._
import repro.join.{LocalJoinIndex, Yannakakis}
import scala.util.Random

class FullJoinSpec extends SparkSpec {
  private lazy val q = TestData.pathQuery(spark)
  private lazy val truth = TestData.materializePts(q)

  test("materialized join size matches the relational count") {
    val res = FullJoin.run(q, 3, KMeansAlg(), seed = 1)
    assert(res.joinSize == Yannakakis.countJoin(q))
    assert(res.clusteredRows == truth.length) // below the collect cap
    assert(res.centers.length == 3)
  }

  test("CostEval (Spark aggregation) equals the driver-side cost — median") {
    val rng = new Random(2)
    val centers = Array.fill(3)(Array.fill(q.allAttrs.size)(rng.nextDouble() * 100))
    val viaSpark = CostEval.cost(q, centers, q.allAttrs, Median)
    val viaDriver = Weighted.costUnweighted(truth, centers, Median)
    assert(math.abs(viaSpark - viaDriver) <= 1e-6 * viaDriver, s"$viaSpark vs $viaDriver")
  }

  test("CostEval equals the driver-side cost — means") {
    val rng = new Random(3)
    val centers = Array.fill(2)(Array.fill(q.allAttrs.size)(rng.nextDouble() * 100))
    val viaSpark = CostEval.cost(q, centers, q.allAttrs, Means)
    val viaDriver = Weighted.costUnweighted(truth, centers, Means)
    assert(math.abs(viaSpark - viaDriver) <= 1e-6 * viaDriver)
  }

  test("CostEval handles a single center") {
    val centers = Array(Array.fill(q.allAttrs.size)(50.0))
    val viaSpark = CostEval.cost(q, centers, q.allAttrs, Median)
    val viaDriver = Weighted.costUnweighted(truth, centers, Median)
    assert(math.abs(viaSpark - viaDriver) <= 1e-6 * viaDriver)
  }

  test("collect cap falls back to sampling but still returns k centers") {
    val res = FullJoin.run(q, 3, KMeansAlg(), seed = 4, collectCap = 1000)
    assert(res.clusteredRows <= 2000) // cap +- sampling noise
    assert(res.centers.length == 3)
  }
}

class RkMeansSpec extends SparkSpec {
  private lazy val q = TestData.pathQuery(spark)
  private lazy val truth = TestData.materializePts(q)
  private val k = 3

  test("grid-cell weights sum exactly to |q(D)| (counted relationally)") {
    val res = RkMeans.run(q, k, KMeansAlg(), seed = 1)
    assert(math.abs(res.totalWeight - truth.length) < 1e-6)
  }

  test("grid has at most k^d nonempty cells") {
    val res = RkMeans.run(q, k, KMeansAlg(), seed = 2)
    assert(res.gridSize <= math.pow(k, q.allAttrs.size).toInt)
    assert(res.gridSize >= k)
  }

  test("rk-means cost is within its (large) constant factor of the baseline") {
    val res = RkMeans.run(q, k, KMeansAlg(), seed = 3)
    val base = FullJoin.run(q, k, KMeansAlg(), seed = 3)
    val mine = Weighted.costUnweighted(truth, res.centers, Means)
    val ref = Weighted.costUnweighted(truth, base.centers, Means)
    // Table 1: gamma^2 + 4 gamma sqrt(gamma) + 4 gamma = 9 at gamma = 1
    assert(mine <= 9.5 * ref, s"rk-means=$mine baseline=$ref")
    assert(mine >= 0.9 * ref)
  }

  test("k = 1 grid collapses to a single cell") {
    val res = RkMeans.run(q, 1, KMeansAlg(), seed = 4)
    assert(res.gridSize == 1)
    assert(res.centers.length == 1)
  }
}

class RelKMeansPPSpec extends SparkSpec {
  private lazy val q = Yannakakis.fullReduce(TestData.pathQuery(spark))
  private lazy val index = LocalJoinIndex.build(q)
  private lazy val truth = TestData.materializePts(q)
  private val k = 3

  test("coreset has O(k log n) centers") {
    val sample = index.sampleUniform(4000, new Random(1))
    val res = RelKMeansPP.run(sample, index.n, k, KMeansAlg(), seed = 1)
    val bound = k * math.ceil(math.log(index.n) / math.log(2)).toInt
    assert(res.coresetSize <= bound)
    assert(res.coresetSize > k)
  }

  test("rel-k-means++ cost is within its constant factor of the baseline") {
    val sample = index.sampleUniform(4000, new Random(2))
    val res = RelKMeansPP.run(sample, index.n, k, KMeansAlg(), seed = 2)
    val base = FullJoin.run(q, k, KMeansAlg(), seed = 2)
    val mine = Weighted.costUnweighted(truth, res.centers, Means)
    val ref = Weighted.costUnweighted(truth, base.centers, Means)
    assert(mine <= 6.0 * ref, s"rel-k-means++=$mine baseline=$ref")
  }

  test("uniform coreset clusters sanely") {
    val sample = index.sampleUniform(4000, new Random(3))
    val centers = UniformCoreset.run(sample, index.n, k, KMeansAlg(), seed = 3)
    val base = FullJoin.run(q, k, KMeansAlg(), seed = 3)
    val mine = Weighted.costUnweighted(truth, centers, Means)
    val ref = Weighted.costUnweighted(truth, base.centers, Means)
    assert(centers.length == k)
    assert(mine <= 4.0 * ref, s"uniform=$mine baseline=$ref")
  }

  test("uniform coreset works for k-median too") {
    val sample = index.sampleUniform(4000, new Random(4))
    val centers = UniformCoreset.run(sample, index.n, k, KMedianAlg(), seed = 4)
    val base = FullJoin.run(q, k, KMedianAlg(), seed = 4)
    val mine = Weighted.costUnweighted(truth, centers, Median)
    val ref = Weighted.costUnweighted(truth, base.centers, Median)
    assert(mine <= 3.0 * ref)
  }
}
