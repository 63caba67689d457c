package repro.join

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, SynthData}
import scala.util.Random

/** A 4-relation chain query — exercises deeper join trees than the 3-path. */
class ChainQuerySpec extends SparkSpec {
  import spark.implicits._

  private lazy val q: AcyclicQuery = {
    val r1 = SynthData.pathR1(spark, 300, 30, seed = 70).cache()
    val r2 = SynthData.pathR2(spark, 300, 30, 30, seed = 71).cache()
    val r3 = SynthData.pathR2(spark, 300, 30, 30, seed = 72).toDF("c", "d").cache()
    val r4 = SynthData.pathR3(spark, 300, 30, seed = 73).toDF("d", "a2").cache()
    GYO.joinTree(Seq(
      Relation("r1", r1), Relation("r2", r2), Relation("r3", r3), Relation("r4", r4))).get
  }
  private def tables = q.relations.map(r => r.name -> r.df)
  private val sql = "FROM r1, r2, r3, r4 WHERE r1.b = r2.b AND r2.c = r3.c AND r3.d = r4.d"

  test("chain join count matches DuckDB") {
    Oracle.assertEquivalent(
      Seq(Yannakakis.countJoin(q)).toDF("cnt"),
      s"SELECT COUNT(*) AS cnt $sql",
      tables: _*)
  }

  test("chain count is invariant under every rooting") {
    val counts = q.relations.map(r =>
      Yannakakis.rootCounts(q.rooted(r.name))
        .agg(coalesce(sum(Yannakakis.Cnt), lit(0L))).head.getLong(0))
    assert(counts.distinct.size == 1, counts.toString)
  }

  test("LocalJoinIndex counts and samples the chain correctly") {
    val idx = LocalJoinIndex.build(Yannakakis.fullReduce(q))
    assert(idx.n == Yannakakis.countJoin(q).toDouble)
    val truth = repro.TestData.materializePts(q).map(_.toSeq).toSet
    val s = idx.sampleUniform(300, new Random(1))
    assert(s.length == 300)
    s.foreach(t => assert(truth.contains(t.toSeq)))
  }

  test("chain histogram of the middle attribute matches DuckDB") {
    val h = LeafHistogram.histogram(q, "c")
    Oracle.assertEquivalent(
      h.toSeq.toDF("v", "w").withColumn("w", col("w").cast("long")),
      s"SELECT CAST(r2.c AS DOUBLE) AS v, COUNT(*) AS w $sql GROUP BY 1",
      tables: _*)
  }

  test("chain box count matches brute force") {
    val idx = LocalJoinIndex.build(Yannakakis.fullReduce(q))
    val truth = repro.TestData.materializePts(q)
    val (lo, hi) = idx.fullBox
    lo(idx.attrIdx("a1")) = 30.0; hi(idx.attrIdx("a1")) = 70.0
    lo(idx.attrIdx("d")) = 0.0; hi(idx.attrIdx("d")) = 50.0
    val brute = truth.count { t =>
      t.indices.forall(i => t(i) >= lo(i) && t(i) <= hi(i))
    }
    assert(idx.countBox(lo, hi) == brute.toDouble)
  }
}
