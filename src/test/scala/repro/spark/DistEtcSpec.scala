package repro.spark

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestGraphs}
import repro.baseline.{BruteForce, Etc}
import repro.core.LabelSeq

/** The DataFrame-join extended transitive closure: per-MR one-copy
  * relations, semi-naive closure (DuckDB-oracle checked), and full
  * agreement with the sequential ETC.
  */
class DistEtcSpec extends SparkSpec {

  test("oneCopy composes label-filtered edge joins (oracle-checked)") {
    val g = TestGraphs.random(3, n = 20, e = 70, labels = 3)
    val edges = g.toDF(spark).cache()
    val mr = LabelSeq.encode(0, 1)
    val sql =
      """SELECT DISTINCT e1.src AS src, e2.dst AS dst
        |FROM edges e1 JOIN edges e2 ON e2.src = e1.dst
        |WHERE e1.label = '0' AND e2.label = '1'
        |""".stripMargin
    Oracle.assertEquivalent(DistEtc.oneCopy(edges, mr), sql, "edges" -> edges)
  }

  test("transitiveClosure matches the DuckDB recursive CTE") {
    val g = TestGraphs.random(7, n = 18, e = 50, labels = 2)
    val rel = DistEtc.oneCopy(g.toDF(spark), LabelSeq.encode(0)).cache()
    val sql =
      """WITH RECURSIVE tc(src, dst) AS (
        |  SELECT src, dst FROM rel
        |  UNION
        |  SELECT t.src, r.dst FROM tc t JOIN rel r ON r.src = t.dst
        |)
        |SELECT src AS src, dst AS dst FROM tc
        |""".stripMargin
    Oracle.assertEquivalent(DistEtc.transitiveClosure(rel), sql, "rel" -> rel)
  }

  for (seed <- 1 to 3)
    test(s"distributed ETC ≡ sequential ETC ≡ Def. 2, seed=$seed") {
      val g = TestGraphs.random(seed, n = 16, e = 45, labels = 2)
      val k = 2
      val distRows = DistEtc.build(spark, g.toDF(spark), g.numLabels, k)
        .collect()
        .map(r => (r.getInt(0), r.getInt(1), r.getLong(2)))
        .toSet
      val etc = Etc.build(g, k).get
      val seqRows = {
        val b = Set.newBuilder[(Int, Int, Long)]
        etc.pairs.forEach { (key, set) =>
          val u = (key >> 32).toInt; val v = key.toInt
          set.forEach(mr => b += ((u, v, mr.longValue())))
        }
        b.result()
      }
      assert(distRows == seqRows)
      // spot-check Def. 2 directly
      for (s <- 0 until g.numVertices; t <- 0 until g.numVertices) {
        val expected = BruteForce.concise(g, s, t, k)
        val got = distRows.collect { case (`s`, `t`, mr) => mr }
        assert(got == expected, s"s=$s t=$t")
      }
    }

  test("empty alphabet portion: constraints over absent labels contribute nothing") {
    // only label 0 present; (l1)+ and mixed constraints must be empty
    val g = repro.graph.LabeledGraph.fromEdges(3, 2, Array((0, 0, 1), (1, 0, 2)))
    val df = DistEtc.build(spark, g.toDF(spark), 2, 2)
    val mrs = df.select(col("mr")).distinct().collect().map(_.getLong(0)).toSet
    assert(mrs == Set(LabelSeq.encode(0)))
  }
}
