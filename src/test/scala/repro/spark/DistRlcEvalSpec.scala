package repro.spark

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestGraphs}
import repro.baseline.BruteForce
import repro.core.QueryGen

/** Distributed iterative-join evaluation of RLC query batches, verified
  * against (a) the independent brute-force evaluator and (b) DuckDB running
  * the equivalent recursive CTE over the product graph.
  */
class DistRlcEvalSpec extends SparkSpec {

  private val recursiveSql =
    """WITH RECURSIVE reach(qid, v, st) AS (
      |  SELECT q.qid, e.dst, CAST(1 % CAST(q.len AS INT) AS INT)
      |  FROM queries q
      |  JOIN qlabels ql ON ql.qid = q.qid AND CAST(ql.pos AS INT) = 0
      |  JOIN edges e ON e.src = q.s AND e.label = ql.label
      |  UNION
      |  SELECT r.qid, e.dst, CAST((r.st + 1) % CAST(q.len AS INT) AS INT)
      |  FROM reach r
      |  JOIN queries q ON q.qid = r.qid
      |  JOIN qlabels ql ON ql.qid = r.qid AND CAST(ql.pos AS INT) = r.st
      |  JOIN edges e ON e.src = r.v AND e.label = ql.label
      |)
      |SELECT q.qid AS qid,
      |       CASE WHEN EXISTS (SELECT 1 FROM reach r
      |                         WHERE r.qid = q.qid AND r.v = q.t AND r.st = 0)
      |            THEN 'true' ELSE 'false' END AS answer
      |FROM queries q
      |""".stripMargin

  test("batch evaluation matches brute force and the DuckDB recursive CTE") {
    val g = TestGraphs.random(21, n = 25, e = 80, labels = 3)
    val trues  = QueryGen.trueQueries(g, 8, len = 2, seed = 5)
    val falses = QueryGen.falseQueries(g, 8, len = 2, seed = 6)
    val ones   = QueryGen.trueQueries(g, 4, len = 1, seed = 7)
    val batch  = trues ++ falses ++ ones

    val edges = g.toDF(spark).cache()
    val answers = DistRlcEval.evaluate(spark, edges, batch).cache()

    // vs brute force
    val got = answers.collect().map(r => r.getInt(0) -> r.getBoolean(1)).toMap
    batch.zipWithIndex.foreach { case (q, i) =>
      assert(got(i) == BruteForce.reach(g, q.s, q.t, q.mr), s"qid=$i $q")
    }

    // vs DuckDB recursive CTE over the same tables
    val (qdf, ldf) = DistRlcEval.queryTables(spark, batch)
    Oracle.assertEquivalent(
      answers.select(col("qid"), col("answer").cast("string").as("answer")),
      recursiveSql,
      "edges" -> edges, "queries" -> qdf, "qlabels" -> ldf)
  }

  test("constraints of length 3 evaluate correctly") {
    val g = TestGraphs.random(31, n = 20, e = 70, labels = 3)
    val batch = QueryGen.trueQueries(g, 5, len = 3, seed = 1) ++
                QueryGen.falseQueries(g, 5, len = 3, seed = 2)
    val answers = DistRlcEval.evaluate(spark, g.toDF(spark), batch)
      .collect().map(r => r.getInt(0) -> r.getBoolean(1)).toMap
    batch.zipWithIndex.foreach { case (q, i) =>
      assert(answers(i) == q.answer, s"qid=$i $q")
    }
  }

  test("generic NFA batch evaluation matches single-node traversals (L+ and a+b+)") {
    import java.util.SplittableRandom
    import repro.baseline.{Nfa, NfaBfs}
    val g = TestGraphs.random(51, n = 22, e = 75, labels = 3)
    val rng = new SplittableRandom(8)
    val batch: Seq[(Int, Int, Nfa)] = (1 to 14).map { i =>
      val s = rng.nextInt(g.numVertices); val t = rng.nextInt(g.numVertices)
      if (i % 2 == 0) {
        val a = rng.nextInt(3); var b = rng.nextInt(3); while (b == a) b = rng.nextInt(3)
        (s, t, Nfa.concatPlus(a, b, 3))
      } else {
        val a = rng.nextInt(3); var b = rng.nextInt(3); while (b == a) b = rng.nextInt(3)
        (s, t, Nfa.kleenePlus(repro.core.LabelSeq.encode(a, b), 3))
      }
    }
    val got = DistRlcEval.evaluateNfaBatch(spark, g.toDF(spark), batch)
      .collect().map(r => r.getInt(0) -> r.getBoolean(1)).toMap
    batch.zipWithIndex.foreach { case ((s, t, nfa), i) =>
      assert(got(i) == NfaBfs.bfs(g, s, t, nfa).get, s"qid=$i s=$s t=$t")
    }
  }

  test("a query whose source has no matching first label is false") {
    val g = TestGraphs.random(41, n = 10, e = 20, labels = 2)
    // vertex with no out-edges at all: add an isolated-ish query via brute force cross-check
    val batch = Seq(
      QueryGen.RlcQuery(0, 0, repro.core.LabelSeq.encode(0), answer = false),
      QueryGen.RlcQuery(3, 7, repro.core.LabelSeq.encode(1), answer = false),
    )
    val answers = DistRlcEval.evaluate(spark, g.toDF(spark), batch)
      .collect().map(r => r.getInt(0) -> r.getBoolean(1)).toMap
    batch.zipWithIndex.foreach { case (q, i) =>
      assert(answers(i) == BruteForce.reach(g, q.s, q.t, q.mr), s"qid=$i")
    }
  }
}
