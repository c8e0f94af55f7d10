package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.core.local.Slugger
import repro.core.model.HierSummary
import repro.core.spark.{CandidateGenSpark, SluggerSpark}
import repro.graph.{GraphGen, LocalGraph}

/** Distributed SLUGGER: DataFrame candidate generation, executor-parallel
  * merging, DataFrame decompression, DuckDB reconstruction oracle.
  */
class SluggerSparkSpec extends SparkSpec {

  def membersOf(g: LocalGraph): org.apache.spark.sql.DataFrame = {
    import spark.implicits._
    (0 until g.n).map(u => (u, u)).toDF("sub", "root")
  }

  // ---- CandidateGenSpark ----------------------------------------------------

  test("DataFrame grouping covers all roots exactly once") {
    val edges = GraphGen.erdosRenyi(spark, 200, 500)
    val g = LocalGraph.fromDF(edges)
    val rows = CandidateGenSpark.assign(spark, LocalGraph.toDF(spark, g), membersOf(g), seed = 3)
      .collect().map(r => (r.getInt(0), r.getLong(1)))
    assert(rows.map(_._1).distinct.length == rows.length, "a root was assigned twice")
    assert(rows.length == g.n)
  }

  test("DataFrame grouping respects the size cap") {
    val edges = GraphGen.cliqueUnion(spark, 30, 10, 100, seed = 5)
    val g = LocalGraph.fromDF(edges)
    val rows = CandidateGenSpark.assign(spark, LocalGraph.toDF(spark, g), membersOf(g),
      seed = 3, maxSize = 40).collect().map(r => (r.getInt(0), r.getLong(1)))
    rows.groupBy(_._2).foreach { case (k, grp) =>
      assert(grp.length <= 40, s"group $k has ${grp.length} roots")
    }
  }

  test("DataFrame grouping puts twins together (same shingle)") {
    val g = LocalGraph.fromEdges(
      (for (t <- 0 to 1; o <- 2 to 6) yield (t.toLong, o.toLong)) ++ Seq((7L, 8L)))
    val rows = CandidateGenSpark.assign(spark, LocalGraph.toDF(spark, g), membersOf(g), seed = 3)
      .collect().map(r => (r.getInt(0), r.getLong(1))).toMap
    assert(rows(0) == rows(1), "twins 0 and 1 must share a candidate set")
  }

  // ---- SluggerSpark end-to-end ----------------------------------------------

  test("distributed SLUGGER is lossless on a clique union") {
    val edges = GraphGen.cliqueUnion(spark, 8, 6, 30, seed = 7)
    val g = LocalGraph.fromDF(edges)
    val res = SluggerSpark.summarize(spark, edges, Slugger.Config(T = 4))
    assert(res.summary.decompress == g.edgeSet)
    assert(res.summary.cost < g.m, "cliques must compress")
  }

  test("distributed SLUGGER is lossless on random graphs") {
    for (seed <- 1 to 2) {
      val edges = GraphGen.erdosRenyi(spark, 80, 200, seed)
      val g = LocalGraph.fromDF(edges)
      val res = SluggerSpark.summarize(spark, edges, Slugger.Config(T = 3, seed = seed))
      assert(res.summary.decompress == g.edgeSet, s"seed $seed")
    }
  }

  test("distributed and local SLUGGER reach comparable compression") {
    val edges = GraphGen.cliqueUnion(spark, 12, 8, 60, seed = 9)
    val g = LocalGraph.fromDF(edges)
    val local = Slugger.summarize(g, Slugger.Config(T = 6)).summary.cost
    val dist = SluggerSpark.summarize(spark, edges, Slugger.Config(T = 6)).summary.cost
    assert(dist <= local * 1.25 && local <= dist * 1.25,
      s"local $local vs distributed $dist diverge")
  }

  test("DataFrame decompression of the distributed summary equals the input") {
    val edges = GraphGen.bipartiteCores(spark, 4, 4, 8, 20, seed = 11)
    val g = LocalGraph.fromDF(edges)
    val res = SluggerSpark.summarize(spark, edges, Slugger.Config(T = 4))
    val decoded = HierSummary.decompressDF(spark, res.summary.toFrames(spark))
    val diff = decoded.exceptAll(LocalGraph.toDF(spark, g))
      .unionByName(LocalGraph.toDF(spark, g).exceptAll(decoded))
    assert(diff.isEmpty, "DataFrame decompression mismatch")
  }

  // ---- DuckDB reconstruction oracle -----------------------------------------

  /** Rebuild the graph from (pn, hier, sing) in DuckDB with a recursive CTE
    * and require equality with the Spark-side decompression.
    */
  def duckReconstructs(summary: HierSummary): Unit = {
    import spark.implicits._
    val fr = summary.toFrames(spark)
    val sing = (0 until summary.nSub).toDF("sub")
    val sparkSide = HierSummary.decompressDF(spark, fr)
      .select(col("src").cast("long"), col("dst").cast("long"))
    Oracle.assertEquivalent(sparkSide,
      """WITH RECURSIVE closure(sup, sub) AS (
        |  SELECT CAST(sub AS BIGINT), CAST(sub AS BIGINT) FROM sing
        |  UNION ALL
        |  SELECT CAST(h.parent AS BIGINT), c.sub
        |  FROM hier h JOIN closure c ON CAST(h.child AS BIGINT) = c.sup
        |), expanded AS (
        |  SELECT l1.sub AS u, l2.sub AS v, CAST(p.sign AS INT) AS sign,
        |         CASE WHEN CAST(p.x AS BIGINT) = CAST(p.y AS BIGINT)
        |              THEN 0.5 ELSE 1.0 END AS w
        |  FROM pn p
        |  JOIN closure l1 ON l1.sup = CAST(p.x AS BIGINT)
        |  JOIN closure l2 ON l2.sup = CAST(p.y AS BIGINT)
        |  WHERE l1.sub <> l2.sub
        |)
        |SELECT LEAST(u, v) AS src, GREATEST(u, v) AS dst
        |FROM expanded GROUP BY 1, 2 HAVING SUM(sign * w) >= 0.5""".stripMargin,
      "pn" -> fr.pn, "hier" -> fr.hier, "sing" -> sing)
  }

  test("DuckDB recursive-CTE reconstruction matches Spark (local summary)") {
    val g = LocalGraph.fromDF(GraphGen.cliqueUnion(spark, 5, 6, 20, seed = 13))
    duckReconstructs(Slugger.summarize(g, Slugger.Config(T = 8)).summary)
  }

  test("DuckDB recursive-CTE reconstruction matches Spark (distributed summary)") {
    val edges = GraphGen.erdosRenyi(spark, 60, 150, seed = 17)
    duckReconstructs(SluggerSpark.summarize(spark, edges, Slugger.Config(T = 3)).summary)
  }

  test("DuckDB reconstruction matches on the Fig. 2 hand-built model") {
    val s = HierSummary(
      nSub = 6,
      parent = Array(7, 7, 6, 6, -1, -1, 7, -1),
      alive = Array.fill(8)(true),
      pPlus = Seq((5, 7), (6, 6)),
      pMinus = Seq((5, 6)))
    duckReconstructs(s)
  }
}
