package repro.core

import scala.collection.mutable
import repro.{Oracle, SparkSpec}
import repro.TestUtil.assertClose

/** The distributed engine must agree with the local reference engine on
  * every algorithm, and with DuckDB's recursive-CTE shortest paths.
  */
class SparkEngineSpec extends SparkSpec {
  private lazy val engine = new SparkEngine(spark, 4)

  private val algos: Seq[(String, GraphState => VCAlgo)] = Seq(
    ("SSSP", _ => SSSP(0)),
    ("BFS", _ => BFS(0)),
    ("PageRank", _ => PageRank(eps = 1e-7)),
    ("PHP", _ => PHP(0, eps = 1e-7)),
  )

  for ((name, mk) <- algos; seed <- 1 to 4) {
    test(s"SparkEngine batch == LocalEngine batch: $name seed $seed") {
      val g = GraphGen.random(70, 3.0, seed * 31)
      val algo = mk(g)
      val s = engine.batch(algo, g)
      val l = LocalEngine.batch(algo, g)
      assertClose(l.states, s.states, 1e-6, s"$name/$seed")
    }
  }

  test("SparkEngine counts the same SSSP activation order of magnitude as LocalEngine") {
    val g = GraphGen.random(80, 3.0, 99)
    val s = engine.batch(SSSP(0), g)
    val l = LocalEngine.batch(SSSP(0), g)
    // BSP schedules coincide here: both engines process the same frontier
    assert(s.stats.activations == l.stats.activations)
  }

  for (seed <- 1 to 3) {
    test(s"SSSP distances match DuckDB recursive CTE (seed $seed)") {
      val g = GraphGen.random(12, 1.6, seed * 7)
      val run = engine.batch(SSSP(0), g)
      val rows = run.states.toSeq.filter(_._2.isFinite).map { case (v, d) => (v, d) }
      val df = spark.createDataFrame(rows).toDF("v", "dist")
      Oracle.assertEquivalent(df,
        s"""WITH RECURSIVE r(v, d, hops) AS (
           |  SELECT CAST(0 AS BIGINT), CAST(0 AS DOUBLE), 0
           |  UNION
           |  SELECT CAST(e.dst AS BIGINT), r.d + CAST(e.w AS DOUBLE), r.hops + 1
           |  FROM r JOIN edges e ON CAST(e.src AS BIGINT) = r.v
           |  WHERE r.hops < ${g.numVertices}
           |)
           |SELECT v, MIN(d) AS dist FROM r GROUP BY v""".stripMargin,
        "edges" -> g.toDF(spark))
    }
    test(s"BFS hops match DuckDB recursive CTE (seed $seed)") {
      val g = GraphGen.random(12, 1.6, seed * 13)
      val run = engine.batch(BFS(0), g)
      val rows = run.states.toSeq.filter(_._2.isFinite).map { case (v, d) => (v, d) }
      val df = spark.createDataFrame(rows).toDF("v", "hops")
      Oracle.assertEquivalent(df,
        s"""WITH RECURSIVE r(v, d) AS (
           |  SELECT CAST(0 AS BIGINT), CAST(0 AS DOUBLE)
           |  UNION
           |  SELECT CAST(e.dst AS BIGINT), r.d + 1
           |  FROM r JOIN edges e ON CAST(e.src AS BIGINT) = r.v
           |  WHERE r.d < ${g.numVertices}
           |)
           |SELECT v, MIN(d) AS hops FROM r GROUP BY v""".stripMargin,
        "edges" -> g.toDF(spark))
    }
  }

  test("seeded run continues from existing states (incremental semantics)") {
    val g = GraphState.fromEdges(Seq(RawEdge(0, 1, 2), RawEdge(1, 2, 2)))
    val algo = SSSP(0)
    val adjBc = spark.sparkContext.broadcast(g.adjacency(algo))
    val states = mutable.LongMap(0L -> 0.0, 1L -> 2.0, 2L -> 4.0)
    // a better path to v1 appears: distance 1
    val run = engine.run(algo, adjBc, states, Seq(1L -> 1.0))
    adjBc.destroy()
    assert(run.states(1L) == 1.0 && run.states(2L) == 3.0)
  }

  test("empty seeds return untouched states at zero cost") {
    val g = GraphGen.random(20, 2.0, 5)
    val algo = SSSP(0)
    val adjBc = spark.sparkContext.broadcast(g.adjacency(algo))
    val states = mutable.LongMap(0L -> 0.0)
    val run = engine.run(algo, adjBc, states, Nil)
    adjBc.destroy()
    assert(run.stats.iterations == 0 && run.stats.activations == 0)
  }
}
