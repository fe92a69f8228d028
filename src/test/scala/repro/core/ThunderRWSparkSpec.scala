package repro.core

import org.apache.spark.sql.functions._
import repro.{GraphFixtures, Oracle, SparkSpec}
import repro.memsim.MemConfig
import repro.sampling.SamplingMethod

/** End-to-end Spark runs: partitioned execution over the Dataset API,
  * equivalence with the single-worker path, and DuckDB oracle checks on
  * walk-output DataFrame queries.
  */
class ThunderRWSparkSpec extends SparkSpec with GraphFixtures {

  private lazy val g = tinyGraph(n = 300, e = 2000, seed = 71L)
  private val cfg = MemConfig()

  private def sparkRun(n: Int, threads: Int, kind: EngineKind.Value = EngineKind.Interleaved) = {
    val app = new Apps.DeepWalk(12)
    val rng = new java.util.SplittableRandom(2L)
    val src = Array.fill(n)(rng.nextInt(g.numVertices))
    ThunderRW.run(spark, g, app, SamplingMethod.ALIAS, kind, n, src,
      threads = threads, cfg = cfg)
  }

  test("spark run returns one walk per query with correct sources") {
    val n = 200
    val sum = sparkRun(n, threads = 4)
    assert(sum.walks.size == n)
    assert(sum.walks.map(_.id).toSet == (0L until n.toLong).toSet)
    sum.walks.foreach(w => assert(w.path.head == w.source))
  }

  test("spark walks equal single-worker walks (partitioning is transparent)") {
    val n = 150
    val sum = sparkRun(n, threads = 5)
    val app = new Apps.DeepWalk(12)
    val rng = new java.util.SplittableRandom(2L)
    val src = Array.fill(n)(rng.nextInt(g.numVertices))
    val (t, _) = ThunderRW.preprocess(g, app, SamplingMethod.ALIAS, cfg, charge = false)
    val walkers = ThunderRW.makeWalkers(0 until n, src, seed = 2021L)
    ThunderRW.runLocal(g, app, SamplingMethod.ALIAS, EngineKind.Interleaved, t, walkers, cfg)
    val local = walkers.map(w => w.id.toLong -> w.path.toSeq).toMap
    sum.walks.foreach(w => assert(w.path == local(w.id), s"walk ${w.id} differs"))
  }

  test("per-partition stats aggregate to the run totals") {
    val sum = sparkRun(100, threads = 4)
    assert(sum.steps == sum.walks.map(_.len.toLong).sum)
    assert(sum.stats.cycles > 0)
    assert(sum.execSeconds <= sum.parts.map(_.stats.seconds).sum + 1e-9)
  }

  test("more threads reduce the makespan") {
    val one = sparkRun(400, threads = 1)
    val ten = sparkRun(400, threads = 10)
    assert(ten.execSeconds < one.execSeconds)
  }

  test("keepWalks=false drops paths but keeps stats") {
    val app = new Apps.DeepWalk(10)
    val src = Array.fill(50)(3)
    val sum = ThunderRW.run(spark, g, app, SamplingMethod.ALIAS, EngineKind.Sequential,
      50, src, threads = 2, cfg = cfg, keepWalks = false)
    assert(sum.walks.isEmpty && sum.steps > 0)
  }

  test("oracle: walk length histogram via Spark SQL equals DuckDB") {
    import spark.implicits._
    val sum = sparkRun(200, threads = 4)
    val walksDf = sum.walks.map(w => (w.id, w.source, w.len)).toDF("id", "source", "len").cache()
    val sparkHist = walksDf.groupBy($"len").agg(count(lit(1)) as "cnt")
      .select($"len".cast("string") as "len", $"cnt")
    Oracle.assertEquivalent(sparkHist,
      "SELECT len, COUNT(*) AS cnt FROM walks GROUP BY len", "walks" -> walksDf)
  }

  test("oracle: per-source walk counts via Spark SQL equal DuckDB") {
    import spark.implicits._
    val sum = sparkRun(200, threads = 4)
    val walksDf = sum.walks.map(w => (w.id, w.source, w.len)).toDF("id", "source", "len").cache()
    val sparkCnt = walksDf.groupBy($"source").agg(count(lit(1)) as "cnt", max($"len") as "max_len")
      .select($"source".cast("string") as "source", $"cnt", $"max_len".cast("long") as "max_len")
    Oracle.assertEquivalent(sparkCnt,
      "SELECT source, COUNT(*) AS cnt, MAX(CAST(len AS BIGINT)) AS max_len FROM walks GROUP BY source",
      "walks" -> walksDf)
  }

  test("oracle: vertex visit frequencies from exploded steps equal DuckDB") {
    import spark.implicits._
    val sum = sparkRun(150, threads = 4)
    val steps = ThunderRW.walksToSteps(spark, sum.walks).toDF().cache()
    val sparkTop = steps.groupBy($"vertex").agg(count(lit(1)) as "visits")
      .select($"vertex".cast("string") as "vertex", $"visits")
    Oracle.assertEquivalent(sparkTop,
      "SELECT vertex, COUNT(*) AS visits FROM steps GROUP BY vertex", "steps" -> steps)
  }

  test("walksToSteps emits path-length rows per walk") {
    val sum = sparkRun(20, threads = 2)
    val steps = ThunderRW.walksToSteps(spark, sum.walks)
    assert(steps.count() == sum.walks.map(_.path.size.toLong).sum)
  }

  test("preprocessing seconds are reported for static sampling and zero for O-REJ") {
    val app = new Apps.DeepWalk(5)
    val src = Array.fill(30)(1)
    val withTables = ThunderRW.run(spark, g, app, SamplingMethod.ALIAS,
      EngineKind.Sequential, 30, src, threads = 2, cfg = cfg)
    val noTables = ThunderRW.run(spark, g, app, SamplingMethod.OREJ,
      EngineKind.Sequential, 30, src, threads = 2, cfg = cfg)
    assert(withTables.preprocSeconds > 0)
    assert(noTables.preprocSeconds == 0.0)
  }
}
