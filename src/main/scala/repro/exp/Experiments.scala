package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.graph.{CSRGraph, GraphGen}
import repro.memsim.{MemConfig, MemSim, SimStats}
import repro.sampling.SamplingMethod
import repro.systems.{Systems, SystemSpec}

/** Shared experiment harness: dataset cache, workload construction and the
  * (system × app × dataset) cell runner used by every table.
  */
object Experiments {

  val cfg: MemConfig = MemConfig()

  /** Global workload scale knob: REPRO_SCALE=0.1 shrinks query counts 10x;
    * tests may set `scaleOverride` directly. Benches run at 1.0.
    */
  @volatile var scaleOverride: Option[Double] = None
  def scale: Double =
    scaleOverride.getOrElse(sys.env.get("REPRO_SCALE").map(_.toDouble).getOrElse(1.0))

  private val cache = scala.collection.mutable.Map.empty[String, CSRGraph]

  def graph(spark: SparkSession, key: String): CSRGraph = synchronized {
    cache.getOrElseUpdate(key, GraphGen.build(spark, key))
  }

  def clearGraphCache(): Unit = synchronized { cache.clear() }

  /** Highest-degree vertex: the paper's "given vertex" for PPR / the BFS
    * and SSSP source.
    */
  def hubVertex(g: CSRGraph): Int = {
    var best = 0; var bd = -1; var v = 0
    while (v < g.numVertices) { val d = g.degree(v); if (d > bd) { bd = d; best = v }; v += 1 }
    best
  }

  def makeApp(name: String, g: CSRGraph): RandomWalkApp = name match {
    case "PPR"      => new Apps.PPR(stopProb = 0.2)
    case "DeepWalk" => new Apps.DeepWalk(targetLength = 80)
    case "Node2Vec" => new Apps.Node2Vec(a = 2.0, b = 0.5, targetLength = 80)
    case "MetaPath" =>
      val nLabels = if (g.hasLabels) (g.labels.max + 1) else 5
      Apps.metaPathFor(nLabels, len = 5, targetLength = 80)
    case other => sys.error(s"unknown app $other")
  }

  /** Query count per cell, scaled from the paper's 1-query-per-vertex /
    * |V|-queries-from-source setup to simulator-friendly sizes.
    */
  def nQueries(app: String, dataset: String, g: CSRGraph): Int = {
    val base = app match {
      case "PPR" => math.min(g.numVertices, 4000)
      case "MetaPath" if dataset == "tw" || dataset == "fs" => 120 // hub gathers dominate
      case "Node2Vec" | "MetaPath" => math.min(g.numVertices, 400) // per-step gather cells
      case _ => math.min(g.numVertices, 1200)
    }
    math.max(16, (base * scale).toInt)
  }

  /** Source vertex per query id: PPR is single-source; the others start
    * from (deterministically) random vertices across the graph.
    */
  def sources(app: String, g: CSRGraph, n: Int, seed: Long = 5L): Array[Int] =
    if (app == "PPR") Array.fill(n)(hubVertex(g))
    else {
      val rng = new java.util.SplittableRandom(seed)
      Array.fill(n)(rng.nextInt(g.numVertices))
    }

  final case class CellResult(
      system: String, app: String, dataset: String,
      execSeconds: Double, preprocSeconds: Double, steps: Long,
      stats: SimStats,
  ) {
    def totalSeconds: Double = execSeconds + preprocSeconds
  }

  /** Run one Table 6 cell. */
  def runCell(spark: SparkSession, sys: SystemSpec, appName: String,
              dataset: String, taskRing: Int = 64): CellResult = {
    val g = graph(spark, dataset)
    val app = makeApp(appName, g)
    val n = nQueries(appName, dataset, g)
    val src = sources(appName, g, n)
    val sum = ThunderRW.run(spark, g, app, sys.samplingFor(appName), sys.kind,
      n, src, threads = sys.threads, cfg = cfg, taskRing = taskRing,
      overhead = sys.overhead, keepWalks = false)
    CellResult(sys.name, appName, dataset, sum.execSeconds, sum.preprocSeconds,
      sum.steps, sum.stats)
  }

  /** App factory that also covers the unbiased DeepWalk profiling variant. */
  def makeApp2(name: String, g: CSRGraph, length: Int = 80): RandomWalkApp = name match {
    case "PPR"               => new Apps.PPR(0.2)
    case "DeepWalk"          => new Apps.DeepWalk(length)
    case "DeepWalk-unbiased" => new Apps.DeepWalkUnbiased(length)
    case "Node2Vec"          => new Apps.Node2Vec(2.0, 0.5, length)
    case "MetaPath" =>
      val nLabels = if (g.hasLabels) (g.labels.max + 1) else 5
      Apps.metaPathFor(nLabels, len = 5, targetLength = length)
    case other => sys.error(s"unknown app $other")
  }

  /** Single-worker profiling run (no Spark): used by the TMAM tables.
    * Returns (per-worker stats, steps, phases).
    */
  def profileRun(g: CSRGraph, appName: String, sampling: SamplingMethod.Value,
                 kind: EngineKind.Value, n: Int, length: Int = 80,
                 taskRing: Int = 64): (SimStats, Long, PhaseBreakdown) = {
    val app: RandomWalkApp = makeApp2(appName, g, length)
    val src = sources(if (appName == "PPR") "PPR" else "x", g, n)
    val (tables, _) = ThunderRW.preprocess(g, app, sampling, cfg, charge = false)
    val walkers = ThunderRW.makeWalkers(0 until n, src, seed = 2021L)
    val res = ThunderRW.runLocal(g, app, sampling, kind, tables, walkers, cfg, taskRing)
    (res.stats, res.steps, res.phases)
  }
}
