package repro.graph

import org.apache.spark.sql.functions._
import repro.{GraphFixtures, Oracle, SparkSpec}

class GraphSpec extends SparkSpec with GraphFixtures {

  test("CSR offsets are monotone and cover all edges") {
    val g = tinyGraph()
    assert(g.offsets.head == 0)
    assert(g.offsets.last == g.numEdges)
    g.offsets.sliding(2).foreach(p => assert(p(0) <= p(1)))
  }

  test("undirected build doubles the edge count") {
    val df = tinyEdges(n = 50, e = 200)
    val g = GraphBuilder.fromEdges(df, 50, "t", undirect = true)
    assert(g.numEdges == 400)
  }

  test("directed build preserves the edge count") {
    val df = tinyEdges(n = 50, e = 200)
    val g = GraphBuilder.fromEdges(df, 50, "t", undirect = false)
    assert(g.numEdges == 200)
  }

  test("adjacency lists are sorted by neighbor id") {
    val g = tinyGraph()
    (0 until g.numVertices).foreach { v =>
      val base = g.edgeBegin(v)
      (1 until g.degree(v)).foreach(i => assert(g.neighbor(base + i - 1) <= g.neighbor(base + i)))
    }
  }

  test("weights and labels travel with their edge through the sort") {
    val g = explicitGraph(4, Seq((0, 3, 3.5f, 2), (0, 1, 1.5f, 1), (0, 2, 2.5f, 0)))
    assert(g.degree(0) == 3)
    val base = g.edgeBegin(0)
    assert((0 until 3).map(i => g.neighbor(base + i)) == Seq(1, 2, 3))
    assert((0 until 3).map(i => g.weight(base + i)) == Seq(1.5f, 2.5f, 3.5f))
    assert((0 until 3).map(i => g.label(base + i)) == Seq(1, 0, 2))
  }

  test("undirected build stores the reverse edge with same weight and label") {
    val g = explicitGraph(3, Seq((0, 1, 2.0f, 4)), undirect = true)
    assert(g.degree(0) == 1 && g.degree(1) == 1)
    assert(g.neighbor(g.edgeBegin(1)) == 0)
    assert(g.weight(g.edgeBegin(1)) == 2.0f)
    assert(g.label(g.edgeBegin(1)) == 4)
  }

  test("isNeighborProbes finds present and absent neighbors") {
    val g = explicitGraph(6, Seq((0, 1, 1f, 0), (0, 3, 1f, 0), (0, 5, 1f, 0)))
    assert(g.isNeighborProbes(0, 3)._1)
    assert(g.isNeighborProbes(0, 1)._1)
    assert(g.isNeighborProbes(0, 5)._1)
    assert(!g.isNeighborProbes(0, 2)._1)
    assert(!g.isNeighborProbes(0, 0)._1)
    // probe count bounded by ceil(log2(d)) + 1
    assert(g.isNeighborProbes(0, 2)._2.length <= 3)
  }

  test("degree/maxDegree/avgDegree/memoryBytes are consistent") {
    val g = tinyGraph(n = 80, e = 400)
    assert((0 until g.numVertices).map(g.degree).sum == g.numEdges)
    assert(g.maxDegree == (0 until g.numVertices).map(g.degree).max)
    assert(math.abs(g.avgDegree - g.numEdges.toDouble / g.numVertices) < 1e-9)
    assert(g.memoryBytes == 4L * (g.offsets.length + 3 * g.numEdges))
  }

  test("simulated address regions are disjoint") {
    val g = tinyGraph()
    val e = g.numEdges - 1
    val addrs = Seq(g.addrOffset(g.numVertices), g.addrNeighbor(e), g.addrWeight(e),
      g.addrLabel(e), g.addrAliasProb(e), g.addrAliasPair(e), g.addrCdf(e), g.addrRejMax(g.numVertices - 1))
    addrs.indices.foreach { i =>
      addrs.indices.foreach { j =>
        if (i != j) assert((addrs(i) >> 40) != (addrs(j) >> 40))
      }
    }
  }

  test("oracle: CSR degree histogram matches DuckDB over the edge list") {
    val df = tinyEdges(n = 60, e = 300, seed = 5L).cache()
    val g = GraphBuilder.fromEdges(df, 60, "t", undirect = false)
    import spark.implicits._
    val csrDeg = (0 until g.numVertices).map(v => (v, g.degree(v)))
      .toDF("src", "degree").where($"degree" > 0)
      .select($"src".cast("string") as "src", $"degree".cast("long") as "degree")
    Oracle.assertEquivalent(csrDeg,
      "SELECT src, COUNT(*) AS degree FROM edges GROUP BY src", "edges" -> df)
  }

  test("oracle: label histogram of CSR equals DuckDB label histogram (doubled)") {
    val df = tinyEdges(n = 60, e = 300, seed = 6L).cache()
    val g = GraphBuilder.fromEdges(df, 60, "t", undirect = true)
    import spark.implicits._
    val csrLabels = g.labels.toSeq.groupBy(identity).map { case (l, xs) => (l.toString, xs.size.toLong) }
      .toSeq.toDF("label", "cnt")
    Oracle.assertEquivalent(csrLabels,
      "SELECT label, 2 * COUNT(*) AS cnt FROM edges GROUP BY label", "edges" -> df)
  }

  test("oracle: total weight mass of CSR equals DuckDB sum (doubled, rounded)") {
    val df = tinyEdges(n = 40, e = 150, seed = 7L).cache()
    val g = GraphBuilder.fromEdges(df, 40, "t", undirect = true)
    import spark.implicits._
    val total = Seq(math.round(g.weights.map(_.toDouble).sum).toDouble).toDF("w")
    Oracle.assertEquivalent(total,
      "SELECT ROUND(2 * SUM(CAST(weight AS DOUBLE))) AS w FROM edges", "edges" -> df)
  }

  test("builder rejects out-of-range vertices") {
    import spark.implicits._
    val df = Seq((0, 99, 1.0f, 0)).toDF("src", "dst", "weight", "label")
    intercept[IllegalArgumentException](GraphBuilder.fromEdges(df, 10, "bad"))
  }
}

class GraphGenSpec extends SparkSpec {

  test("all twelve dataset specs are present in paper order") {
    assert(GraphGen.datasets.map(_.key) ==
      Seq("am", "yt", "up", "eu", "ac", "ab", "lj", "ot", "wk", "uk", "tw", "fs"))
  }

  test("edge generation is deterministic in the seed") {
    val s = GraphGen.spec("am")
    val a = GraphGen.edges(spark, s, seed = 1L).collect().map(_.toString).sorted
    val b = GraphGen.edges(spark, s, seed = 1L).collect().map(_.toString).sorted
    assert(a.sameElements(b))
  }

  test("generated edges stay in range and avoid self loops (non-bipartite)") {
    val s = GraphGen.spec("am")
    val df = GraphGen.edges(spark, s)
    val bad = df.where(col("src") < 0 || col("src") >= s.vertices ||
      col("dst") < 0 || col("dst") >= s.vertices || col("src") === col("dst")).count()
    assert(bad == 0)
  }

  test("bipartite specs generate only left->right pairs") {
    val s = GraphGen.spec("ac")
    val nLeft = s.vertices / 2
    val df = GraphGen.edges(spark, s)
    assert(df.where(col("src") >= nLeft || col("dst") < nLeft).count() == 0)
  }

  test("am analogue builds with the spec'd sizes and matches paper avg degree class") {
    val g = GraphGen.build(spark, "am")
    val s = GraphGen.spec("am")
    assert(g.numVertices == s.vertices)
    assert(g.numEdges == 2 * s.edges)
    assert(g.avgDegree > 2.0 && g.avgDegree < 8.0) // paper: 3.38 per direction pair
  }

  test("skewed spec yields a much larger max degree than an unskewed one") {
    val yt = GraphGen.build(spark, "yt") // skew 0.75
    assert(yt.maxDegree > 20 * yt.avgDegree, s"max=${yt.maxDegree} avg=${yt.avgDegree}")
  }

  test("wk analogue carries 1327 distinct-label space") {
    val s = GraphGen.spec("wk")
    assert(s.nLabels == 1327)
  }

  test("weights are in [1, 5)") {
    val df = GraphGen.edges(spark, GraphGen.spec("am"))
    assert(df.where(col("weight") < 1.0f || col("weight") >= 5.0f).count() == 0)
  }
}
