package repro.synth

import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec}
import repro.graph.LocalGraph

/** Generator determinism, planted-clique presence, dataset analog specs. */
class GraphGenSpec extends SparkSpec {

  test("attributes are deterministic in the seed") {
    val a1 = GraphGen.attributes(1000, 5)
    val a2 = GraphGen.attributes(1000, 5)
    val a3 = GraphGen.attributes(1000, 6)
    assert(a1.toSeq == a2.toSeq)
    assert(a1.toSeq != a3.toSeq)
  }

  test("attributes are roughly balanced at pA=0.5") {
    val a = GraphGen.attributes(4000, 1)
    val cntA = a.count(_ == 0)
    assert(cntA > 1700 && cntA < 2300, s"cntA=$cntA")
  }

  test("powerLawEdges emits canonical deduplicated edges") {
    val e = GraphGen.powerLawEdges(spark, 500, 2000, seed = 3).cache()
    val rows = e.collect().map(r => (r.getLong(0), r.getLong(1)))
    assert(rows.forall { case (s, d) => s < d })
    assert(rows.distinct.length == rows.length)
    assert(rows.forall { case (s, d) => s >= 1 && d <= 500 })
  }

  test("powerLawEdges degree distribution is heavy-tailed") {
    val g = GraphGen.generate(spark, 2000, 12000, seed = 9)
    val lg = g.toLocal
    val degs = (0 until lg.n).map(lg.degree).sortBy(-_)
    // top 1% of vertices should carry a disproportionate share of edges
    val topShare = degs.take(lg.n / 100).map(_.toLong).sum.toDouble / (2.0 * lg.m)
    assert(topShare > 0.08, s"topShare=$topShare")
  }

  test("generate plants every requested clique") {
    val planted = Seq(GraphGen.Planted(10, 5), GraphGen.Planted(8, 4))
    val g = GraphGen.generate(spark, 800, 3000, planted, seed = 17)
    val lg = g.toLocal
    // at least one clique of each planted size must exist (as a clique,
    // maybe extended); check via maximal cliques of the local graph
    val sizes = lg.maximalCliques().map(_.length)
    planted.foreach(p => assert(sizes.exists(_ >= p.size), s"missing ${p.size}-clique"))
  }

  test("generate is deterministic per seed at the edge-count level") {
    val g1 = GraphGen.generate(spark, 500, 2500, Seq(GraphGen.Planted(6, 3)), seed = 4)
    val g2 = GraphGen.generate(spark, 500, 2500, Seq(GraphGen.Planted(6, 3)), seed = 4)
    assert(g1.numEdges == g2.numEdges)
    assert(g1.numVertices == g2.numVertices)
  }

  test("edge endpoint distribution matches DuckDB aggregation") {
    val g = GraphGen.generate(spark, 300, 1200, seed = 21)
    val perSrc = g.edges.groupBy("src").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      perSrc,
      "SELECT src, COUNT(*) AS cnt FROM edges GROUP BY src",
      "edges" -> g.edges)
  }

  test("randomLocalWithClique plants a fair clique with the given split") {
    val (g, mem) = GraphGen.randomLocalWithClique(50, 0.05, GraphGen.Planted(10, 5), 3)
    val idx = mem.map(id => g.ids.indexOf(id))
    assert(g.isClique(idx.toSeq))
    assert(idx.count(i => g.attr(i) == 0) == 5)
  }

  test("sampleVertices keeps roughly the requested fraction") {
    val g = GraphGen.generate(spark, 2000, 8000, seed = 33)
    val s = GraphGen.sampleVertices(g, 0.5, 7)
    val kept = s.numVertices
    assert(kept > 800 && kept < 1200, s"kept=$kept")
    // induced: every surviving edge joins surviving vertices
    val lg = s.toLocal
    assert(lg.edgeList.forall { case (u, v) => u < lg.n && v < lg.n })
  }

  test("sampleEdges keeps roughly the requested fraction of edges") {
    val g = GraphGen.generate(spark, 2000, 8000, seed = 34)
    val m0 = g.numEdges
    val s = GraphGen.sampleEdges(g, 0.4, 8)
    val m1 = s.numEdges
    assert(m1 > (m0 * 0.3).toLong && m1 < (m0 * 0.5).toLong, s"m0=$m0 m1=$m1")
  }

  test("all six dataset analogs have distinct names and sane specs") {
    val specs = LiteDatasets.specs
    assert(specs.map(_.name).distinct.length == 6)
    specs.foreach { s =>
      assert(s.n > 0 && s.targetEdges > 0)
      assert(s.kRange.contains(s.kDefault))
      assert(s.deltaRange.contains(s.deltaDefault))
      assert(s.planted.nonEmpty)
    }
  }

  test("aminer-lite loads with expected scale") {
    val g = LiteDatasets.load(spark, "aminer-lite")
    val n = g.numVertices
    val m = g.numEdges
    assert(n == LiteDatasets.spec("aminer-lite").n)
    assert(m > 24500 && m < 50000, s"m=$m")
  }

  test("unknown dataset name raises a helpful error") {
    val e = intercept[IllegalArgumentException](LiteDatasets.spec("nope"))
    assert(e.getMessage.contains("aminer-lite"))
  }
}
