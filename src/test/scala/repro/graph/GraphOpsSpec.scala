package repro.graph

import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec}
import repro.synth.GraphGen

/** Distributed graph ops vs the DuckDB oracle and the local references. */
class GraphOpsSpec extends SparkSpec {

  private def smallGraph(seed: Int, n: Int = 40, p: Double = 0.1) = {
    val lg = GraphGen.randomLocal(n, p, seed)
    (lg, AttributedGraph.fromLocal(spark, lg))
  }

  test("degrees match DuckDB over the symmetric edge relation") {
    val (_, ag) = smallGraph(1)
    val sym = ag.symmetricEdges
    Oracle.assertEquivalent(
      ag.degrees,
      """SELECT v.id AS id, COUNT(s.y) AS degree
        |FROM vertices v LEFT JOIN sym s ON s.x = v.id
        |GROUP BY v.id""".stripMargin,
      "vertices" -> ag.vertices, "sym" -> sym)
  }

  test("canonicalization drops self-loops and duplicates") {
    import spark.implicits._
    val raw = Seq((1L, 2L), (2L, 1L), (3L, 3L), (2L, 4L)).toDF("src", "dst")
    val vs = Seq((1L, 0), (2L, 1), (3L, 0), (4L, 1)).toDF("id", "attr")
    val g = AttributedGraph(vs, raw, canonicalize = true)
    val edges = g.edges.collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(edges == Set((1L, 2L), (2L, 4L)))
  }

  test("symmetricEdges doubles the canonical edge count") {
    val (lg, ag) = smallGraph(2)
    assert(ag.symmetricEdges.count() == 2 * lg.m)
  }

  test("inducedBy keeps only edges among kept vertices") {
    import spark.implicits._
    val (lg, ag) = smallGraph(3)
    val keepIds = lg.ids.filter(_ % 2 == 0)
    val sub = ag.inducedBy(keepIds.toSeq.toDF("id"))
    val keptLocal = lg.inducedSubgraph(
      (0 until lg.n).filter(i => lg.ids(i) % 2 == 0).toArray)
    assert(sub.numVertices == keptLocal.n)
    assert(sub.numEdges == keptLocal.m)
  }

  test("dropIsolated removes exactly the vertices without edges") {
    import spark.implicits._
    val vs = Seq((1L, 0), (2L, 1), (3L, 0)).toDF("id", "attr")
    val es = Seq((1L, 2L)).toDF("src", "dst")
    val g = AttributedGraph(vs, es).dropIsolated
    assert(g.vertices.collect().map(_.getLong(0)).toSet == Set(1L, 2L))
  }

  test("toLocal round-trips fromLocal") {
    val (lg, ag) = smallGraph(4)
    val back = ag.toLocal
    assert(back.n == lg.n && back.m == lg.m)
    assert(back.ids.toSeq == lg.ids.toSeq)
    assert(back.attr.toSeq == lg.attr.toSeq)
    (0 until lg.n).foreach(i => assert(back.adj(i).toSeq == lg.adj(i).toSeq))
  }

  for (seed <- 1 to 4; k <- Seq(2, 3)) {
    test(s"distributed kCore($k) equals local peeling (seed $seed)") {
      val (lg, ag) = smallGraph(seed + 10, n = 50, p = 0.08)
      val dist = GraphOps.kCore(ag, k)
      val localKept = lg.kCoreVertices(k).map(lg.ids(_)).toSet
      val distKept = dist.vertices.collect().map(_.getLong(0)).toSet
      assert(distKept == localKept)
    }
  }

  for (seed <- 1 to 4) {
    test(s"distributed connected components equal local ones (seed $seed)") {
      val (lg, ag) = smallGraph(seed + 20, n = 60, p = 0.03)
      val labels = GraphOps.connectedComponents(ag)
        .collect().map(r => r.getLong(0) -> r.getLong(1)).toMap
      val localComps = lg.connectedComponents
        .map(_.map(lg.ids(_)).toSet)
      // grouping the distributed labels must reproduce the local partition
      val distComps = labels.groupBy(_._2).values.map(_.keySet).toSet
      assert(distComps == localComps.toSet)
      // and every component's label is its minimum vertex id
      labels.groupBy(_._2).foreach { case (label, members) =>
        assert(label == members.keys.min)
      }
    }
  }

  test("kCore of a graph below threshold is empty") {
    import spark.implicits._
    val vs = Seq((1L, 0), (2L, 1), (3L, 0)).toDF("id", "attr")
    val es = Seq((1L, 2L), (2L, 3L)).toDF("src", "dst")
    val g = GraphOps.kCore(AttributedGraph(vs, es), 2)
    assert(g.numVertices == 0)
  }
}
