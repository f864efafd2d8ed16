package repro.core

import repro.SparkSpec
import repro.graph.AttributedGraph
import repro.synth.GraphGen

/** End-to-end pipeline: distributed reductions + parallel component search. */
class PipelineSpec extends SparkSpec {

  for (seed <- 1 to 5) {
    test(s"pipeline equals the naive reference end-to-end (seed $seed)") {
      val lg = GraphGen.randomLocal(60, 0.12, seed)
      val ag = AttributedGraph.fromLocal(spark, lg)
      for (k <- 2 to 3) {
        val delta = 2
        val expected = NaiveRef.maxFairCliqueSize(lg, k, delta)
        val res = Pipeline.run(spark, ag, k, delta,
          Pipeline.Config(Bounds.BoundConfig(ad = true), useHeuristic = true))
        assert(res.size == expected, s"k=$k: got ${res.size} want $expected")
        if (expected > 0) {
          val idx = res.cliqueIds.map(id => lg.ids.indexOf(id))
          assert(FairClique.isFairClique(lg, idx.toSeq, k, delta))
        }
      }
    }
  }

  test("pipeline with planted clique recovers it through all reductions") {
    val g = GraphGen.generate(spark, 600, 3500,
      Seq(GraphGen.Planted(12, 6), GraphGen.Planted(8, 4)), seed = 5)
    val lg = g.toLocal
    val k = 4; val delta = 2
    val expected = NaiveRef.maxFairCliqueSize(lg, k, delta)
    assert(expected >= 12)
    val res = Pipeline.run(spark, g, k, delta,
      Pipeline.Config(Bounds.BoundConfig(ad = true, colorfulDegeneracy = true),
        useHeuristic = true))
    assert(res.size == expected)
  }

  test("driver-side and distributed component search agree") {
    val lg = GraphGen.randomLocal(80, 0.08, 11)
    val ag = AttributedGraph.fromLocal(spark, lg)
    val base = Pipeline.Config(Bounds.BoundConfig(ad = true))
    val dist = Pipeline.run(spark, ag, 2, 2, base.copy(distributedSearch = true))
    val local = Pipeline.run(spark, ag, 2, 2, base.copy(distributedSearch = false))
    assert(dist.size == local.size)
  }

  test("pipeline without heuristic still finds the optimum") {
    val lg = GraphGen.randomLocal(50, 0.15, 21)
    val ag = AttributedGraph.fromLocal(spark, lg)
    val expected = NaiveRef.maxFairCliqueSize(lg, 2, 1)
    val res = Pipeline.run(spark, ag, 2, 1, Pipeline.Config())
    assert(res.size == expected)
  }

  test("pipeline reports reduction statistics and heuristic size") {
    val g = GraphGen.generate(spark, 500, 3000, Seq(GraphGen.Planted(10, 5)), seed = 8)
    val res = Pipeline.run(spark, g, 3, 2,
      Pipeline.Config(Bounds.BoundConfig(ad = true), useHeuristic = true))
    assert(res.reductionStats.length == 3)
    assert(res.heuristicSize <= res.size)
    assert(res.reducedEdges <= g.numEdges)
  }

  test("pipeline on a graph with no fair clique returns empty") {
    val lg = GraphGen.randomLocal(30, 0.05, 31)
    val ag = AttributedGraph.fromLocal(spark, lg)
    val res = Pipeline.run(spark, ag, 8, 1, Pipeline.Config())
    assert(res.size == 0)
    assert(res.cliqueIds.isEmpty)
  }
}
