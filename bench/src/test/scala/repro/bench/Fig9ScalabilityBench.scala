package repro.bench

import repro.core.{Bounds, Heuristics, LocalReductions, Search}
import repro.graph.Coloring
import repro.synth.{GraphGen, LiteDatasets}

/** Fig 9 (tabulated): scalability on 20–80% vertex and edge samples of
  * flixster-lite (the dataset the paper shows), comparing MaxRFC,
  * MaxRFC+ub and MaxRFC+ub+HeurRFC.
  */
class Fig9ScalabilityBench extends BenchHarness {

  private val nodeLimit = 20_000_000L
  private val dataset = "flixster-lite"

  private def ubCfg = Bounds.BoundConfig(ad = true, colorfulDegeneracy = true)

  private def runOn(lg: repro.graph.LocalGraph, k: Int, delta: Int): Seq[String] = {
    val colors = Coloring.greedyLocal(lg)
    val ((reduced, _), redMs) = timed(LocalReductions.cascade(lg, colors, k))
    val (r0, t0) = timed(Search.maxRFC(reduced, k, delta, nodeLimit = nodeLimit))
    val (r1, t1) = timed(Search.maxRFC(reduced, k, delta, ubCfg, nodeLimit = nodeLimit))
    val (r2, t2) = timed {
      val heur = Heuristics.heurRFC(reduced, k, delta).clique
      Search.maxRFC(reduced, k, delta, ubCfg, initialBest = heur, nodeLimit = nodeLimit)
    }
    Seq(
      r2.size.toString,
      if (r0.truncated) "INF" else ms(redMs + t0),
      if (r1.truncated) "INF" else ms(redMs + t1),
      if (r2.truncated) "INF" else ms(redMs + t2))
  }

  test("Fig 9a: vertex-sampled subgraphs (20%-80%)") {
    val spec = LiteDatasets.spec(dataset)
    val full = LiteDatasets.load(spark, dataset)
    val rows = Seq(0.2, 0.4, 0.6, 0.8).map { f =>
      val lg = GraphGen.sampleVertices(full, f, seed = 99).toLocal
      Seq(f"${(f * 100).toInt}%d%%", lg.n.toString, lg.m.toString) ++
        runOn(lg, spec.kDefault, spec.deltaDefault)
    }
    printTable(
      s"Fig 9 — $dataset vertex samples (k=${spec.kDefault}, delta=${spec.deltaDefault}), time ms",
      Seq("|V| frac", "n", "m", "|MaxRFC|", "MaxRFC", "MaxRFC+ub", "MaxRFC+ub+HeurRFC"),
      rows)
  }

  test("Fig 9b: edge-sampled subgraphs (20%-80%)") {
    val spec = LiteDatasets.spec(dataset)
    val full = LiteDatasets.load(spark, dataset)
    val rows = Seq(0.2, 0.4, 0.6, 0.8).map { f =>
      val lg = GraphGen.sampleEdges(full, f, seed = 98).toLocal
      Seq(f"${(f * 100).toInt}%d%%", lg.n.toString, lg.m.toString) ++
        runOn(lg, spec.kDefault, spec.deltaDefault)
    }
    printTable(
      s"Fig 9 — $dataset edge samples (k=${spec.kDefault}, delta=${spec.deltaDefault}), time ms",
      Seq("|E| frac", "n", "m", "|MaxRFC|", "MaxRFC", "MaxRFC+ub", "MaxRFC+ub+HeurRFC"),
      rows)
  }
}
