package repro.bench

import repro.core.{ColorfulDegrees, LocalReductions, Reductions}
import repro.graph.AttributedGraph
import repro.synth.LiteDatasets

/** Fig 4/5 (tabulated): vertices/edges remaining after EnColorfulCore,
  * ColorfulSup and EnColorfulSup, per dataset and k.
  *
  * The k sweep uses the sequential mirror of the cascade (bit-identical
  * fixpoints, cross-validated in ReductionsSpec); one distributed
  * DataFrame cascade runs per dataset at the default k to exercise the
  * Spark peeling path at bench scale.
  */
class Fig4ReductionBench extends BenchHarness {

  for (spec <- LiteDatasets.specs) {
    test(s"Fig 4 rows for ${spec.name}: reduction sweep over k") {
      val g = BenchData.graph(spark, spec.name)
      val colors = BenchData.colors(spark, spec.name)
      val rows = spec.kRange.map { k =>
        val kept = ColorfulDegrees.localEnColorfulCoreVertices(g, colors, k - 1)
        val g1 = g.inducedSubgraph(kept)
        val c1 = kept.map(colors)
        val g2full = LocalReductions.colorfulSup(g1, c1, k)
        val live2 = (0 until g2full.n).filter(g2full.degree(_) > 0).toArray
        val g2 = g2full.inducedSubgraph(live2)
        val g3full = LocalReductions.enColorfulSup(g2, live2.map(c1), k)
        val live3 = (0 until g3full.n).filter(g3full.degree(_) > 0).toArray
        val g3 = g3full.inducedSubgraph(live3)
        Seq(k.toString,
          s"${g.n}/${g.m}",
          s"${g1.n}/${g1.m}",
          s"${g2.n}/${g2.m}",
          s"${g3.n}/${g3.m}")
      }
      printTable(
        s"Fig 4 — ${spec.name}: vertices/edges remaining",
        Seq("k", "original", "EnColorfulCore", "ColorfulSup", "EnColorfulSup"),
        rows)
      // reductions are nested: each stage removes at least as much
      rows.foreach { r =>
        val ms = r.drop(1).map(_.split("/")(1).toLong)
        assert(ms == ms.sorted.reverse, s"stage edge counts not decreasing: $r")
      }
    }
  }

  test("Fig 4: distributed DataFrame cascade at default k per dataset") {
    val rows = LiteDatasets.specs.map { spec =>
      val ag = LiteDatasets.load(spark, spec.name)
      val ((_, _, stats), t) = timed(Reductions.cascade(spark, ag, spec.kDefault))
      val (lgR, localStats, _) = BenchData.reducedGraph(spark, spec.name, spec.kDefault)
      // distributed and sequential cascades reach the same fixpoint
      assert(stats.last.edges == localStats.last.edges,
        s"${spec.name}: distributed=${stats.last.edges} local=${localStats.last.edges}")
      assert(lgR.m == stats.last.edges)
      Seq(spec.name, spec.kDefault.toString,
        stats.map(s => s"${s.vertices}/${s.edges}").mkString(" -> "), ms(t))
    }
    printTable("Fig 4 — distributed cascade (vertices/edges per stage)",
      Seq("dataset", "k", "EnColorfulCore -> ColorfulSup -> EnColorfulSup", "time ms"),
      rows)
  }
}
