package repro.core

import org.apache.spark.sql.DataFrame

import repro.SparkSpec
import repro.graph.{AttributedGraph, Coloring, LocalGraph}
import repro.synth.GraphGen

/** The ColorfulSup / EnColorfulSup peeling reductions (Lemmas 3–4). */
class ReductionsSpec extends SparkSpec {

  private def colored(seed: Int, n: Int = 35, p: Double = 0.2):
      (LocalGraph, Array[Int], AttributedGraph, DataFrame) = {
    import spark.implicits._
    val lg = GraphGen.randomLocal(n, p, seed)
    val colors = Coloring.greedyLocal(lg)
    val ag = AttributedGraph.fromLocal(spark, lg)
    val cdf = (0 until lg.n).map(i => (lg.ids(i), colors(i))).toDF("id", "color")
    (lg, colors, ag, cdf)
  }

  private def edgeSet(g: AttributedGraph): Set[(Long, Long)] =
    g.edges.collect().map(r => (r.getLong(0), r.getLong(1))).toSet

  private def localEdgeSet(g: LocalGraph): Set[(Long, Long)] =
    g.edgeList.map { case (u, v) =>
      (math.min(g.ids(u), g.ids(v)), math.max(g.ids(u), g.ids(v)))
    }.toSet

  for (seed <- 1 to 10; k <- Seq(2, 3, 4)) {
    test(s"incremental Algorithm 1 equals batch peeling (seed $seed, k=$k)") {
      val (lg, colors, _, _) = colored(seed + 500, n = 40, p = 0.25)
      assert(localEdgeSet(LocalReductions.colorfulSup(lg, colors, k)) ==
        localEdgeSet(LocalReductions.colorfulSupBatch(lg, colors, k)))
      assert(localEdgeSet(LocalReductions.enColorfulSup(lg, colors, k)) ==
        localEdgeSet(LocalReductions.enColorfulSupBatch(lg, colors, k)))
    }
  }

  for (seed <- 1 to 6; k <- Seq(2, 3)) {
    test(s"distributed ColorfulSup equals local peeling (seed $seed, k=$k)") {
      val (lg, colors, ag, cdf) = colored(seed)
      val dist = Reductions.colorfulSupReduce(ag, cdf, k)
      val local = LocalReductions.colorfulSup(lg, colors, k)
      assert(edgeSet(dist) == localEdgeSet(local))
    }
  }

  for (seed <- 1 to 6; k <- Seq(2, 3)) {
    test(s"distributed EnColorfulSup equals local peeling (seed $seed, k=$k)") {
      val (lg, colors, ag, cdf) = colored(seed + 20)
      val dist = Reductions.enColorfulSupReduce(ag, cdf, k)
      val local = LocalReductions.enColorfulSup(lg, colors, k)
      assert(edgeSet(dist) == localEdgeSet(local))
    }
  }

  for (seed <- 1 to 6; k <- Seq(2, 3)) {
    test(s"ColorfulSup fixpoint satisfies all Lemma 3 conditions (seed $seed, k=$k)") {
      val (lg, colors, _, _) = colored(seed + 40)
      val red = LocalReductions.colorfulSup(lg, colors, k)
      val sup = ColorfulSupport.localColorfulSupports(red, colors, (_, _) => true)
      sup.foreach { case ((u, v), (sA, sB)) =>
        assert(!LocalReductions.supViolated(red.attr(u), red.attr(v), sA, sB, k))
      }
    }
  }

  for (seed <- 1 to 6; k <- Seq(2, 3)) {
    test(s"EnColorfulSup fixpoint satisfies all Lemma 4 conditions (seed $seed, k=$k)") {
      val (lg, colors, _, _) = colored(seed + 60)
      val red = LocalReductions.enColorfulSup(lg, colors, k)
      val grp = ColorfulSupport.localEnhancedGroups(red, colors, (_, _) => true)
      grp.foreach { case ((u, v), (cA, cB, cM)) =>
        assert(!LocalReductions.enSupViolated(red.attr(u), red.attr(v), cA, cB, cM, k))
      }
    }
  }

  for (seed <- 1 to 12; k <- Seq(2, 3)) {
    test(s"safety: every maximum fair clique survives both reductions (seed $seed, k=$k)") {
      val delta = 2
      val (lg, colors, _, _) = colored(seed + 80, n = 28, p = 0.35)
      NaiveRef.maxFairClique(lg, k, delta).foreach { clique =>
        val r1 = LocalReductions.colorfulSup(lg, colors, k)
        assert(r1.isClique(clique.toSeq), "ColorfulSup broke the optimum clique")
        val r2 = LocalReductions.enColorfulSup(lg, colors, k)
        assert(r2.isClique(clique.toSeq), "EnColorfulSup broke the optimum clique")
      }
    }
  }

  for (seed <- 1 to 6) {
    test(s"EnColorfulSup removes at least as many edges as ColorfulSup (seed $seed)") {
      val (lg, colors, _, _) = colored(seed + 200, n = 40, p = 0.25)
      for (k <- 2 to 4) {
        val sup = localEdgeSet(LocalReductions.colorfulSup(lg, colors, k))
        val en = localEdgeSet(LocalReductions.enColorfulSup(lg, colors, k))
        assert(en.subsetOf(sup), s"k=$k")
      }
    }
  }

  for (seed <- 1 to 6) {
    test(s"reduction strength is monotone in k (seed $seed)") {
      val (lg, colors, _, _) = colored(seed + 300, n = 40, p = 0.25)
      val sizes = (2 to 5).map(k => LocalReductions.colorfulSup(lg, colors, k).m)
      assert(sizes == sizes.sorted.reverse, s"not monotone: $sizes")
    }
  }

  test("a planted balanced clique survives reduction at its supporting k") {
    val (lg, mem) = GraphGen.randomLocalWithClique(60, 0.04, GraphGen.Planted(12, 6), 5)
    val colors = Coloring.greedyLocal(lg)
    val k = 5
    val red = LocalReductions.enColorfulSup(lg, colors, k)
    val idx = mem.map(id => lg.ids.indexOf(id))
    assert(red.isClique(idx.toSeq))
  }

  test("cascade runs all three stages and reports shrinking stats") {
    val g = GraphGen.generate(spark, 400, 2500,
      Seq(GraphGen.Planted(10, 5)), seed = 77)
    val (reduced, colorsDf, stats) = Reductions.cascade(spark, g, k = 3)
    assert(stats.map(_.stage) ==
      Seq("EnColorfulCore", "ColorfulSup", "EnColorfulSup"))
    assert(stats.head.edges >= stats(1).edges)
    assert(stats(1).edges >= stats(2).edges)
    assert(reduced.numEdges == stats(2).edges)
    // the coloring covers every original vertex
    assert(colorsDf.count() == 400)
    // the planted clique (size 10, split 5/5) survives k=3 reduction
    val lgR = reduced.toLocal
    val best = NaiveRef.maxFairCliqueSize(lgR, 3, 2)
    assert(best >= 9, s"best=$best") // 5/5 clique allows 5+5 at delta=2
  }

  for (seed <- 1 to 4; k <- Seq(2, 3)) {
    test(s"local cascade equals distributed cascade (seed $seed, k=$k)") {
      val (lg, colors, ag, _) = colored(seed + 400, n = 45, p = 0.22)
      val (dist, _, _) = Reductions.cascade(spark, ag, k)
      val (loc, _) = LocalReductions.cascade(lg, colors, k)
      assert(edgeSet(dist) == localEdgeSet(loc))
    }
  }
}
