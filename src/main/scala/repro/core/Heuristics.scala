package repro.core

import repro.graph.{Coloring, LocalGraph}

/** The linear-time heuristics of Section V: DegHeur (Algorithm 5),
  * ColorfulDegHeur (its colorful-degree variant) and the HeurRFC framework
  * (Algorithm 6). All run on the (reduced) local graph; the fair clique
  * they return seeds `R*` in the exact search for extra pruning.
  *
  * Deviation (DESIGN.md §5): Algorithm 5 updates `R*` at `C = ∅` without a
  * fairness check; we return the greedy clique only when it actually
  * satisfies the fairness condition — otherwise the heuristic fails and
  * returns the empty set, which is always safe as a seed.
  */
object Heuristics {

  /** One greedy descent: repeatedly add the best-scoring candidate of the
    * alternating attribute (Algorithm 5's HeurBranch is a straight-line
    * recursion — it never backtracks). `score(v)` ranks candidates;
    * DegHeur uses the degree, ColorfulDegHeur the min colorful degree.
    */
  private def greedyDescent(g: LocalGraph, k: Int, delta: Int,
                            score: Int => Long): Array[Int] = {
    if (g.n == 0) return Array.empty
    val start = (0 until g.n).maxBy(score)
    var r = List(start)
    var rA = if (g.attr(start) == 0) 1 else 0
    var rB = 1 - rA
    var c = g.adj(start)
    var attrChoose = 1 - g.attr(start)
    var aMax = -1

    while (true) {
      // fix the δ-cap once the forced attribute has no candidates left
      if (aMax == -1 && !c.exists(g.attr(_) == attrChoose))
        aMax = (if (attrChoose == 0) rA else rB) + delta
      if (aMax >= 0) {
        if (rA == aMax) c = c.filter(g.attr(_) != 0)
        if (rB == aMax) c = c.filter(g.attr(_) != 1)
      }
      if (c.isEmpty) {
        return if (FairClique.isFair(rA, rB, k, delta)) r.toArray else Array.empty
      }
      if (!c.exists(g.attr(_) == attrChoose)) {
        attrChoose = 1 - attrChoose
      } else {
        val v = c.filter(g.attr(_) == attrChoose).maxBy(score)
        attrChoose = 1 - g.attr(v)
        r = v :: r
        if (g.attr(v) == 0) rA += 1 else rB += 1
        c = g.intersectNeighbors(v, c).filter(_ != v)
        // Algorithm 5 lines 24–27: give up when the remainder cannot reach
        // a fair clique at all
        if (r.length + c.length < 2 * k) return Array.empty
        val (ca, cb) = FairClique.counts(g, c)
        if (rA + ca < k || rB + cb < k) return Array.empty
      }
    }
    Array.empty // unreachable
  }

  /** Degree-based greedy (Algorithm 5). Returns internal ids, or empty. */
  def degHeur(g: LocalGraph, k: Int, delta: Int): Array[Int] =
    greedyDescent(g, k, delta, v => g.degree(v).toLong)

  /** Colorful-degree-based greedy: candidates ranked by
    * `min(D_a(v), D_b(v))` computed once on `g` with a fresh coloring.
    */
  def colorfulDegHeur(g: LocalGraph, k: Int, delta: Int): Array[Int] = {
    if (g.n == 0) return Array.empty
    val colors = Coloring.greedyLocal(g)
    val deg = ColorfulDegrees.localColorfulDegrees(g, colors, Array.fill(g.n)(true))
    greedyDescent(g, k, delta, v => math.min(deg(v)._1, deg(v)._2).toLong)
  }

  /** HeurRFC outcome: the fair clique (external ids via caller), a color
    * based upper bound for the whole graph, and the coloring.
    */
  final case class HeurResult(clique: Array[Int], ub: Int)

  /** Algorithm 6: DegHeur, shrink to the (|R*|−1)-core, ColorfulDegHeur,
    * keep the larger clique, shrink again, recolor for a global bound.
    * Returned internal ids refer to `g`.
    */
  def heurRFC(g: LocalGraph, k: Int, delta: Int): HeurResult = {
    var best = degHeur(g, k, delta)
    // map of current core's internal ids back to g's
    var coreIdx = (0 until g.n).toArray
    var core = g
    def shrink(): Unit = {
      val kStar = best.length - 1
      if (kStar > 0) {
        val kept = core.kCoreVertices(kStar)
        coreIdx = kept.map(i => coreIdx(i))
        core = core.inducedSubgraph(kept)
      }
    }
    shrink()
    val alt = colorfulDegHeur(core, k, delta)
    if (alt.length > best.length) {
      best = alt.map(i => coreIdx(i))
      shrink()
    }
    val ub = if (core.n == 0) 0 else Coloring.numColors(Coloring.greedyLocal(core))
    HeurResult(best, ub)
  }
}
