package repro.core

import repro.graph.LocalGraph

/** Independent reference solver used as the test oracle for the search.
  *
  * Enumerates all maximal cliques with Bron–Kerbosch (a genuinely
  * different algorithm from the branch-and-bound under test) and, for each,
  * computes the best fair sub-clique arithmetically: any `(x <= cnt_a,
  * y <= cnt_b)` sub-selection of a clique is again a clique, so the
  * per-maximal-clique optimum is [[FairClique.bestFairSubCounts]]. The
  * global optimum fair clique is contained in some maximal clique, hence
  * this maximization is exact. Intended for small graphs only.
  */
object NaiveRef {

  /** Size of the maximum fair clique (0 when none exists). */
  def maxFairCliqueSize(g: LocalGraph, k: Int, delta: Int): Int =
    if (g.n == 0) 0
    else g.maximalCliques().foldLeft(0) { (acc, mc) =>
      val (a, b) = FairClique.counts(g, mc)
      math.max(acc, FairClique.bestFairSubSize(a, b, k, delta))
    }

  /** An actual maximum fair clique (internal ids), or None. */
  def maxFairClique(g: LocalGraph, k: Int, delta: Int): Option[Array[Int]] = {
    if (g.n == 0) return None
    var best: Option[Array[Int]] = None
    g.maximalCliques().foreach { mc =>
      val (a, b) = FairClique.counts(g, mc)
      val (x, y) = FairClique.bestFairSubCounts(a, b, k, delta)
      if (x + y > best.map(_.length).getOrElse(0)) {
        val as = mc.filter(g.attr(_) == 0).take(x)
        val bs = mc.filter(g.attr(_) == 1).take(y)
        best = Some((as ++ bs).sorted)
      }
    }
    best
  }
}
