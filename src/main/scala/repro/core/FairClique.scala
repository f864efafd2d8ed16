package repro.core

import repro.graph.LocalGraph

/** Relative fair clique (Definition 1) predicates and helper math.
  *
  * A vertex set `C` is a `(k, δ)`-relative fair clique candidate when
  * `cnt_C(a) >= k`, `cnt_C(b) >= k` and `|cnt_C(a) − cnt_C(b)| <= δ`.
  * The *maximum* such clique is automatically maximal (Definition 1(ii)),
  * so the search only needs the counting condition.
  */
object FairClique {

  /** (attribute-a count, attribute-b count) of internal vertex set `vs`. */
  def counts(g: LocalGraph, vs: Iterable[Int]): (Int, Int) = {
    var a = 0; var b = 0
    vs.foreach(v => if (g.attr(v) == 0) a += 1 else b += 1)
    (a, b)
  }

  /** The fairness predicate on attribute counts. */
  def isFair(cntA: Int, cntB: Int, k: Int, delta: Int): Boolean =
    cntA >= k && cntB >= k && math.abs(cntA - cntB) <= delta

  /** Whether `vs` is a clique satisfying the fairness condition. */
  def isFairClique(g: LocalGraph, vs: Iterable[Int], k: Int, delta: Int): Boolean = {
    val (a, b) = counts(g, vs)
    isFair(a, b, k, delta) && g.isClique(vs)
  }

  /** Largest fair subset size obtainable from a clique with `aCnt`
    * attribute-a and `bCnt` attribute-b vertices (0 when infeasible).
    * Any `(x <= aCnt, y <= bCnt)` sub-selection of a clique is a clique,
    * so this is pure arithmetic: maximize `x + y` subject to
    * `x, y >= k` and `|x − y| <= δ`.
    */
  def bestFairSubSize(aCnt: Int, bCnt: Int, k: Int, delta: Int): Int = {
    if (aCnt < k || bCnt < k) 0
    else math.min(aCnt + bCnt, 2 * math.min(aCnt, bCnt) + delta)
  }

  /** Same maximization but returning the `(x, y)` counts (0,0 if none). */
  def bestFairSubCounts(aCnt: Int, bCnt: Int, k: Int, delta: Int): (Int, Int) = {
    if (aCnt < k || bCnt < k) (0, 0)
    else if (math.abs(aCnt - bCnt) <= delta) (aCnt, bCnt)
    else if (aCnt < bCnt) (aCnt, aCnt + delta)
    else (bCnt + delta, bCnt)
  }
}
