package repro.core

import repro.graph.{Coloring, LocalGraph}

/** Upper bounds on `MRFC(R, C)` — the maximum fair clique size inside a
  * search instance — Section IV of the paper.
  *
  * All bounds are implemented in *sound* form; where the paper's printed
  * lemma undercounts on clique instances the corrected form is used and
  * the deviation is documented in DESIGN.md §5 (items 2–4):
  *   - `ub_deg = △(G') + 1`, `ub_h = h(G') + 1`
  *   - `ub_cd = 2·△̄(G') + δ + 2`, `ub_ch = 2·h̄(G') + δ + 2`
  *   - `ub_eac = min(c_a+c_b+c_m, 2·(min(c_a,c_b)+c_m)+δ)`
  * Property tests check every bound against the exact optimum on many
  * random instances.
  */
object Bounds {

  /** Which bounds a search configuration evaluates at top-level branches.
    * `ad` is the paper's `ub_AD` group {ub_a, ub_c, ub_ac, ub_eac}
    * (`ub_s` is always applied inside the search itself).
    */
  final case class BoundConfig(
      ad: Boolean = false,
      degeneracy: Boolean = false,
      hIndex: Boolean = false,
      colorfulDegeneracy: Boolean = false,
      colorfulHIndex: Boolean = false,
      colorfulPath: Boolean = false) {
    def any: Boolean = ad || degeneracy || hIndex || colorfulDegeneracy ||
      colorfulHIndex || colorfulPath
  }

  object BoundConfig {
    /** The six configurations benchmarked in Table II. */
    val table2: Seq[(String, BoundConfig)] = Seq(
      "ub_AD" -> BoundConfig(ad = true),
      "ub_AD+ub_deg" -> BoundConfig(ad = true, degeneracy = true),
      "ub_AD+ub_h" -> BoundConfig(ad = true, hIndex = true),
      "ub_AD+ub_cd" -> BoundConfig(ad = true, colorfulDegeneracy = true),
      "ub_AD+ub_ch" -> BoundConfig(ad = true, colorfulHIndex = true),
      "ub_AD+ub_cp" -> BoundConfig(ad = true, colorfulPath = true),
    )
    val none: BoundConfig = BoundConfig()
  }

  /** Lemma 5: size bound. */
  def ubS(rSize: Int, cSize: Int): Int = rSize + cSize

  /** Lemma 6: attribute bound from total attribute counts. */
  def ubA(cntA: Int, cntB: Int, delta: Int): Int =
    if (math.abs(cntA - cntB) <= delta) cntA + cntB
    else 2 * math.min(cntA, cntB) + delta

  /** Lemma 7: color bound (vertices of a clique have distinct colors). */
  def ubC(numColors: Int): Int = numColors

  /** Lemma 8: attribute-color bound from per-attribute color counts. */
  def ubAC(colorsA: Int, colorsB: Int, delta: Int): Int =
    if (math.abs(colorsA - colorsB) <= delta) colorsA + colorsB
    else 2 * math.min(colorsA, colorsB) + delta

  /** Lemma 9 (sound form): enhanced attribute-color bound from the
    * exclusive-a / exclusive-b / mixed color group sizes.
    */
  def ubEAC(cA: Int, cB: Int, cM: Int, delta: Int): Int =
    math.min(cA + cB + cM, 2 * (math.min(cA, cB) + cM) + delta)

  /** Lemma 10 (sound form): degeneracy bound `△(G') + 1`. */
  def ubDegeneracy(g: LocalGraph): Int = g.degeneracy + 1

  /** Lemma 11 (sound form): h-index bound `h(G') + 1`. */
  def ubHIndex(g: LocalGraph): Int = g.hIndex + 1

  /** Lemma 12 (sound form): colorful degeneracy bound `2·△̄ + δ + 2`. */
  def ubColorfulDegeneracy(g: LocalGraph, colors: Array[Int], delta: Int): Int = {
    if (g.n == 0) return 0
    val ccore = ColorfulDegrees.colorfulCoreNumbers(g, colors)
    2 * ccore.max + delta + 2
  }

  /** Lemma 13 (sound form): colorful h-index bound `2·h̄ + δ + 2`. */
  def ubColorfulHIndex(g: LocalGraph, colors: Array[Int], delta: Int): Int = {
    if (g.n == 0) return 0
    val alive = Array.fill(g.n)(true)
    val deg = ColorfulDegrees.localColorfulDegrees(g, colors, alive)
    val dmin = deg.map { case (a, b) => math.min(a, b) }
    2 * LocalGraph.hIndexOf(dmin) + delta + 2
  }

  /** Lemma 14 / Algorithm 4: longest colorful path in the DAG induced by
    * the (color, id) total order. Directed paths in this DAG have strictly
    * increasing colors, hence are automatically colorful; the DP is a
    * topological-order longest-path computation.
    */
  def ubColorfulPath(g: LocalGraph, colors: Array[Int]): Int = {
    if (g.n == 0) return 0
    val order = (0 until g.n).sortBy(v => (colors(v), g.ids(v))).toArray
    val pos = new Array[Int](g.n)
    order.zipWithIndex.foreach { case (v, i) => pos(v) = i }
    val f = Array.fill(g.n)(1)
    var maxLen = 1
    order.foreach { v =>
      g.adj(v).foreach { u =>
        if (pos(u) < pos(v)) f(v) = math.max(f(v), f(u) + 1)
      }
      maxLen = math.max(maxLen, f(v))
    }
    maxLen
  }

  /** Per-instance color statistics used by the `ub_AD` group. */
  private def colorStats(g: LocalGraph, colors: Array[Int]): (Int, Int, Int, Int, Int, Int) = {
    val all = colors.distinct.length
    val colA = (0 until g.n).filter(g.attr(_) == 0).map(colors).distinct.length
    val colB = (0 until g.n).filter(g.attr(_) == 1).map(colors).distinct.length
    var cA = 0; var cB = 0; var cM = 0
    colors.distinct.foreach { c =>
      val attrs = (0 until g.n).filter(colors(_) == c).map(g.attr).distinct
      if (attrs.length == 2) cM += 1
      else if (attrs.headOption.contains(0)) cA += 1
      else cB += 1
    }
    (all, colA, colB, cA, cB, cM)
  }

  /** Evaluate the configured bounds on the subgraph induced by a search
    * instance (the instance graph is colored fresh, as the paper does for
    * `G'`). Returns the minimum of the enabled bounds, or `Int.MaxValue`
    * when none is enabled.
    */
  def evaluate(instance: LocalGraph, delta: Int, config: BoundConfig): Int = {
    if (!config.any) return Int.MaxValue
    if (instance.n == 0) return 0
    val colors = Coloring.greedyLocal(instance)
    var best = Int.MaxValue
    if (config.ad) {
      val (all, colA, colB, cA, cB, cM) = colorStats(instance, colors)
      val (cntA, cntB) = FairClique.counts(instance, 0 until instance.n)
      best = math.min(best, ubA(cntA, cntB, delta))
      best = math.min(best, ubC(all))
      best = math.min(best, ubAC(colA, colB, delta))
      best = math.min(best, ubEAC(cA, cB, cM, delta))
    }
    if (config.degeneracy) best = math.min(best, ubDegeneracy(instance))
    if (config.hIndex) best = math.min(best, ubHIndex(instance))
    if (config.colorfulDegeneracy)
      best = math.min(best, ubColorfulDegeneracy(instance, colors, delta))
    if (config.colorfulHIndex)
      best = math.min(best, ubColorfulHIndex(instance, colors, delta))
    if (config.colorfulPath) best = math.min(best, ubColorfulPath(instance, colors))
    best
  }
}
