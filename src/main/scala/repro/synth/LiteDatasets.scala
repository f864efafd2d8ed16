package repro.synth

import org.apache.spark.sql.SparkSession
import repro.graph.AttributedGraph

/** The six dataset analogs used throughout the benches (Table I).
  *
  * Each mirrors one of the paper's datasets at roughly 1/100 scale,
  * keeping the relative density ordering (pokec-lite and themarker-lite
  * densest, google/dblp/aminer-lite sparsest) and adding planted
  * near-balanced cliques so the fair-clique search is non-trivial — the
  * real graphs contain large natural cliques, the Zipf background alone
  * does not. Attributes are i.i.d. uniform, exactly how the paper
  * attributes its non-attributed graphs. See DESIGN.md §4.
  */
object LiteDatasets {

  import GraphGen.{DenseBlock, Planted}

  /** Generation spec for one dataset analog. */
  final case class Spec(
      name: String,
      paperName: String,
      n: Long,
      targetEdges: Long,
      alpha: Double,
      planted: Seq[Planted],
      blocks: Seq[DenseBlock],
      seed: Long,
      /** k sweep for benches (mirrors the paper's per-dataset k range). */
      kRange: Seq[Int],
      kDefault: Int,
      deltaRange: Seq[Int],
      deltaDefault: Int)

  /** Planted cliques: a few large near-balanced ones (the optimum lives
    * here) plus several smaller ones that survive moderate reductions.
    */
  private def plantedMix(rnd: scala.util.Random, big: Int, count: Int): Seq[Planted] =
    (0 until count).map { i =>
      val size = if (i == 0) big else 8 + rnd.nextInt(math.max(1, big - 10))
      val a = size / 2 + (if (rnd.nextBoolean()) 0 else 1) * (size % 2)
      Planted(size, a)
    }

  val specs: Seq[Spec] = {
    def mk(name: String, paperName: String, n: Long, m: Long, alpha: Double,
           big: Int, cliques: Int, blocks: Seq[DenseBlock], seed: Long,
           kRange: Seq[Int], kDef: Int, dDef: Int): Spec = {
      val rnd = new scala.util.Random(seed * 997 + 7)
      Spec(name, paperName, n, m, alpha, plantedMix(rnd, big, cliques), blocks,
        seed, kRange, kDef, 1 to 5, dDef)
    }
    // dense community remnants (see GraphGen.DenseBlock): these make the
    // plain branch-and-bound non-trivial, as on the paper's real graphs.
    // The attribute-skewed ones hold large but fairness-infeasible
    // cliques: the plain search must refute them exhaustively while the
    // attribute/color-aware bounds prune their roots outright
    // dense+skewed: large cliques, fairness-infeasible, slow candidate
    // shrink (p≈0.75) — exhaustive refutation for the basic search,
    // O(1) root prune for ub_a/ub_ac
    val twoBlocks = Seq(DenseBlock(85, 0.80, 0.90), DenseBlock(70, 0.78, 0.10),
      DenseBlock(90, 0.45))
    val oneBlock = Seq(DenseBlock(80, 0.80, 0.90), DenseBlock(80, 0.45))
    Seq(
      //  name              paper       n      m      alpha big cl blocks     seed  kRange  kD dD
      mk("themarker-lite", "Themarker", 4000L, 80000L, 0.75, 34, 10, twoBlocks, 11L, 2 to 6, 4, 3),
      mk("google-lite",    "Google",   15000L, 75000L, 0.80, 32,  9, oneBlock, 12L, 2 to 6, 4, 3),
      mk("dblp-lite",      "DBLP",     12000L, 70000L, 0.80, 32,  9, oneBlock, 13L, 2 to 6, 4, 3),
      mk("flixster-lite",  "Flixster", 10000L, 60000L, 0.80, 32,  9, twoBlocks, 14L, 2 to 6, 3, 3),
      mk("pokec-lite",     "Pokec",     8000L, 160000L, 0.75, 34, 10, twoBlocks, 15L, 2 to 6, 4, 3),
      mk("aminer-lite",    "Aminer",    6000L, 35000L, 0.85, 30,  8, oneBlock, 16L, 2 to 6, 4, 3),
    )
  }

  def spec(name: String): Spec =
    specs.find(_.name == name).getOrElse(
      throw new IllegalArgumentException(
        s"unknown dataset '$name'; known: ${specs.map(_.name).mkString(", ")}"))

  /** Generate one analog (deterministic in its spec). */
  def load(spark: SparkSession, name: String): AttributedGraph = {
    val s = spec(name)
    GraphGen.generate(spark, s.n, s.targetEdges, s.planted, s.alpha, s.seed,
      blocks = s.blocks)
  }

  /** Names in bench order. */
  def names: Seq[String] = specs.map(_.name)
}
