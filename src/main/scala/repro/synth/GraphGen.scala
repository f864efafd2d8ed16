package repro.synth

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.LongType

import repro.graph.{AttributedGraph, LocalGraph}

import scala.collection.mutable
import scala.util.Random

/** Attributed graph generators.
  *
  * The paper evaluates on real social/web/collaboration graphs with
  * uniformly random binary attributes (plus one real-attribute graph).
  * Those graphs are unavailable offline, so benches use synthetic analogs:
  * a power-law (Zipf-endpoint) background — reproducing the heavy-tailed
  * degree distributions that drive the reductions — plus planted
  * near-balanced cliques so that non-trivial fair cliques exist, with
  * i.i.d. binary attributes. See DESIGN.md §4 for the substitution
  * rationale.
  */
object GraphGen {

  /** Specification of a planted clique: total size and the attribute-a
    * count (the rest get attribute b), so fairness properties of the
    * planted optimum are controlled.
    */
  final case class Planted(size: Int, aCount: Int) {
    require(aCount >= 0 && aCount <= size, s"bad planted spec: $this")
  }

  /** A dense Erdős–Rényi block: `size` random vertices connected with
    * probability `p`, drawn so that a fraction `aFrac` carries attribute
    * a. Real networks keep dense community remnants after the
    * colorful-support reductions, which is what makes the paper's
    * branch-and-bound non-trivial; attribute-skewed blocks especially so —
    * their cliques are large but fairness-infeasible, so the plain search
    * must refute them exhaustively while the attribute/color-aware upper
    * bounds (and at larger k the reductions themselves) dispose of them
    * cheaply.
    */
  final case class DenseBlock(size: Int, p: Double, aFrac: Double = 0.5) {
    require(size > 1 && p > 0 && p <= 1 && aFrac >= 0 && aFrac <= 1,
      s"bad block spec: $this")
  }

  /** Deterministic i.i.d. attribute per vertex (driver-side, so planted
    * cliques can be balanced against the realized attributes).
    */
  def attributes(n: Long, seed: Long, pA: Double = 0.5): Array[Int] = {
    val rnd = new Random(seed * 7919 + 13)
    Array.fill(n.toInt)(if (rnd.nextDouble() < pA) 0 else 1)
  }

  /** Power-law background edges: Zipf-ish source (bounded-Pareto inverse
    * CDF with density ∝ rank^(−alpha), alpha < 1), uniform destination.
    * Returns canonical `(src, dst)` with `src < dst`, deduplicated; the
    * realized edge count is slightly below `targetEdges` due to dedup.
    */
  def powerLawEdges(spark: SparkSession, n: Long, targetEdges: Long,
                    alpha: Double = 0.8, seed: Long = 0): DataFrame = {
    require(alpha > 0 && alpha < 1, s"alpha must be in (0,1), got $alpha")
    // x = (1 + U·(n^s − 1))^(1/s) with s = 1 − alpha inverts the CDF of the
    // continuous bounded Pareto on [1, n]; oversample for dedup losses.
    val draws = (targetEdges * 1.08).toLong
    val s = 1.0 - alpha
    val span = math.pow(n.toDouble, s) - 1.0
    val zipfSrc =
      least(lit(n), greatest(lit(1L),
        pow(rand(seed) * span + 1.0, lit(1.0 / s)).cast(LongType)))
    val uniDst = (rand(seed + 1) * n + 1).cast(LongType)
    spark.range(draws)
      .select(zipfSrc.as("u"), uniDst.as("v"))
      .select(least(col("u"), col("v")).as("src"), greatest(col("u"), col("v")).as("dst"))
      .where(col("src") =!= col("dst"))
      .distinct()
  }

  /** Sample the members of each planted clique, respecting the realized
    * attribute split. Returns (cliqueMembers, allPlantedEdges).
    */
  private def plantCliques(n: Long, attrs: Array[Int], planted: Seq[Planted],
                           seed: Long): (Seq[Array[Long]], Seq[(Long, Long)]) = {
    val rnd = new Random(seed * 31 + 101)
    val byAttr = Array(
      mutable.ArrayBuffer.from((1L to n).filter(id => attrs(id.toInt - 1) == 0)),
      mutable.ArrayBuffer.from((1L to n).filter(id => attrs(id.toInt - 1) == 1)))
    def takeRandom(attr: Int, cnt: Int): Seq[Long] =
      Seq.fill(cnt)(byAttr(attr)(rnd.nextInt(byAttr(attr).length)))
    val members = planted.map { p =>
      // re-draw on accidental duplicates inside one clique
      var mem = (takeRandom(0, p.aCount) ++ takeRandom(1, p.size - p.aCount)).distinct
      while (mem.length < p.size) {
        val missingA = p.aCount - mem.count(id => attrs(id.toInt - 1) == 0)
        val attr = if (missingA > 0) 0 else 1
        mem = (mem ++ takeRandom(attr, 1)).distinct
      }
      mem.toArray.sorted
    }
    val edges = members.flatMap { mem =>
      for (i <- mem.indices; j <- (i + 1) until mem.length)
        yield (mem(i), mem(j))
    }
    (members, edges)
  }

  /** Edges of the dense blocks (driver-side, deterministic). */
  private def blockEdges(n: Long, attrs: Array[Int], blocks: Seq[DenseBlock],
                         seed: Long): Seq[(Long, Long)] = {
    val rnd = new Random(seed * 131 + 977)
    val byAttr = Array(
      rnd.shuffle((1L to n).filter(id => attrs(id.toInt - 1) == 0).toVector),
      rnd.shuffle((1L to n).filter(id => attrs(id.toInt - 1) == 1).toVector))
    var offset = Array(0, 0)
    blocks.flatMap { b =>
      val aCnt = math.min((b.size * b.aFrac).round.toInt, byAttr(0).length - offset(0))
      val bCnt = math.min(b.size - aCnt, byAttr(1).length - offset(1))
      val members = (byAttr(0).slice(offset(0), offset(0) + aCnt) ++
        byAttr(1).slice(offset(1), offset(1) + bCnt)).toIndexedSeq
      offset = Array(offset(0) + aCnt, offset(1) + bCnt)
      for {
        i <- members.indices
        j <- (i + 1) until members.length
        if rnd.nextDouble() < b.p
      } yield (math.min(members(i), members(j)), math.max(members(i), members(j)))
    }
  }

  /** Full generator: power-law background + planted cliques + dense
    * blocks + attributes. Vertex ids are `1..n`; every vertex is present
    * (isolated ones too).
    */
  def generate(spark: SparkSession, n: Long, targetEdges: Long,
               planted: Seq[Planted] = Seq.empty,
               alpha: Double = 0.8, seed: Long = 0,
               pA: Double = 0.5,
               blocks: Seq[DenseBlock] = Seq.empty): AttributedGraph = {
    import spark.implicits._
    val attrs = attributes(n, seed, pA)
    val vertices = (1L to n).map(id => (id, attrs(id.toInt - 1))).toDF("id", "attr")
    val bg = powerLawEdges(spark, n, targetEdges, alpha, seed)
    val extra = plantCliques(n, attrs, planted, seed)._2 ++
      blockEdges(n, attrs, blocks, seed)
    val all =
      if (extra.isEmpty) bg
      else bg.union(extra.toDF("src", "dst")).distinct()
    AttributedGraph(vertices, all.localCheckpoint(true))
  }

  /** Small driver-side Erdős–Rényi-ish attributed graph for tests. */
  def randomLocal(n: Int, edgeProb: Double, seed: Long, pA: Double = 0.5): LocalGraph = {
    val rnd = new Random(seed)
    val attrs = (1L to n).map(id => id -> (if (rnd.nextDouble() < pA) 0 else 1)).toMap
    val edges = for {
      u <- 1 to n
      v <- (u + 1) to n
      if rnd.nextDouble() < edgeProb
    } yield (u.toLong, v.toLong)
    LocalGraph.fromEdges(edges, attrs)
  }

  /** Local graph with a planted clique on top of sparse noise (tests). */
  def randomLocalWithClique(n: Int, edgeProb: Double, planted: Planted,
                            seed: Long): (LocalGraph, Array[Long]) = {
    val rnd = new Random(seed)
    val attrs = (1L to n).map(id => id -> (if (rnd.nextDouble() < 0.5) 0 else 1)).toMap
    val aIds = (1L to n).filter(attrs(_) == 0)
    val bIds = (1L to n).filter(attrs(_) == 1)
    require(aIds.length >= planted.aCount && bIds.length >= planted.size - planted.aCount,
      "not enough vertices of each attribute for the planted clique")
    val mem = (rnd.shuffle(aIds).take(planted.aCount) ++
      rnd.shuffle(bIds).take(planted.size - planted.aCount)).sorted.toArray
    val noise = for {
      u <- 1 to n
      v <- (u + 1) to n
      if rnd.nextDouble() < edgeProb
    } yield (u.toLong, v.toLong)
    val cliqueEdges = for {
      i <- mem.indices
      j <- (i + 1) until mem.length
    } yield (mem(i), mem(j))
    (LocalGraph.fromEdges(noise ++ cliqueEdges, attrs), mem)
  }

  /** Keep a deterministic fraction of vertices (induced subgraph). */
  def sampleVertices(g: AttributedGraph, fraction: Double, seed: Long): AttributedGraph = {
    val keep = g.vertices
      .where(pmod(xxhash64(col("id"), lit(seed)), lit(1000L)) < lit((fraction * 1000).toLong))
      .select("id")
    g.inducedBy(keep)
  }

  /** Keep a deterministic fraction of edges (then drop isolated vertices). */
  def sampleEdges(g: AttributedGraph, fraction: Double, seed: Long): AttributedGraph = {
    val e = g.edges
      .where(pmod(xxhash64(col("src"), col("dst"), lit(seed)), lit(1000L)) <
        lit((fraction * 1000).toLong))
    AttributedGraph(g.vertices, e.localCheckpoint(true)).dropIsolated
  }
}
