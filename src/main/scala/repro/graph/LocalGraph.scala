package repro.graph

import scala.collection.mutable

/** Compact, immutable, driver/executor-side attributed graph.
  *
  * Vertices are dense internal indices `0 until n`; `ids(i)` maps back to
  * the external vertex id and `attr(i)` is the binary attribute
  * (0 = attribute "a", 1 = attribute "b"). Adjacency lists are sorted so
  * membership tests and intersections are `O(log d)` / `O(d1 + d2)`.
  *
  * The branch-and-bound search, the upper bounds and the heuristics all
  * operate on this representation (the paper's search runs on the reduced
  * graph, which is small); the distributed reductions produce one
  * `LocalGraph` per connected component.
  */
final class LocalGraph(
    val ids: Array[Long],
    val attr: Array[Int],
    val adj: Array[Array[Int]]
) extends Serializable {

  /** Number of vertices. */
  def n: Int = ids.length

  /** Number of undirected edges. */
  val m: Long = adj.iterator.map(_.length.toLong).sum / 2

  /** Degree of internal vertex `i`. */
  def degree(i: Int): Int = adj(i).length

  /** Maximum degree, 0 on the empty graph. */
  def maxDegree: Int = if (n == 0) 0 else adj.iterator.map(_.length).max

  /** Whether internal vertices `u` and `v` are adjacent (binary search). */
  def hasEdge(u: Int, v: Int): Boolean =
    java.util.Arrays.binarySearch(adj(u), v) >= 0

  /** Sorted intersection of `vs` (sorted) with the neighbours of `u`. */
  def intersectNeighbors(u: Int, vs: Array[Int]): Array[Int] = {
    val a = adj(u)
    val out = mutable.ArrayBuilder.make[Int]
    var i = 0; var j = 0
    while (i < a.length && j < vs.length) {
      if (a(i) == vs(j)) { out += a(i); i += 1; j += 1 }
      else if (a(i) < vs(j)) i += 1
      else j += 1
    }
    out.result()
  }

  /** Undirected edge list with `src < dst` in internal indices. */
  def edgeList: Array[(Int, Int)] = {
    val out = mutable.ArrayBuilder.make[(Int, Int)]
    var u = 0
    while (u < n) {
      adj(u).foreach(v => if (u < v) out += ((u, v)))
      u += 1
    }
    out.result()
  }

  /** Subgraph induced by the internal vertices in `keep` (re-indexed). */
  def inducedSubgraph(keep: Array[Int]): LocalGraph = {
    val sortedKeep = keep.sorted
    val remap = new mutable.HashMap[Int, Int]
    sortedKeep.iterator.zipWithIndex.foreach { case (v, i) => remap(v) = i }
    val newAdj = sortedKeep.map { v =>
      intersectNeighbors(v, sortedKeep).map(remap)
    }
    new LocalGraph(sortedKeep.map(ids), sortedKeep.map(attr), newAdj)
  }

  /** Subgraph after dropping the given undirected edges (internal ids). */
  def withoutEdges(dropped: Set[(Int, Int)]): LocalGraph = {
    def gone(u: Int, v: Int): Boolean =
      dropped.contains((math.min(u, v), math.max(u, v)))
    val newAdj = Array.tabulate(n)(u => adj(u).filter(v => !gone(u, v)))
    new LocalGraph(ids, attr, newAdj)
  }

  /** Whether the internal vertex set `vs` forms a clique. */
  def isClique(vs: Iterable[Int]): Boolean = {
    val arr = vs.toArray.sorted
    arr.indices.forall { i =>
      (i + 1 until arr.length).forall(j => hasEdge(arr(i), arr(j)))
    }
  }

  /** Maximal k-core: the subgraph vertices with core number >= k. */
  def kCoreVertices(k: Int): Array[Int] = {
    val deg = Array.tabulate(n)(degree)
    val removed = new Array[Boolean](n)
    val queue = mutable.Queue.empty[Int]
    (0 until n).foreach(v => if (deg(v) < k) { queue += v; removed(v) = true })
    while (queue.nonEmpty) {
      val v = queue.dequeue()
      adj(v).foreach { w =>
        if (!removed(w)) {
          deg(w) -= 1
          if (deg(w) < k) { removed(w) = true; queue += w }
        }
      }
    }
    (0 until n).filter(!removed(_)).toArray
  }

  /** Core numbers of all vertices (bucket peeling, O(n + m)). */
  def coreNumbers: Array[Int] = {
    if (n == 0) return Array.empty
    val deg = Array.tabulate(n)(degree)
    val core = new Array[Int](n)
    val order = (0 until n).sortBy(deg).toArray
    val pos = new Array[Int](n)
    order.zipWithIndex.foreach { case (v, i) => pos(v) = i }
    // bucket starts per degree value
    val maxDeg = deg.max
    val bin = new Array[Int](maxDeg + 2)
    deg.foreach(d => bin(d + 1) += 1)
    (1 to maxDeg + 1).foreach(d => bin(d) += bin(d - 1))
    val start = bin.clone()
    var i = 0
    val curDeg = deg.clone()
    while (i < n) {
      val v = order(i)
      core(v) = curDeg(v)
      adj(v).foreach { w =>
        if (curDeg(w) > curDeg(v)) {
          // swap w toward the front of its bucket, then shrink its degree
          val dw = curDeg(w)
          val pw = pos(w)
          val ps = start(dw)
          val u = order(ps)
          if (u != w) {
            order(ps) = w; order(pw) = u
            pos(w) = ps; pos(u) = pw
          }
          start(dw) += 1
          curDeg(w) -= 1
        }
      }
      i += 1
    }
    core
  }

  /** Degeneracy = maximum core number (0 on the empty graph). */
  def degeneracy: Int = if (n == 0) 0 else coreNumbers.max

  /** h-index of the degree sequence: max h with h vertices of degree >= h. */
  def hIndex: Int = LocalGraph.hIndexOf(Array.tabulate(n)(degree))

  /** Connected components as arrays of internal vertices. */
  def connectedComponents: Seq[Array[Int]] = {
    val seen = new Array[Boolean](n)
    val comps = mutable.ArrayBuffer.empty[Array[Int]]
    (0 until n).foreach { s =>
      if (!seen(s)) {
        val comp = mutable.ArrayBuilder.make[Int]
        val stack = mutable.ArrayDeque(s)
        seen(s) = true
        while (stack.nonEmpty) {
          val v = stack.removeLast()
          comp += v
          adj(v).foreach(w => if (!seen(w)) { seen(w) = true; stack.append(w) })
        }
        comps += comp.result().sorted
      }
    }
    comps.toSeq
  }

  /** All maximal cliques (Bron–Kerbosch with pivoting), internal indices.
    * Intended for small graphs (test oracles, reduced components).
    */
  def maximalCliques(): Seq[Array[Int]] = {
    val out = mutable.ArrayBuffer.empty[Array[Int]]
    def bk(r: List[Int], p0: Array[Int], x0: Array[Int]): Unit = {
      if (p0.isEmpty && x0.isEmpty) { out += r.toArray.sorted; return }
      // pivot: vertex of P ∪ X with most neighbours in P
      val pivot = (p0 ++ x0).maxBy(u => intersectNeighbors(u, p0).length)
      val pivotNbrs = adj(pivot)
      var p = p0
      var x = x0
      p0.foreach { v =>
        if (java.util.Arrays.binarySearch(pivotNbrs, v) < 0) {
          bk(v :: r, intersectNeighbors(v, p), intersectNeighbors(v, x))
          p = p.filter(_ != v)
          x = (x :+ v).sorted
        }
      }
    }
    bk(Nil, (0 until n).toArray, Array.empty)
    out.toSeq
  }

  override def toString: String = s"LocalGraph(n=$n, m=$m)"
}

object LocalGraph {

  /** Build from an external-id edge list plus attribute map.
    * Self-loops are dropped; duplicate edges are merged. Vertices present
    * only in `attrs` (isolated) are kept.
    */
  def fromEdges(edges: Iterable[(Long, Long)], attrs: Map[Long, Int]): LocalGraph = {
    val idSet = mutable.SortedSet.empty[Long]
    attrs.keysIterator.foreach(idSet += _)
    edges.foreach { case (u, v) => idSet += u; idSet += v }
    val ids = idSet.toArray
    val index = ids.iterator.zipWithIndex.toMap
    val nbrs = Array.fill(ids.length)(mutable.SortedSet.empty[Int])
    edges.foreach { case (u, v) =>
      if (u != v) {
        val iu = index(u); val iv = index(v)
        nbrs(iu) += iv; nbrs(iv) += iu
      }
    }
    new LocalGraph(
      ids,
      ids.map(id => attrs.getOrElse(id, 0)),
      nbrs.map(_.toArray)
    )
  }

  /** max h such that at least h entries of `values` are >= h. */
  def hIndexOf(values: Array[Int]): Int = {
    val nn = values.length
    if (nn == 0) return 0
    val cnt = new Array[Int](nn + 1)
    values.foreach(v => cnt(math.min(v, nn)) += 1)
    var total = 0
    var h = nn
    while (h >= 0) {
      total += cnt(h)
      if (total >= h) return h
      h -= 1
    }
    0
  }
}
