package repro.local

/** Immutable CSR (compressed sparse row) undirected graph.
  *
  * This is the shared-memory substrate every *timed* algorithm runs on
  * (paper's testbed is C++/OpenMP; see DESIGN.md §2). Vertices are dense
  * ints `[0, n)`. Each undirected edge {u,v} is stored twice (u→v and v→u)
  * with an aligned per-direction weight. Adjacency lists are sorted by
  * neighbor id so membership tests are binary searches (needed by the
  * clique metrics).
  *
  * @param n       number of vertices
  * @param offsets CSR row offsets, size n+1
  * @param nbrs    concatenated sorted adjacency lists, size 2|E|
  * @param ew      weight of the edge to `nbrs(i)`, aligned with `nbrs`
  * @param vw      vertex weights (suspiciousness `a_i`), size n
  */
final class LocalGraph(
    val n: Int,
    val offsets: Array[Int],
    val nbrs: Array[Int],
    val ew: Array[Double],
    val vw: Array[Double]) {

  /** Number of undirected edges. */
  val m: Long = nbrs.length / 2L

  def degree(u: Int): Int = offsets(u + 1) - offsets(u)

  /** True iff {u,v} is an edge (binary search over sorted adjacency). */
  def hasEdge(u: Int, v: Int): Boolean = {
    var lo = offsets(u); var hi = offsets(u + 1) - 1
    while (lo <= hi) {
      val mid = (lo + hi) >>> 1
      val x = nbrs(mid)
      if (x == v) return true
      else if (x < v) lo = mid + 1
      else hi = mid - 1
    }
    false
  }

  /** Sum of all edge weights (each undirected edge counted once). */
  def totalEdgeWeight: Double = {
    var s = 0.0; var i = 0
    while (i < ew.length) { s += ew(i); i += 1 }
    s / 2.0
  }

  /** A copy of this graph with every edge weight replaced by `f(u, v, w)`. */
  def mapEdgeWeights(f: (Int, Int, Double) => Double): LocalGraph = {
    val ew2 = new Array[Double](ew.length)
    var u = 0
    while (u < n) {
      var i = offsets(u)
      while (i < offsets(u + 1)) { ew2(i) = f(u, nbrs(i), ew(i)); i += 1 }
      u += 1
    }
    new LocalGraph(n, offsets, nbrs, ew2, vw)
  }

  /** A copy with vertex weights replaced by `f(u)`. */
  def mapVertexWeights(f: Int => Double): LocalGraph =
    new LocalGraph(n, offsets, nbrs, ew, Array.tabulate(n)(f))

  /** Canonical (src < dst) edge triples, e.g. for feeding Spark/DuckDB. */
  def canonicalEdges: Array[(Int, Int, Double)] = {
    val out = Array.newBuilder[(Int, Int, Double)]
    var u = 0
    while (u < n) {
      var i = offsets(u)
      while (i < offsets(u + 1)) {
        if (u < nbrs(i)) out += ((u, nbrs(i), ew(i)))
        i += 1
      }
      u += 1
    }
    out.result()
  }
}

object LocalGraph {

  /** Build from canonical undirected edge triples (src, dst, weight).
    *
    * Duplicate {u,v} pairs are coalesced by summing weights (multi-edges in
    * transaction data add suspiciousness, matching the paper's DW usage).
    * Self-loops are dropped.
    */
  def fromEdges(n: Int, edges: Iterable[(Int, Int, Double)],
                vertexWeights: Array[Double] = null): LocalGraph = {
    val coalesced = new java.util.HashMap[Long, Double]()
    edges.foreach { case (a, b, w) =>
      if (a != b) {
        val (u, v) = if (a < b) (a, b) else (b, a)
        require(u >= 0 && v < n, s"edge ($a,$b) out of range [0,$n)")
        val key = u.toLong * n + v
        coalesced.merge(key, w, (x, y) => x + y)
      }
    }
    val deg = new Array[Int](n)
    coalesced.forEach { (key, _) =>
      val u = (key / n).toInt; val v = (key % n).toInt
      deg(u) += 1; deg(v) += 1
    }
    val offsets = new Array[Int](n + 1)
    var u = 0
    while (u < n) { offsets(u + 1) = offsets(u) + deg(u); u += 1 }
    val pos  = offsets.clone()
    val nbrs = new Array[Int](offsets(n))
    val ew   = new Array[Double](offsets(n))
    coalesced.forEach { (key, w) =>
      val a = (key / n).toInt; val b = (key % n).toInt
      nbrs(pos(a)) = b; ew(pos(a)) = w; pos(a) += 1
      nbrs(pos(b)) = a; ew(pos(b)) = w; pos(b) += 1
    }
    // Sort each adjacency list (weights move with neighbors).
    u = 0
    while (u < n) {
      val lo = offsets(u); val hi = offsets(u + 1)
      val idx = (lo until hi).sortBy(nbrs)
      val nn = idx.map(nbrs).toArray; val we = idx.map(ew).toArray
      var i = lo
      while (i < hi) { nbrs(i) = nn(i - lo); ew(i) = we(i - lo); i += 1 }
      u += 1
    }
    val vwArr = if (vertexWeights != null) vertexWeights else new Array[Double](n)
    require(vwArr.length == n, "vertexWeights length must equal n")
    new LocalGraph(n, offsets, nbrs, ew, vwArr)
  }
}
