package repro.graph

import org.apache.spark.sql.{DataFrame, Row, SparkSession}

/** Immutable CSR adjacency for an undirected simple graph (the paper's
  * in-memory format, §4.2). Neighbor lists are sorted ascending so sorted
  * set primitives and symmetry-break early exit apply. Broadcast to
  * executors by the engines.
  *
  * @param labels vertex labels for FSM graphs (empty array = unlabeled)
  */
final class CSRGraph(
    val n: Int,
    val offsets: Array[Int],
    val nbrs: Array[Int],
    val labels: Array[Int],
) extends Serializable {
  require(offsets.length == n + 1)

  def numEdges: Long = nbrs.length / 2L // undirected: each edge stored twice
  def numArcs: Int = nbrs.length
  def deg(v: Int): Int = offsets(v + 1) - offsets(v)
  def nbrStart(v: Int): Int = offsets(v)
  def nbrEnd(v: Int): Int = offsets(v + 1)
  def labeled: Boolean = labels.nonEmpty
  def label(v: Int): Int = labels(v)

  lazy val maxDegree: Int = if (n == 0) 0 else (0 until n).map(deg).max

  def hasEdge(u: Int, v: Int): Boolean = {
    var lo = offsets(u); var hi = offsets(u + 1) - 1
    while (lo <= hi) {
      val mid = (lo + hi) >>> 1
      if (nbrs(mid) == v) return true
      else if (nbrs(mid) < v) lo = mid + 1
      else hi = mid - 1
    }
    false
  }

  /** Canonical undirected edges (u < v). */
  def canonicalEdges: Array[Long] = {
    val out = Array.ofDim[Long](numEdges.toInt)
    var o = 0
    var u = 0
    while (u < n) {
      var i = offsets(u)
      while (i < offsets(u + 1)) {
        val v = nbrs(i)
        if (u < v) { out(o) = (u.toLong << 32) | v.toLong; o += 1 }
        i += 1
      }
      u += 1
    }
    out
  }

  /** Orientation (optimization A, §4.2): convert to a DAG by keeping edge
    * u→v iff (deg(u), u) < (deg(v), v). Halves arc count, caps the new
    * "max degree" near the degeneracy, eliminates symmetry checks for
    * cliques. The result is returned as a CSRGraph whose lists are the
    * out-neighbors.
    */
  lazy val oriented: CSRGraph = {
    def rank(v: Int): Long = (deg(v).toLong << 32) | v.toLong
    val outDeg = new Array[Int](n)
    var u = 0
    while (u < n) {
      var i = offsets(u)
      while (i < offsets(u + 1)) {
        if (rank(u) < rank(nbrs(i))) outDeg(u) += 1
        i += 1
      }
      u += 1
    }
    val off = new Array[Int](n + 1)
    var s = 0
    u = 0
    while (u < n) { off(u) = s; s += outDeg(u); u += 1 }
    off(n) = s
    val nb = new Array[Int](s)
    val cur = java.util.Arrays.copyOf(off, n)
    u = 0
    while (u < n) {
      var i = offsets(u)
      while (i < offsets(u + 1)) {
        val v = nbrs(i)
        if (rank(u) < rank(v)) { nb(cur(u)) = v; cur(u) += 1 }
        i += 1
      }
      u += 1
    }
    // out-lists inherit sortedness from the input lists
    new CSRGraph(n, off, nb, labels)
  }

  /** Rename vertices by descending degree (preprocessor option, §4.2):
    * improves load balance / early-exit effectiveness for symmetry bounds.
    */
  def renamedByDegree: CSRGraph = {
    val order = (0 until n).sortBy(v => (-deg(v), v)) // old ids, new order
    val newId = new Array[Int](n)
    order.zipWithIndex.foreach { case (old, nw) => newId(old) = nw }
    val es = canonicalEdges.map { e =>
      val u = newId((e >>> 32).toInt); val v = newId((e & 0xffffffffL).toInt)
      (math.min(u, v), math.max(u, v))
    }
    val ls = if (labeled) {
      val out = new Array[Int](n)
      (0 until n).foreach(old => out(newId(old)) = labels(old))
      out
    } else Array.empty[Int]
    CSRGraph.fromEdges(n, es.toIndexedSeq, ls)
  }

  /** Local graph (optimization E, Fig. 7): the subgraph induced by N(root),
    * with vertices renamed 0..d-1 preserving id order (so symmetry bounds
    * survive renaming). Returns (localGraph, localId -> globalId) and the
    * set-op work spent building it.
    */
  def localGraph(root: Int, wc: repro.setops.WorkCounter): (CSRGraph, Array[Int]) = {
    val d = deg(root)
    val verts = java.util.Arrays.copyOfRange(nbrs, offsets(root), offsets(root + 1))
    val tmp = new Array[Int](d)
    val adjLists = new Array[Array[Int]](d)
    var li = 0
    while (li < d) {
      val g = verts(li)
      val len = repro.setops.SetOps.intersect(
        verts, 0, d, nbrs, offsets(g), deg(g), tmp, wc)
      // rename: verts is sorted, binary search positions (order-preserving)
      val loc = new Array[Int](len)
      var i = 0
      while (i < len) { loc(i) = java.util.Arrays.binarySearch(verts, 0, d, tmp(i)); i += 1 }
      adjLists(li) = loc
      li += 1
    }
    val off = new Array[Int](d + 1)
    var s = 0
    li = 0
    while (li < d) { off(li) = s; s += adjLists(li).length; li += 1 }
    off(d) = s
    val nb = new Array[Int](s)
    li = 0
    while (li < d) { System.arraycopy(adjLists(li), 0, nb, off(li), adjLists(li).length); li += 1 }
    (new CSRGraph(d, off, nb, Array.empty), verts)
  }

  /** Partition vertices into `parts` contiguous ranges (multi-GPU
    * hub-pattern partitioning, §7.2 (1)); returns the part of each vertex.
    */
  def partitionVertices(parts: Int): Array[Int] = {
    val out = new Array[Int](n)
    var v = 0
    while (v < n) { out(v) = math.min(parts - 1, v * parts / math.max(1, n)); v += 1 }
    out
  }

  /** Degree histogram stats used by input-aware heuristics. */
  def stats: String = f"n=$n%d m=$numEdges%d maxDeg=$maxDegree%d avgDeg=${2.0 * numEdges / math.max(1, n)}%.1f"
}

object CSRGraph {

  /** Build from undirected edges; dedups, drops self-loops, symmetrizes. */
  def fromEdges(n: Int, edges: Seq[(Int, Int)], labels: Array[Int] = Array.empty): CSRGraph = {
    val set = new java.util.HashSet[Long](edges.size * 2)
    edges.foreach { case (a, b) =>
      if (a != b) {
        val u = math.min(a, b); val v = math.max(a, b)
        require(u >= 0 && v < n, s"edge ($a,$b) out of range for n=$n")
        set.add((u.toLong << 32) | v.toLong)
      }
    }
    val degA = new Array[Int](n)
    val it0 = set.iterator()
    while (it0.hasNext) {
      val e = it0.next()
      degA((e >>> 32).toInt) += 1; degA((e & 0xffffffffL).toInt) += 1
    }
    val off = new Array[Int](n + 1)
    var s = 0
    var v = 0
    while (v < n) { off(v) = s; s += degA(v); v += 1 }
    off(n) = s
    val nb = new Array[Int](s)
    val cur = java.util.Arrays.copyOf(off, n)
    val it = set.iterator()
    while (it.hasNext) {
      val e = it.next()
      val u = (e >>> 32).toInt; val w = (e & 0xffffffffL).toInt
      nb(cur(u)) = w; cur(u) += 1
      nb(cur(w)) = u; cur(w) += 1
    }
    v = 0
    while (v < n) { java.util.Arrays.sort(nb, off(v), off(v + 1)); v += 1 }
    new CSRGraph(n, off, nb, labels)
  }

  /** Load from an edge DataFrame with integer columns (src, dst).
    * Graphs in this repro are <= ~1M edges, so a driver collect is fine —
    * the analog of the paper's graph loader reading a CSR file.
    */
  def fromEdgeDf(df: DataFrame, labelDf: Option[DataFrame] = None): CSRGraph = {
    val rows = df.select("src", "dst").collect()
    val edges = rows.map(r => (r.getInt(0), r.getInt(1))).toIndexedSeq
    val maxV = if (edges.isEmpty) 0 else edges.iterator.flatMap(e => Iterator(e._1, e._2)).max
    val labels = labelDf match {
      case Some(ldf) =>
        val lr = ldf.select("v", "label").collect()
        val out = new Array[Int](maxV + 1)
        lr.foreach(r => out(r.getInt(0)) = r.getInt(1))
        out
      case None => Array.empty[Int]
    }
    fromEdges(maxV + 1, edges, labels)
  }

  /** Canonical edge DataFrame (src < dst) for the BFS engine / oracle. */
  def toEdgeDf(spark: SparkSession, g: CSRGraph): DataFrame = {
    import org.apache.spark.sql.types._
    val rows = g.canonicalEdges.map { e =>
      Row((e >>> 32).toInt, (e & 0xffffffffL).toInt)
    }
    val schema = StructType(Seq(StructField("src", IntegerType, false), StructField("dst", IntegerType, false)))
    spark.createDataFrame(spark.sparkContext.parallelize(rows.toIndexedSeq, 8), schema)
  }

  /** Vertex-label DataFrame for labeled graphs. */
  def toLabelDf(spark: SparkSession, g: CSRGraph): DataFrame = {
    import org.apache.spark.sql.types._
    val rows = (0 until g.n).map(v => Row(v, g.label(v)))
    val schema = StructType(Seq(StructField("v", IntegerType, false), StructField("label", IntegerType, false)))
    spark.createDataFrame(spark.sparkContext.parallelize(rows, 8), schema)
  }
}
