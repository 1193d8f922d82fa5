package repro.mc

import org.apache.spark.sql.SparkSession
import repro.graph.CSRGraph
import repro.pattern.{Pattern, Patterns}
import repro.setops.{SetOps, WorkCounter}

/** Counting-only pruning via pattern decomposition (optimization D, §5.4):
  * instead of enumerating k-vertex subgraphs, count them from cheaper
  * primitives — per-edge triangle counts, degree moments, common-neighbor
  * pair statistics and 4-clique enumeration — then convert *non-induced*
  * counts to *induced* motif counts with an inversion matrix that is
  * derived and exactly inverted in code (ESCAPE-style [82]).
  */
object MotifFormulas {

  /** M(i)(j) = number of spanning subgraphs of motif i isomorphic to
    * motif j; N = Mᵀ·I relates non-induced (N) and induced (I) counts.
    * M is unit lower-triangular when motifs are sorted by edge count, so
    * the inverse transform is exact integer back-substitution.
    */
  def conversionMatrix(motifs: Vector[Pattern]): Vector[Vector[Long]] = {
    val k = motifs.head.n
    require(motifs.forall(_.n == k))
    motifs.map { mi =>
      val pairs = mi.edges
      motifs.map { mj =>
        var cnt = 0L
        for (mask <- 0 until (1 << pairs.length)) {
          val es = pairs.zipWithIndex.collect { case (e, x) if (mask & (1 << x)) != 0 => e }
          if (es.length == mj.numEdges) {
            val sub = Patterns.fromEdges(k, es)
            // spanning: no isolated vertex (all motifs are connected)
            if ((0 until k).forall(v => sub.degree(v) > 0) && sub.isomorphicTo(mj)) cnt += 1
          }
        }
        cnt
      }
    }
  }

  /** Solve I from N given the (sorted-by-edge-count) conversion matrix:
    * N_j = Σ_i M(i)(j) · I_i, M unit-triangular ⇒ back-substitution from
    * the densest motif down.
    */
  def nonInducedToInduced(motifs: Vector[Pattern], nonInduced: Vector[Long]): Vector[Long] = {
    val m = conversionMatrix(motifs)
    val n = motifs.length
    val induced = new Array[Long](n)
    for (j <- (n - 1) to 0 by -1) {
      var v = nonInduced(j)
      for (i <- j + 1 until n) v -= m(i)(j) * induced(i)
      require(m(j)(j) == 1, s"conversion matrix not unit-triangular at $j")
      induced(j) = v
    }
    induced.toVector
  }

  final case class FormulaResult(induced: Vector[(Pattern, Long)], work: Long)

  /** Per-edge triangle counts and the primitives derived from them. */
  private final case class EdgePrimitives(
      triangles: Long,            // T
      tailedNonInduced: Long,     // Σ_e t_e (d_u + d_v − 4) / 2
      diamondsNonInduced: Long,   // Σ_e C(t_e, 2)
      pathsPart: Long,            // Σ_e (d_u − 1)(d_v − 1)
  )

  private def edgePrimitives(g: CSRGraph, wc: WorkCounter): EdgePrimitives = {
    var t3 = 0L; var tailed2x = 0L; var dia = 0L; var paths = 0L
    var u = 0
    while (u < g.n) {
      var i = g.nbrStart(u)
      while (i < g.nbrEnd(u)) {
        val v = g.nbrs(i)
        if (u < v) {
          val te = SetOps.intersect(
            g.nbrs, g.nbrStart(u), g.deg(u), g.nbrs, g.nbrStart(v), g.deg(v),
            scratch(g), wc).toLong
          t3 += te
          tailed2x += te * (g.deg(u) + g.deg(v) - 4)
          dia += te * (te - 1) / 2
          paths += (g.deg(u) - 1).toLong * (g.deg(v) - 1)
        }
        i += 1
      }
      u += 1
    }
    EdgePrimitives(t3 / 3, tailed2x / 2, dia, paths)
  }

  private val scratchTl = new ThreadLocal[Array[Int]]
  private def scratch(g: CSRGraph): Array[Int] = {
    var a = scratchTl.get()
    if (a == null || a.length < g.maxDegree) { a = new Array[Int](math.max(1, g.maxDegree)); scratchTl.set(a) }
    a
  }

  /** Non-induced 4-cycle count: every 4-cycle has two "diagonal" vertex
    * pairs; a pair (u, w) with c common neighbors closes C(c, 2) cycles.
    * Computed as a genuine Spark job: wedge generation from the broadcast
    * CSR, then a groupBy over diagonal pairs.
    */
  def fourCyclesNonInduced(spark: SparkSession, g: CSRGraph): (Long, Long) = {
    import spark.implicits._
    val bc = spark.sparkContext.broadcast(g)
    val par = math.max(1, spark.sparkContext.defaultParallelism)
    val wedgeEnds = spark.range(0, g.n, 1, par).as[Long].mapPartitions { it =>
      val gg = bc.value
      it.flatMap { zl =>
        val z = zl.toInt
        val s = gg.nbrStart(z); val e = gg.nbrEnd(z)
        for {
          i <- Iterator.range(s, e)
          j <- Iterator.range(i + 1, e)
        } yield (gg.nbrs(i).toLong << 32) | gg.nbrs(j).toLong
      }
    }
    val agg = wedgeEnds.toDF("pair").groupBy("pair").count()
      .selectExpr("sum((count * (count - 1)) div 2) as s")
      .collect()(0)
    val sum = if (agg.isNullAt(0)) 0L else agg.getLong(0)
    val totalWedges = (0 until g.n).map(v => g.deg(v).toLong * (g.deg(v) - 1) / 2).sum
    bc.destroy()
    (sum / 2, totalWedges)
  }

  /** Induced 3-motif counts from closed forms: wedge = W − 3T, triangle = T. */
  def threeMotifs(g: CSRGraph): FormulaResult = {
    val wc = new WorkCounter
    val prim = edgePrimitives(g, wc)
    val wedges = (0 until g.n).map(v => g.deg(v).toLong * (g.deg(v) - 1) / 2).sum
    val motifs = Patterns.motifs(3)
    val non = motifs.map { p =>
      if (p.isomorphicTo(Patterns.wedge)) wedges else prim.triangles
    }
    val ind = nonInducedToInduced(motifs, non)
    FormulaResult(motifs.zip(ind), wc.ops + g.n)
  }

  /** Induced 4-motif counts: non-induced primitives + exact inversion.
    * 4-cliques are the only piece that needs enumeration (oriented DFS).
    */
  def fourMotifs(spark: SparkSession, g: CSRGraph): FormulaResult = {
    val wc = new WorkCounter
    val prim = edgePrimitives(g, wc)
    val (c4, wedges) = fourCyclesNonInduced(spark, g)
    val claws = (0 until g.n).map(v => comb3(g.deg(v))).sum
    val paths = prim.pathsPart - 3 * prim.triangles
    val k4plan = repro.plan.Planner.plan(Patterns.clique(4), induced = false)
    val k4m = repro.engine.DfsEngine.runLocal(g, k4plan, repro.engine.DfsConfig())
    val motifs = Patterns.motifs(4)
    val non = motifs.map { p =>
      if (p.isomorphicTo(Patterns.path(4))) paths
      else if (p.isomorphicTo(Patterns.star(4))) claws
      else if (p.isomorphicTo(Patterns.cycle4)) c4
      else if (p.isomorphicTo(Patterns.tailedTriangle)) prim.tailedNonInduced
      else if (p.isomorphicTo(Patterns.diamond)) prim.diamondsNonInduced
      else if (p.isomorphicTo(Patterns.clique(4))) k4m.count
      else sys.error(s"unexpected 4-motif $p")
    }
    val ind = nonInducedToInduced(motifs, non)
    FormulaResult(motifs.zip(ind), wc.ops + wedges + k4m.setOpWork)
  }

  private def comb3(d: Int): Long = d.toLong * (d - 1) * (d - 2) / 6
}
