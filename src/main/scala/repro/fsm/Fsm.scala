package repro.fsm

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.graph.CSRGraph
import repro.pattern.{Pattern, Patterns}

/** Frequent Subgraph Mining (k-FSM) by edge extension with MNI ("domain")
  * support, the paper's §5.2/§7.2 workload.
  *
  * The embedding lists live in Spark Datasets and grow level by level
  * (bounded BFS, optimization M): the partition count is sized so each
  * "block" of embeddings fits the simulated device budget. Support is
  * computed with DataFrame aggregation (min over per-position distinct
  * vertex counts, expanded over pattern automorphisms so MNI matches the
  * GraMi definition). Label-frequency pruning (optimization N) removes
  * vertices whose label cannot appear in any frequent pattern.
  */
object Fsm {

  final case class FsmConfig(
      minSupport: Long,
      maxEdges: Int = 3,
      labelPruning: Boolean = true,
      blockRows: Long = 1L << 16,
  )

  final case class FsmMetrics(
      levelEmbeddings: Vector[Long],    // canonical embeddings per level
      extensionWork: Long,              // neighbor scans performed
      candidatePatterns: Vector[Int],   // patterns examined per level
      frequentPatterns: Vector[Int],    // patterns surviving per level
      numLabels: Int,
      numFrequentLabels: Int,
  )

  /** @param frequent    patterns with support >= cfg.minSupport
    * @param allSupports exact supports of every candidate pattern reached
    *                    during the mining run — by anti-monotonicity, the
    *                    frequent set for any σ' >= cfg.minSupport is
    *                    `allSupports.filter(_._2 >= σ')`
    */
  final case class FsmResult(frequent: Map[String, Long], allSupports: Map[String, Long],
                             metrics: FsmMetrics)

  /** One embedding: pattern canonical code + data vertices by position.
    * (Public: Spark's generated encoders must be able to construct it.)
    */
  final case class Emb(code: String, vs: Seq[Int])

  /** All isomorphisms from `a` onto `b` (same n; maps position i of a to
    * position iso(i) of b) respecting edges and labels.
    */
  def allIsomorphisms(a: Pattern, b: Pattern): Vector[Vector[Int]] =
    (0 until a.n).toVector.permutations.filter { phi =>
      (0 until a.n).forall { i =>
        a.labels.get(i) == b.labels.get(phi(i)) &&
          (0 until a.n).forall(j => a.isEdge(i, j) == b.isEdge(phi(i), phi(j)))
      }
    }.toVector

  /** A resolved extension target: the child's canonical code plus every
    * isomorphism from the canonical child pattern onto the *as-grown*
    * child, so embedding tuples can be re-ordered into canonical position
    * order (and the lexicographic min over all isomorphisms is the unique
    * canonical embedding tuple, deduplicating automorphic rediscoveries).
    */
  final case class Ext(code: String, isos: Vector[Vector[Int]]) {
    def canonicalTuple(vs: Array[Int]): Seq[Int] = {
      if (isos.length == 1) {
        val phi = isos.head
        val out = new Array[Int](phi.length)
        var i = 0
        while (i < phi.length) { out(i) = vs(phi(i)); i += 1 }
        return scala.collection.immutable.ArraySeq.unsafeWrapArray(out)
      }
      isos.iterator.map(phi => phi.map(vs): Seq[Int]).min(SeqIntOrdering)
    }
  }

  private object SeqIntOrdering extends Ordering[Seq[Int]] {
    def compare(x: Seq[Int], y: Seq[Int]): Int = {
      var i = 0
      while (i < x.length && i < y.length) {
        val c = Integer.compare(x(i), y(i))
        if (c != 0) return c
        i += 1
      }
      Integer.compare(x.length, y.length)
    }
  }

  /** Executor-side cache of pattern machinery, keyed by canonical code.
    * `patterns` must map each code to its *canonical* pattern (the one
    * `decodePattern` yields), because embedding tuples are stored in
    * canonical position order.
    */
  private final class PatternCache(patterns: Map[String, Pattern]) extends Serializable {
    @transient private lazy val extCache =
      scala.collection.mutable.HashMap.empty[(String, Int, Int, Int), Ext]

    def pattern(code: String): Pattern = patterns(code)

    /** Extension: add edge (i, j) to the canonical pattern of `code`;
      * j == p.n means a new vertex with label `newLabel`.
      */
    def extend(code: String, i: Int, j: Int, newLabel: Int): Ext =
      extCache.getOrElseUpdate((code, i, j, newLabel), {
        val p = patterns(code)
        val p2 =
          if (j == p.n) {
            val grown = p.withEdge(i, j)
            Pattern(grown.n, grown.adj, Some(grown.labels.get.dropRight(1) :+ newLabel))
          } else p.withEdge(i, j)
        val code2 = p2.canonicalCode
        Ext(code2, allIsomorphisms(decodePattern(code2), p2))
      })
  }

  def singleEdgePattern(la: Int, lb: Int): Pattern = {
    val (a, b) = (math.min(la, lb), math.max(la, lb))
    Patterns.fromEdges(2, Seq((0, 1)), Some(Vector(a, b)))
  }

  def run(spark: SparkSession, g: CSRGraph, cfg: FsmConfig): FsmResult = {
    import spark.implicits._
    require(g.labeled, "FSM requires a labeled graph")

    // --- optimization N: label-frequency pruning ----------------------
    val labelFreq: Map[Int, Long] = {
      val df = CSRGraph.toLabelDf(spark, g)
      df.groupBy("label").count().collect().map(r => r.getInt(0) -> r.getLong(1)).toMap
    }
    val frequentLabels = labelFreq.filter(_._2 >= cfg.minSupport).keySet
    val mineGraph =
      if (!cfg.labelPruning) g
      else {
        // drop vertices whose label is infrequent: no frequent pattern can
        // contain them (its MNI would be capped below the threshold)
        val keep = (0 until g.n).filter(v => frequentLabels.contains(g.label(v))).toArray
        val newId = Array.fill(g.n)(-1)
        keep.zipWithIndex.foreach { case (old, nw) => newId(old) = nw }
        val es = g.canonicalEdges.flatMap { e =>
          val u = newId((e >>> 32).toInt); val v = newId((e & 0xffffffffL).toInt)
          if (u >= 0 && v >= 0) Some((u, v)) else None
        }
        CSRGraph.fromEdges(keep.length, es.toIndexedSeq, keep.map(g.label))
      }

    val bc = spark.sparkContext.broadcast(mineGraph)
    var patterns = Map.empty[String, Pattern]
    var frequent = Map.empty[String, Long]
    var allSupports = Map.empty[String, Long]
    var levelEmb = Vector.empty[Long]
    var candPats = Vector.empty[Int]
    var freqPats = Vector.empty[Int]
    var extWork = 0L

    // --- level 1: single-edge patterns --------------------------------
    val lvl1 = {
      val gg = mineGraph
      val embs = Vector.newBuilder[Emb]
      val extCache = scala.collection.mutable.HashMap.empty[(Int, Int), Ext]
      var u = 0
      while (u < gg.n) {
        var i = gg.nbrStart(u)
        while (i < gg.nbrEnd(u)) {
          val v = gg.nbrs(i)
          if (u < v) {
            val (la, lb) = (gg.label(u), gg.label(v))
            val ext = extCache.getOrElseUpdate((la, lb), {
              val grown = Patterns.fromEdges(2, Seq((0, 1)), Some(Vector(la, lb)))
              val code = grown.canonicalCode
              Ext(code, allIsomorphisms(decodePattern(code), grown))
            })
            if (!patterns.contains(ext.code)) patterns += ext.code -> decodePattern(ext.code)
            embs += Emb(ext.code, ext.canonicalTuple(Array(u, v)))
          }
          i += 1
        }
        u += 1
      }
      extWork += gg.numArcs.toLong
      embs.result()
    }

    def supports(embs: org.apache.spark.sql.Dataset[Emb]): Map[String, Long] = {
      // MNI domain of position i is the union over the automorphism orbit
      // of i of the values in those positions — so aggregate (code, orbit,
      // vertex) triples instead of exploding per automorphism. Int keys
      // keep the shuffle narrow.
      val codeIds: Map[String, Int] = patterns.keys.toSeq.sorted.zipWithIndex.toMap
      val idCodes: Map[Int, String] = codeIds.map(_.swap)
      val orbitOf: Map[String, Array[Int]] = patterns.map { case (c, p) =>
        val auts = p.automorphisms
        val orbitSets = (0 until p.n).map(i => auts.map(_(i)).toSet)
        val distinctOrbits = orbitSets.distinct
        c -> (0 until p.n).map(i => distinctOrbits.indexOf(orbitSets(i))).toArray
      }
      import spark.implicits._
      val triples = embs.mapPartitions { it =>
        it.flatMap { emb =>
          val orb = orbitOf(emb.code)
          val cid = codeIds(emb.code)
          emb.vs.indices.iterator.map(i => (cid, orb(i), emb.vs(i)))
        }
      }.toDF("cid", "orbit", "v")
      triples
        .groupBy("cid", "orbit").agg(countDistinct("v").as("dom"))
        .groupBy("cid").agg(min("dom").as("support"))
        .collect().map(r => idCodes(r.getInt(0)) -> r.getLong(1)).toMap
    }

    // Partition count models the bounded-BFS blocks (optimization M).
    def blocks(rows: Long): Int = math.max(1, math.min(256, (rows / math.max(1, cfg.blockRows)).toInt + 1))

    var cur: org.apache.spark.sql.Dataset[Emb] = spark.createDataset(lvl1)
      .repartition(blocks(lvl1.size))
      .persist()
    var curRows = cur.count()
    levelEmb = levelEmb :+ curRows
    candPats = candPats :+ patterns.size

    var lvl1Sup = supports(cur)
    var freqCodes = lvl1Sup.filter(_._2 >= cfg.minSupport).keySet
    allSupports ++= lvl1Sup
    frequent ++= lvl1Sup.filter { case (c, s) => s >= cfg.minSupport }
    freqPats = freqPats :+ freqCodes.size

    // --- levels 2..maxEdges: edge extension ---------------------------
    for (level <- 2 to cfg.maxEdges) {
      val fc = freqCodes
      val prev = cur.filter(e => fc.contains(e.code))
      val cache = new PatternCache(patterns)
      val extended = prev.mapPartitions { it =>
        val out = it.flatMap { emb =>
          val gg = bc.value
          val p = cache.pattern(emb.code)
          val vsArr = emb.vs.toArray
          val exts = Vector.newBuilder[Emb]
          var i = 0
          while (i < p.n) {
            val dv = vsArr(i)
            var x = gg.nbrStart(dv)
            while (x < gg.nbrEnd(dv)) {
              val w = gg.nbrs(x)
              val j = vsArr.indexOf(w)
              if (j < 0) {
                val ext = cache.extend(emb.code, i, p.n, gg.label(w))
                exts += Emb(ext.code, ext.canonicalTuple(vsArr :+ w))
              } else if (j != i && i < j && !p.isEdge(i, j)) {
                val ext = cache.extend(emb.code, i, j, -1)
                exts += Emb(ext.code, ext.canonicalTuple(vsArr))
              }
              x += 1
            }
            i += 1
          }
          exts.result()
        }
        out
      }.distinct()

      // register new patterns discovered at this level (codes are produced
      // executor-side; rebuild their Pattern objects on the driver)
      val newCodes = extended.select("code").distinct().as[String].collect()
      val known = patterns.keySet
      val fresh = newCodes.filterNot(known.contains)
      fresh.foreach { code => patterns += code -> decodePattern(code) }

      cur.unpersist()
      cur = extended.repartition(blocks(math.max(1, curRows * 8))).persist()
      curRows = cur.count()
      extWork += estimateExtensionWork(levelEmb.last, mineGraph)
      levelEmb = levelEmb :+ curRows
      candPats = candPats :+ newCodes.length

      val sup = supports(cur)
      freqCodes = sup.filter(_._2 >= cfg.minSupport).keySet
      allSupports ++= sup
      frequent ++= sup.filter { case (_, s) => s >= cfg.minSupport }
      freqPats = freqPats :+ freqCodes.size
    }
    cur.unpersist()
    bc.destroy()

    FsmResult(
      frequent,
      allSupports,
      FsmMetrics(levelEmb, extWork, candPats, freqPats, labelFreq.size, frequentLabels.size),
    )
  }

  /** Extension work is one neighbor scan per (embedding, position): the
    * average degree times vertices per embedding.
    */
  private def estimateExtensionWork(embeddings: Long, g: CSRGraph): Long =
    embeddings * 3L * math.max(1L, 2L * g.numEdges / math.max(1, g.n))

  /** Rebuild a Pattern from its canonical code `n|bits:labels`. */
  def decodePattern(code: String): Pattern = {
    val Array(head, rest) = code.split("\\|", 2)
    val n = head.toInt
    val (bits, labels) = rest.split(":", 2) match {
      case Array(b, l) => (b, Some(l.split(",").map(_.toInt).toVector))
      case Array(b)    => (b, None)
    }
    val pairs = for { u <- 0 until n; v <- u + 1 until n } yield (u, v)
    val es = pairs.zip(bits).collect { case (e, '1') => e }
    Patterns.fromEdges(n, es, labels)
  }
}
