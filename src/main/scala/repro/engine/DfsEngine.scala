package repro.engine

import org.apache.spark.sql.SparkSession
import repro.graph.CSRGraph
import repro.plan.{Planner, SearchPlan}
import repro.setops.{SetOps, WorkCounter}

/** Configuration knobs mirroring the paper's optimization letters (Table 2).
  *
  * @param edgeParallel      edge- vs vertex-parallel tasks (§5.1 (2))
  * @param orientation       DAG orientation for cliques (opt A)
  * @param edgelistReduction emit each symmetric edge once (opt J)
  * @param buffering         reuse intermediate sets across levels (opt K)
  * @param countingOnly      fuse the two innermost loops into C(n,2) (opt D)
  * @param lgs               local graph search for hub patterns (opt E)
  * @param lgsMaxDegree      input-aware threshold: skip LGS if Δ too large
  * @param boundedMerges     early-exit merges at upper symmetry bounds
  *                          (set bounding inside the merge, §6.1); disable
  *                          to measure the scan volume of engines without
  *                          it (Pangolin's extend-then-filter)
  */
final case class DfsConfig(
    edgeParallel: Boolean = true,
    orientation: Boolean = true,
    edgelistReduction: Boolean = true,
    buffering: Boolean = true,
    countingOnly: Boolean = false,
    lgs: Boolean = false,
    lgsMaxDegree: Int = 4096,
    boundedMerges: Boolean = true,
)

/** Aggregated run metrics. `levelNodes(i)` is the number of valid partial
  * embeddings of search positions 0..i — exactly the subgraph-list sizes a
  * BFS engine would materialize level by level, which the cost model uses
  * to derive Pangolin/PBE memory footprints.
  */
final case class Metrics(
    count: Long,
    setOpWork: Long,
    levelNodes: Array[Long],
    tasks: Long,
    bufferSavedWork: Long,
) {
  def combine(o: Metrics): Metrics = Metrics(
    count + o.count,
    setOpWork + o.setOpWork,
    levelNodes.zip(o.levelNodes).map { case (a, b) => a + b },
    tasks + o.tasks,
    bufferSavedWork + o.bufferSavedWork,
  )
  def maxLevelNodes: Long = if (levelNodes.isEmpty) 0 else levelNodes.max
}

/** Single-threaded plan interpreter, one instance per Spark partition.
  * This is the analog of a generated CUDA kernel: the nested DFS loops,
  * set primitives, symmetry bounds and buffer reuse of §5/§6, driven by a
  * [[SearchPlan]] instead of generated source.
  */
final class PlanExecutor(g: CSRGraph, plan: SearchPlan, cfg: DfsConfig) {
  private val k = plan.k
  private val levels = plan.levels
  val wc = new WorkCounter
  var count = 0L
  val lvl = new Array[Long](k)
  var tasksRun = 0L
  var savedWork = 0L

  // Levels whose buffer is a reuse source must stay unbounded (a later
  // level may need a different range); all others can merge with an early
  // exit at their upper symmetry bound.
  private val reusedLater: Array[Boolean] = {
    val out = new Array[Boolean](k)
    plan.bufferReuse.foreach(_.foreach(j => out(j) = true))
    out
  }

  private val cap = math.max(1, g.maxDegree)
  private val buf = Array.ofDim[Int](k, cap)
  // Candidate-set views per position: (array, offset, length).
  private val candArr = new Array[Array[Int]](k)
  private val candOff = new Array[Int](k)
  private val candLen = new Array[Int](k)
  private val candStored = new Array[Boolean](k)
  private val matched = new Array[Int](k)
  private val identity = Array.range(0, cap) // "all local vertices" view for LGS

  // --- LGS task state -------------------------------------------------
  private var lgsMode = false
  private var lg: CSRGraph = g        // graph used for set ops (local in LGS)
  private var rootLocalBound = 0      // #local vertices with global id < v0

  @inline private def nbrA: Array[Int] = lg.nbrs
  @inline private def nOff(v: Int): Int = lg.offsets(v)
  @inline private def nLen(v: Int): Int = lg.offsets(v + 1) - lg.offsets(v)

  private def ubVal(j: Int): Int =
    if (lgsMode && j == 0) rootLocalBound else matched(j)
  private def lbVal(j: Int): Int =
    if (lgsMode && j == 0) rootLocalBound - 1 else matched(j)

  /** Compute (or reuse) the candidate set for position i. */
  private def computeCands(i: Int): Unit = {
    val li = i - 1
    if (cfg.buffering) {
      plan.bufferReuse(li) match {
        case Some(j) if candStored(j) =>
          candArr(i) = candArr(j); candOff(i) = candOff(j); candLen(i) = candLen(j)
          candStored(i) = true
          // work the recomputation would have cost: the merge over inputs
          val spec = levels(li)
          var saved = 0L
          spec.conn.foreach(c => if (!(lgsMode && c == 0)) saved += nLen(matched(c)).toLong)
          spec.anti.foreach(c => saved += nLen(matched(c)).toLong)
          savedWork += saved
          return
        case _ => ()
      }
    }
    val spec = levels(li)
    val conn = if (lgsMode) spec.conn.filter(_ != 0) else spec.conn
    // Merge with early exit at the upper symmetry bound when this buffer
    // is private to the level (set-bounding inside the merge, §6.1).
    val ub =
      if (!cfg.boundedMerges || reusedLater(i) || spec.uppers.isEmpty) Int.MaxValue
      else spec.uppers.map(ubVal).min
    var arr: Array[Int] = null; var off = 0; var len = 0
    if (conn.isEmpty) { // LGS: every local vertex is a neighbor of the root
      arr = identity; off = 0; len = lg.n
    } else {
      val c0 = matched(conn(0))
      arr = nbrA; off = nOff(c0); len = nLen(c0)
      var ci = 1
      while (ci < conn.length) {
        val c = matched(conn(ci))
        len = SetOps.intersect(arr, off, len, nbrA, nOff(c), nLen(c), buf(i), wc, ub)
        arr = buf(i); off = 0
        ci += 1
      }
    }
    var ai = 0
    while (ai < spec.anti.length) {
      val a = matched(spec.anti(ai))
      len = SetOps.difference(arr, off, len, nbrA, nOff(a), nLen(a), buf(i), wc, ub)
      arr = buf(i); off = 0
      ai += 1
    }
    candArr(i) = arr; candOff(i) = off; candLen(i) = len
    candStored(i) = true
  }

  /** Index range of candidates satisfying the symmetry bounds; returns
    * (lo, hi) absolute indices into candArr(i).
    */
  private def boundedRange(i: Int): (Int, Int) = {
    val spec = levels(i - 1)
    val arr = candArr(i); val off = candOff(i); val len = candLen(i)
    var hi = off + len
    if (spec.uppers.nonEmpty) {
      var ub = Int.MaxValue
      spec.uppers.foreach(j => ub = math.min(ub, ubVal(j)))
      hi = off + SetOps.countBelow(arr, off, len, ub, wc)
    }
    var lo = off
    if (spec.lowers.nonEmpty) {
      var lb = Int.MinValue
      spec.lowers.foreach(j => lb = math.max(lb, lbVal(j)))
      lo = off + SetOps.countBelow(arr, off, len, lb + 1, wc)
    }
    (lo, hi)
  }

  /** Count matched vertices that appear inside [lo, hi) of candArr(i) —
    * injectivity correction for counting without iteration.
    */
  private def matchedInRange(i: Int, lo: Int, hi: Int): Int = {
    if (lo >= hi) return 0
    val spec = levels(i - 1)
    val arr = candArr(i)
    var cnt = 0
    var j = if (lgsMode) 1 else 0 // in LGS the root is not a local vertex
    while (j < i) {
      if (!spec.conn.contains(j)) { // candidates ⊆ N(v_j) can never equal v_j
        val v = matched(j)
        if (v >= arr(lo) && v <= arr(hi - 1) &&
            SetOps.contains(arr, lo, hi - lo, v, wc)) cnt += 1
      }
      j += 1
    }
    cnt
  }

  @inline private def isMatched(v: Int, upTo: Int): Boolean = {
    var j = if (lgsMode) 1 else 0
    var found = false
    while (j < upTo && !found) { found = matched(j) == v; j += 1 }
    found
  }

  private def descend(i: Int): Unit = {
    if (plan.fusedCount && i == k - 2) { fusedLeaf(i); return }
    computeCands(i)
    val (lo, hi) = boundedRange(i)
    if (i == k - 1) {
      val c = (hi - lo) - matchedInRange(i, lo, hi)
      count += c
      lvl(i) += c
    } else {
      val arr = candArr(i)
      var idx = lo
      while (idx < hi) {
        val v = arr(idx)
        if (!isMatched(v, i)) {
          matched(i) = v
          lvl(i) += 1
          descend(i + 1)
        }
        idx += 1
      }
      wc.add((hi - lo).toLong)
    }
  }

  /** Counting-only fusion (Algorithm 3): positions k-2 and k-1 draw from
    * the same buffer with a single mutual bond — count C(n, 2) pairs.
    */
  private def fusedLeaf(i: Int): Unit = {
    computeCands(i)
    val n = (candLen(i) - matchedInRange(i, candOff(i), candOff(i) + candLen(i))).toLong
    count += n * (n - 1) / 2
    lvl(i) += n
    lvl(i + 1) += n * (n - 1) / 2
  }

  private def resetTask(): Unit = {
    java.util.Arrays.fill(candStored, false)
    lgsMode = false
    lg = g
  }

  /** Edge-parallel task: the subtree rooted at edge (v0, v1). */
  def runEdgeTask(v0: Int, v1: Int): Unit = {
    tasksRun += 1
    resetTask()
    matched(0) = v0
    // validate level-1 symmetry bounds (tasks may carry both directions)
    val spec = levels(0)
    if (spec.uppers.exists(j => v1 >= matched(j))) return
    if (spec.lowers.exists(j => v1 <= matched(j))) return
    matched(1) = v1
    lvl(1) += 1
    if (k == 2) count += 1 else descend(2)
  }

  /** Vertex-parallel task: the subtree rooted at vertex v0. */
  def runVertexTask(v0: Int): Unit = {
    tasksRun += 1
    resetTask()
    matched(0) = v0
    if (k == 1) { count += 1; lvl(0) += 1; return }
    descend(1)
  }

  /** LGS task (hub patterns): search v0's local induced graph (Fig. 7). */
  def runLgsTask(v0: Int): Unit = {
    tasksRun += 1
    resetTask()
    if (g.deg(v0) < k - 1) return
    val (local, verts) = g.localGraph(v0, wc)
    lgsMode = true
    lg = local
    matched(0) = v0
    rootLocalBound = {
      // #local vertices with global id < v0 (order-preserving rename)
      var lo = 0; var hi = verts.length
      while (lo < hi) { val m = (lo + hi) >>> 1; if (verts(m) < v0) lo = m + 1 else hi = m }
      lo
    }
    descend(1)
    lgsMode = false
    lg = g
  }

  def metrics(totalVertices: Long): Metrics = {
    val l = lvl.clone()
    l(0) = totalVertices
    Metrics(count, wc.ops, l, tasksRun, savedWork)
  }
}

/** Output of one Spark partition's worth of tasks. */
final case class TaskOut(count: Long, work: Long, lvl: Array[Long], tasks: Long, saved: Long)

/** The G²Miner execution engine on Spark: tasks are distributed across the
  * cluster as a Dataset; each partition interprets the pattern's search
  * plan over a broadcast CSR graph. Counts are exact; metrics feed the
  * simulated-device cost model and the multi-GPU scheduler.
  */
object DfsEngine {

  /** Resolve the effective (graph, plan, mode) after input/pattern-aware
    * optimizations: orientation rewrites clique plans onto the DAG;
    * LGS switches hub patterns to vertex-rooted local search.
    */
  private[engine] def resolve(g: CSRGraph, plan: SearchPlan, cfg: DfsConfig):
      (CSRGraph, SearchPlan, Boolean, Boolean) = {
    val orient = cfg.orientation && plan.pattern.isClique && !plan.induced
    val graph = if (orient) g.oriented else g
    val planX = if (orient) Planner.orientedCliquePlan(plan.k) else plan
    val useLgs = cfg.lgs && planX.hubRooted && graph.maxDegree <= cfg.lgsMaxDegree && planX.k >= 3
    (graph, planX, orient, useLgs)
  }

  /** Task list; vertex tasks encode (v << 32 | 0xffffffff). */
  private[engine] def buildTasks(graph: CSRGraph, planX: SearchPlan, cfg: DfsConfig,
                                 orient: Boolean, useLgs: Boolean): Array[Long] = {
    val vertexParallel = useLgs || !cfg.edgeParallel
    if (vertexParallel) {
      Array.tabulate(graph.n)(v => (v.toLong << 32) | 0xffffffffL)
    } else if (orient) {
      // every DAG arc is a task; symmetry is subsumed by orientation
      val out = new Array[Long](graph.numArcs)
      var o = 0
      var u = 0
      while (u < graph.n) {
        var i = graph.offsets(u)
        while (i < graph.offsets(u + 1)) { out(o) = (u.toLong << 32) | graph.nbrs(i).toLong; o += 1; i += 1 }
        u += 1
      }
      out
    } else {
      planX.rootEdgeCond match {
        case Some(dir) if cfg.edgelistReduction =>
          // opt J: one task per undirected edge, oriented to satisfy the
          // (v0, v1) symmetry condition up front
          graph.canonicalEdges.map { e =>
            val a = (e >>> 32); val b = e & 0xffffffffL
            if (dir) (a << 32) | b else (b << 32) | a
          }
        case _ =>
          // both directions; level-1 bounds filter on the fly
          val out = new Array[Long](graph.numArcs)
          var o = 0
          var u = 0
          while (u < graph.n) {
            var i = graph.offsets(u)
            while (i < graph.offsets(u + 1)) { out(o) = (u.toLong << 32) | graph.nbrs(i).toLong; o += 1; i += 1 }
            u += 1
          }
          out
      }
    }
  }

  private def runPartition(graph: CSRGraph, planX: SearchPlan, cfg: DfsConfig, useLgs: Boolean,
                           tasks: Iterator[Long]): PlanExecutor = {
    val ex = new PlanExecutor(graph, planX, cfg)
    tasks.foreach { t =>
      val v0 = (t >>> 32).toInt
      val v1 = (t & 0xffffffffL).toInt
      if (v1 == -1) { if (useLgs) ex.runLgsTask(v0) else ex.runVertexTask(v0) }
      else ex.runEdgeTask(v0, v1)
    }
    ex
  }

  def run(spark: SparkSession, g: CSRGraph, plan: SearchPlan, cfg: DfsConfig = DfsConfig()): Metrics = {
    val (graph, planX, orient, useLgs) = resolve(g, plan, cfg)
    val bc = spark.sparkContext.broadcast(graph)
    val tasks = buildTasks(graph, planX, cfg, orient, useLgs)
    // Deterministic driver-side shuffle: spreads hub-rooted (heavy) tasks
    // across partitions without paying a Spark shuffle — the single-node
    // stand-in for the chunked round-robin device scheduler (§7.1).
    shuffleInPlace(tasks, seed = 0x5eed)
    val parallelism = math.max(1, spark.sparkContext.defaultParallelism)
    val outs = spark.sparkContext.parallelize(tasks.toIndexedSeq, parallelism)
      .mapPartitions { it =>
        val ex = runPartition(bc.value, planX, cfg, useLgs, it)
        Iterator.single(TaskOut(ex.count, ex.wc.ops, ex.lvl, ex.tasksRun, ex.savedWork))
      }.collect()
    bc.destroy()
    val zero = Metrics(0, 0, new Array[Long](planX.k), 0, 0)
    val m = outs.foldLeft(zero)((acc, t) => acc.combine(Metrics(t.count, t.work, t.lvl, t.tasks, t.saved)))
    val l = m.levelNodes.clone(); l(0) = g.n.toLong
    m.copy(levelNodes = l)
  }

  private def shuffleInPlace(a: Array[Long], seed: Long): Unit = {
    val rnd = new java.util.Random(seed)
    var i = a.length - 1
    while (i > 0) {
      val j = rnd.nextInt(i + 1)
      val t = a(i); a(i) = a(j); a(j) = t
      i -= 1
    }
  }

  /** Per-task set-op work, indexed like the task array — the scheduler's
    * input (§7.1). Runs single-node on the driver for exact per-task
    * attribution (bench graphs are small).
    */
  def perTaskWork(g: CSRGraph, plan: SearchPlan, cfg: DfsConfig = DfsConfig()): Array[Long] = {
    val (graph, planX, orient, useLgs) = resolve(g, plan, cfg)
    val tasks = buildTasks(graph, planX, cfg, orient, useLgs)
    val ex = new PlanExecutor(graph, planX, cfg)
    val out = new Array[Long](tasks.length)
    var i = 0
    while (i < tasks.length) {
      val before = ex.wc.ops
      val t = tasks(i)
      val v0 = (t >>> 32).toInt; val v1 = (t & 0xffffffffL).toInt
      if (v1 == -1) { if (useLgs) ex.runLgsTask(v0) else ex.runVertexTask(v0) }
      else ex.runEdgeTask(v0, v1)
      out(i) = (ex.wc.ops - before) + 1 // +1: task launch floor
      i += 1
    }
    out
  }

  /** Convenience: local (non-Spark) run for tests and metric derivation. */
  def runLocal(g: CSRGraph, plan: SearchPlan, cfg: DfsConfig = DfsConfig()): Metrics = {
    val (graph, planX, orient, useLgs) = resolve(g, plan, cfg)
    val tasks = buildTasks(graph, planX, cfg, orient, useLgs)
    val ex = runPartition(graph, planX, cfg, useLgs, tasks.iterator)
    ex.metrics(g.n.toLong)
  }
}
