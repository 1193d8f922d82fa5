package repro.bench

import org.apache.spark.sql.SparkSession
import repro.cost.CostModel
import repro.cost.CostModel._
import repro.engine.{DfsConfig, DfsEngine, Metrics}
import repro.fsm.Fsm
import repro.graph.{CSRGraph, DataGraphs}
import repro.mc.MotifFormulas
import repro.pattern.{Pattern, Patterns}
import repro.plan.Planner
import repro.sched.Scheduler

/** One reproduced table: simulated seconds per (system, column) plus the
  * exact match counts the engines produced, printed next to the paper's
  * reported numbers.
  */
final case class TableResult(
    title: String,
    columns: Seq[String],
    systems: Seq[String],
    sims: Map[(String, String), Sim],
    counts: Map[String, Long],
    paper: PaperNumbers.Table,
) {
  def sim(sys: String, col: String): Sim = sims((sys, col))

  def render: String = {
    val sb = new StringBuilder
    val w = 11
    def pad(s: String) = s.reverse.padTo(w, ' ').reverse
    sb.append(s"== $title ==\n")
    sb.append(pad("system") + columns.map(pad).mkString + "\n")
    for (sys <- systems) {
      sb.append(pad(sys) + columns.map(c => pad(sims((sys, c)).render)).mkString + "  [sim]\n")
      sb.append(pad("") + columns.map { c =>
        pad(paper.get((sys, c)).map(_.render).getOrElse("-"))
      }.mkString + "  [paper]\n")
    }
    if (counts.nonEmpty)
      sb.append("counts: " + counts.toSeq.sortBy(_._1).map { case (k, v) => s"$k=$v" }.mkString(", ") + "\n")
    sb.result()
  }
}

/** Builds every evaluation table of the paper from measured engine metrics
  * plus the cost model. Graphs are supplied by a loader so tests can run
  * the same code at tiny scale.
  */
object Tables {

  type Loader = DataGraphs.Spec => CSRGraph

  val benchLoader: Loader = DataGraphs.build
  val tinyLoader: Loader = DataGraphs.tiny

  // Table runs are deterministic in (table, loader): memoize so suites that
  // cross-reference tables (e.g. Table 9 vs Table 6) pay once.
  private val tableCache =
    scala.collection.concurrent.TrieMap.empty[(String, Int), TableResult]
  private def cached(name: String, load: Loader)(body: => TableResult): TableResult =
    tableCache.getOrElseUpdate((name, System.identityHashCode(load)), body)

  /** Metrics for one single-pattern workload under every system. */
  final case class SystemSims(
      count: Long,
      g2: Sim, pangolin: Sim, pbe: Sim, peregrine: Sim, graphZero: Sim,
  )

  /** Run a single explicit-pattern workload and derive all five systems'
    * simulated times from two engine configurations:
    * (1) G²Miner: all optimizations (orientation for cliques, edgelist
    *     reduction, buffering, LGS for hub patterns);
    * (2) CPU/BFS baselines: no orientation, no LGS — the search-plan tree
    *     the pattern-aware CPU systems and BFS GPU systems all explore.
    */
  def singlePattern(spark: SparkSession, spec: DataGraphs.Spec, g: CSRGraph, p: Pattern,
                    induced: Boolean, countingOnly: Boolean = false): SystemSims = {
    val plan = Planner.plan(p, induced, countingOnly)
    val mG2 = DfsEngine.run(spark, g, plan, DfsConfig(lgs = true, countingOnly = countingOnly))
    val mBase = DfsEngine.run(spark, g, Planner.plan(p, induced),
      DfsConfig(orientation = false, lgs = false))
    // Pangolin scan volume: same tree, whole-list scans (no buffering, no
    // early exit) — its extend-then-filter execution model.
    val mPang = DfsEngine.run(spark, g, Planner.plan(p, induced),
      DfsConfig(buffering = false, boundedMerges = false, lgs = false))
    require(countingOnly || mG2.count == mBase.count,
      s"engine disagreement: ${mG2.count} vs ${mBase.count} for $p")
    derive(spec, g, oriented = p.isClique && !induced, mG2, mBase, mPang.setOpWork)
  }

  /** Per-candidate isomorphism/dedup checking overhead of Pangolin's
    * extend-then-filter execution, on top of its raw scan volume.
    */
  private val PangolinIsoFactor = 1.5

  private[bench] def derive(spec: DataGraphs.Spec, g: CSRGraph, oriented: Boolean,
                            mG2: Metrics, mBase: Metrics, pangScanWork: Long): SystemSims = {
    // Counting workloads never materialize the leaf level, so memory
    // traffic and cross-partition communication are charged only for the
    // intermediate subgraph lists.
    val rowsOrient = CostModel.bfsRows(mG2.levelNodes.init)
    val rowsBase = CostModel.bfsRows(mBase.levelNodes.init)
    // Pangolin's OoM verdict is evaluated at paper scale: paper graph stats
    // plus our measured per-edge intermediate rates (see OomModel).
    val pangolinPeak = OomModel.pangolinBytes(spec.paper, oriented, mG2.levelNodes, g.numEdges).toLong
    val g2 = simulate(Workload(mG2.setOpWork, 0, 0), G2MinerGpu)
    // Pangolin: BFS over the same (orientation-enabled) tree; candidate
    // generation scans whole neighbor lists plus per-candidate checks.
    val pangolin = simulate(
      Workload((pangScanWork * PangolinIsoFactor).toLong, rowsOrient, pangolinPeak), PangolinGpu)
    // PBE: BFS with reuse, no orientation; partitioning trades OoM for
    // cross-partition communication (modeled as extra element traffic per
    // materialized row).
    val pbe = simulate(
      Workload(mBase.setOpWork + 16L * rowsBase, rowsBase, 0, commRows = rowsBase), PbeGpu)
    // Peregrine runs the same plan (incl. buffering); its gap to GraphZero
    // is generic-engine overhead, captured by the efficiency profile.
    val peregrine = simulate(Workload(mBase.setOpWork, 0, 0), PeregrineCpu)
    val graphZero = simulate(Workload(mBase.setOpWork, 0, 0), GraphZeroCpu)
    SystemSims(mG2.count, g2, pangolin, pbe, peregrine, graphZero)
  }

  // ------------------------------------------------------------------
  // Table 4: triangle counting
  // ------------------------------------------------------------------
  def table4(spark: SparkSession, load: Loader): TableResult = cached("table4", load) {
    val systems = Seq("G2Miner", "Pangolin", "PBE", "Peregrine", "GraphZero")
    val specs = Seq(DataGraphs.lj, DataGraphs.or, DataGraphs.tw2, DataGraphs.tw4, DataGraphs.fr, DataGraphs.uk)
    var sims = Map.empty[(String, String), Sim]
    var counts = Map.empty[String, Long]
    for (s <- specs) {
      val r = singlePattern(spark, s, load(s), Patterns.triangle, induced = false)
      counts += s.name -> r.count
      sims ++= Map(("G2Miner", s.name) -> r.g2, ("Pangolin", s.name) -> r.pangolin,
        ("PBE", s.name) -> r.pbe, ("Peregrine", s.name) -> r.peregrine, ("GraphZero", s.name) -> r.graphZero)
    }
    TableResult("Table 4: TC running time (sim-sec)", specs.map(_.name), systems, sims, counts, PaperNumbers.table4)
  }

  // ------------------------------------------------------------------
  // Table 5: k-clique listing
  // ------------------------------------------------------------------
  def table5(spark: SparkSession, load: Loader): TableResult = cached("table5", load) {
    val systems = Seq("G2Miner", "Pangolin", "PBE", "Peregrine", "GraphZero")
    val work4 = Seq(DataGraphs.lj, DataGraphs.or, DataGraphs.tw2, DataGraphs.tw4, DataGraphs.fr).map(s => (s, 4))
    val work5 = Seq(DataGraphs.lj, DataGraphs.or, DataGraphs.fr).map(s => (s, 5))
    var sims = Map.empty[(String, String), Sim]
    var counts = Map.empty[String, Long]
    for ((s, k) <- work4 ++ work5) {
      val colName = s"${k}CL/${s.name}"
      val r = singlePattern(spark, s, load(s), Patterns.clique(k), induced = false)
      counts += colName -> r.count
      sims ++= Map(("G2Miner", colName) -> r.g2, ("Pangolin", colName) -> r.pangolin,
        ("PBE", colName) -> r.pbe, ("Peregrine", colName) -> r.peregrine, ("GraphZero", colName) -> r.graphZero)
    }
    TableResult("Table 5: k-CL running time (sim-sec)", PaperNumbers.clCols, systems, sims, counts, PaperNumbers.table5)
  }

  // ------------------------------------------------------------------
  // Table 6: subgraph listing (edge-induced diamond, 4-cycle)
  // ------------------------------------------------------------------
  def table6(spark: SparkSession, load: Loader): TableResult = cached("table6", load) {
    val systems = Seq("G2Miner", "PBE", "Peregrine", "GraphZero")
    val diamondW = Seq(DataGraphs.lj, DataGraphs.or, DataGraphs.tw2, DataGraphs.tw4, DataGraphs.fr)
      .map(s => (s, Patterns.diamond, "dia"))
    val cycleW = Seq(DataGraphs.lj, DataGraphs.or, DataGraphs.fr).map(s => (s, Patterns.cycle4, "c4"))
    var sims = Map.empty[(String, String), Sim]
    var counts = Map.empty[String, Long]
    for ((s, p, tag) <- diamondW ++ cycleW) {
      val colName = s"$tag/${s.name}"
      val r = singlePattern(spark, s, load(s), p, induced = false)
      counts += colName -> r.count
      sims ++= Map(("G2Miner", colName) -> r.g2, ("PBE", colName) -> r.pbe,
        ("Peregrine", colName) -> r.peregrine, ("GraphZero", colName) -> r.graphZero)
    }
    TableResult("Table 6: SL running time (sim-sec)", PaperNumbers.slCols, systems, sims, counts, PaperNumbers.table6)
  }

  // ------------------------------------------------------------------
  // Table 7: k-motif counting (vertex-induced, multi-pattern)
  // ------------------------------------------------------------------
  def table7(spark: SparkSession, load: Loader): TableResult = cached("table7", load) {
    val systems = Seq("G2Miner", "Pangolin", "Peregrine", "GraphZero")
    val work3 = Seq(DataGraphs.lj, DataGraphs.or, DataGraphs.tw2, DataGraphs.tw4, DataGraphs.fr).map(s => (s, 3))
    val work4 = Seq(DataGraphs.lj, DataGraphs.or, DataGraphs.fr).map(s => (s, 4))
    var sims = Map.empty[(String, String), Sim]
    var counts = Map.empty[String, Long]
    for ((s, k) <- work3 ++ work4) {
      val colName = s"${k}MC/${s.name}"
      val g = load(s)
      val r = motifWorkload(spark, s, g, k)
      counts += colName -> r.count
      sims ++= Map(("G2Miner", colName) -> r.g2, ("Pangolin", colName) -> r.pangolin,
        ("Peregrine", colName) -> r.peregrine, ("GraphZero", colName) -> r.graphZero)
    }
    TableResult("Table 7: k-MC running time (sim-sec)", PaperNumbers.mcCols, systems, sims, counts, PaperNumbers.table7)
  }

  /** Multi-pattern workload: per-motif plans summed; G²Miner additionally
    * shares the common triangle prefix across the triangle-rooted 4-motifs
    * (kernel fission, optimization I); Peregrine mines each pattern
    * separately (no sharing) — identical work here since we sum per-pattern.
    */
  def motifWorkload(spark: SparkSession, spec: DataGraphs.Spec, g: CSRGraph, k: Int): SystemSims = {
    val motifs = Patterns.motifs(k)
    val runs = motifs.map { p =>
      // cliques are planned non-induced (equivalent counts, enables orientation)
      if (p.isClique) (p, singleMotifMetrics(spark, g, p, induced = false))
      else (p, singleMotifMetrics(spark, g, p, induced = true))
    }
    val total = runs.map(_._2._1).reduce(_ combine _)
    val base = runs.map(_._2._2).reduce(_ combine _)
    val pangScan = runs.map(_._2._3).sum
    // kernel fission sharing: the triangle-prefix group (tailed-tri,
    // diamond, 4-clique) enumerates triangles once instead of 3 times
    val sharing =
      if (k == 4) {
        val triPlan = Planner.plan(Patterns.triangle, induced = false)
        val tri = DfsEngine.runLocal(g, triPlan, DfsConfig(orientation = false))
        2L * tri.setOpWork
      } else 0L
    val g2Metrics = total.copy(setOpWork = math.max(0L, total.setOpWork - sharing))
    derive(spec, g, oriented = false, g2Metrics, base, pangScan)
  }

  private def singleMotifMetrics(spark: SparkSession, g: CSRGraph, p: Pattern,
                                 induced: Boolean): (Metrics, Metrics, Long) = {
    val plan = Planner.plan(p, induced)
    val mG2 = DfsEngine.run(spark, g, plan, DfsConfig(lgs = true))
    val mBase = DfsEngine.run(spark, g, plan, DfsConfig(orientation = false, lgs = false))
    val mPang = DfsEngine.run(spark, g, plan, DfsConfig(buffering = false, boundedMerges = false, lgs = false))
    require(mG2.count == mBase.count, s"motif disagreement for $p: ${mG2.count} vs ${mBase.count}")
    (mG2, mBase, mPang.setOpWork)
  }

  // ------------------------------------------------------------------
  // Table 8: 3-FSM
  // ------------------------------------------------------------------
  /** Scale the paper's support thresholds by our graph-size substitution
    * (MNI support scales with vertex count).
    */
  def scaledSigma(spec: DataGraphs.Spec, paperSigma: Int, load: Loader): Long = {
    val ours = load(spec).n.toDouble
    // floor of 4: a threshold of 2 at tiny scale disables pruning entirely,
    // which no paper configuration corresponds to
    math.max(4L, math.round(paperSigma * ours / spec.paper.v))
  }

  def table8(spark: SparkSession, load: Loader): TableResult = cached("table8", load) {
    val systems = Seq("G2Miner", "Pangolin", "Peregrine", "DistGraph")
    val sigmas = Seq(300, 500, 1000, 5000)
    var sims = Map.empty[(String, String), Sim]
    var counts = Map.empty[String, Long]
    for (spec <- Seq(DataGraphs.mi, DataGraphs.pa, DataGraphs.yo)) {
      val g = load(spec)
      // Mine once at the loosest threshold; by MNI anti-monotonicity every
      // tighter column is a support filter over the same exact result.
      val scaled = sigmas.map(sig => sig -> scaledSigma(spec, sig, load)).toMap
      val res = Fsm.run(spark, g, Fsm.FsmConfig(minSupport = scaled.values.min))
      val m = res.metrics
      val embRows = m.levelEmbeddings.sum
      val supportWork = embRows * 4L // automorphism-expanded aggregation
      val baseWork = m.extensionWork + supportWork
      // Paper-scale footprint: level-2 extension candidates dominate and
      // are σ-independent (OomModel.fsmBytes).
      val fullPeak = OomModel.fsmBytes(spec.paper, replication = 1.0).toLong
      for (sig <- sigmas) {
        val colName = s"${spec.name}/$sig"
        val freq = res.allSupports.filter(_._2 >= scaled(sig))
        counts += colName -> freq.size.toLong
        // tighter σ prunes the pattern space and with it part of the work
        val workFrac = math.max(0.35,
          (freq.size + 1).toDouble / (res.allSupports.size + 1))
        val work = (baseWork * workFrac).toLong
        // G²Miner: bounded BFS (opt M, peak = one block) + label pruning (opt N)
        sims += ("G2Miner", colName) -> simulate(
          Workload(work, embRows, 0), G2MinerGpu.copy(materializes = true))
        // Pangolin: full subgraph lists, no bounded blocks
        sims += ("Pangolin", colName) -> simulate(
          Workload(work, embRows, fullPeak), PangolinGpu)
        // Peregrine: pattern-at-a-time on CPU — each pattern re-explores
        // its own 1..k-1-edge prefixes instead of sharing them (≈ ×2 work)
        val patFactor = 2.0
        sims += ("Peregrine", colName) -> simulate(
          Workload((work * patFactor).toLong, 0, 0), PeregrineCpu)
        // DistGraph: distributed CPU; replicated embeddings (×6) + partition
        // comm + fixed startup that dominates small graphs (the Mico column)
        sims += ("DistGraph", colName) -> simulate(
          Workload(work, embRows * 4, OomModel.fsmBytes(spec.paper, replication = 6.0).toLong,
            commRows = embRows * 4),
          DistGraphCpu.copy(fixedOverheadSec = 1.2e-4 * math.sqrt(g.n.toDouble)))
      }
    }
    TableResult("Table 8: 3-FSM running time (sim-sec)", PaperNumbers.fsmCols, systems, sims, counts, PaperNumbers.table8)
  }

  // ------------------------------------------------------------------
  // Table 9: counting-only pruning (G²Miner vs Peregrine, both enabled)
  // ------------------------------------------------------------------
  def table9(spark: SparkSession, load: Loader): TableResult = cached("table9", load) {
    val systems = Seq("G2Miner", "Peregrine")
    var sims = Map.empty[(String, String), Sim]
    var counts = Map.empty[String, Long]
    // diamond: fused C(n,2) counting (Algorithm 3)
    for (s <- Seq(DataGraphs.lj, DataGraphs.or, DataGraphs.tw2, DataGraphs.tw4, DataGraphs.fr)) {
      val colName = s"dia/${s.name}"
      val g = load(s)
      val plan = Planner.plan(Patterns.diamond, induced = false, countingOnly = true)
      require(plan.fusedCount, "diamond plan must fuse under counting-only")
      val m = DfsEngine.run(spark, g, plan, DfsConfig(countingOnly = true))
      counts += colName -> m.count
      sims += ("G2Miner", colName) -> simulate(Workload(m.setOpWork, 0, 0), G2MinerGpu)
      sims += ("Peregrine", colName) -> simulate(
        Workload(m.setOpWork + m.bufferSavedWork, 0, 0), PeregrineCpu)
    }
    // 3-motif / 4-motif: formula-based counting (pattern decomposition)
    for ((s, k) <- Seq(DataGraphs.lj, DataGraphs.or, DataGraphs.tw2, DataGraphs.tw4, DataGraphs.fr).map((_, 3)) ++
                   Seq(DataGraphs.lj, DataGraphs.or, DataGraphs.fr).map((_, 4))) {
      val colName = s"${k}MC/${s.name}"
      val g = load(s)
      val fr = if (k == 3) MotifFormulas.threeMotifs(g) else MotifFormulas.fourMotifs(spark, g)
      counts += colName -> fr.induced.map(_._2).sum
      sims += ("G2Miner", colName) -> simulate(Workload(fr.work, 0, 0), G2MinerGpu)
      sims += ("Peregrine", colName) -> simulate(Workload(fr.work, 0, 0), PeregrineCpu)
    }
    TableResult("Table 9: counting-only pruning (sim-sec)", PaperNumbers.t9Cols, systems, sims, counts, PaperNumbers.table9)
  }

  // ------------------------------------------------------------------
  // Multi-GPU scalability (Fig. 9/10 headline claim, emitted as a table)
  // ------------------------------------------------------------------
  final case class ScalingRow(policy: String, n: Int, makespan: Double, speedup: Double)

  def multiGpuScaling(spark: SparkSession, load: Loader): (Vector[ScalingRow], String) = {
    // workload: 3-MC on Tw2 (the paper's Fig. 8/9 case)
    val g = load(DataGraphs.tw2)
    val work = Patterns.motifs(3).map { p =>
      DfsEngine.perTaskWork(g, Planner.plan(p, induced = true), DfsConfig(orientation = false))
    }.reduce { (a, b) => a.zip(b).map { case (x, y) => x + y } }
    val thr = G2MinerGpu.device.elemOpsPerSec * G2MinerGpu.efficiency
    val warps = 512 // simulated resident warps per device (adaptive buffering)
    val rows = Vector.newBuilder[ScalingRow]
    for (n <- 1 to 8; policy <- Seq[Scheduler.Policy](
           Scheduler.EvenSplit,
           Scheduler.ChunkedRoundRobin(Scheduler.paperChunkSize(work.length, warps)))) {
      val out = Scheduler.simulate(work, n, policy, thr)
      rows += ScalingRow(if (policy == Scheduler.EvenSplit) "even-split" else "chunked-rr",
        n, out.makespanSeconds, 0.0)
    }
    val rs = rows.result()
    val base = rs.filter(_.n == 1).map(r => r.policy -> r.makespan).toMap
    val withSpeedup = rs.map(r => r.copy(speedup = base(r.policy) / r.makespan))
    val sb = new StringBuilder
    sb.append("== Multi-GPU scaling: 3-MC on Tw2 (speedup vs 1 GPU) ==\n")
    sb.append("n        even-split   chunked-rr\n")
    for (n <- 1 to 8) {
      val e = withSpeedup.find(r => r.n == n && r.policy == "even-split").get
      val c = withSpeedup.find(r => r.n == n && r.policy == "chunked-rr").get
      sb.append(f"$n%-8d ${e.speedup}%10.2fx ${c.speedup}%10.2fx\n")
    }
    (withSpeedup, sb.result())
  }
}
