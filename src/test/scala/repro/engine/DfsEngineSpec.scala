package repro.engine

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.graph.CSRGraph
import repro.pattern.{Pattern, Patterns}
import repro.plan.Planner

/** The core correctness matrix: every pattern × every fixture × both
  * induced modes, DFS engine (all config variants) vs the pattern-oblivious
  * naive matcher. Runs locally (no Spark) — SparkDfsSpec covers the
  * distributed path.
  */
class DfsEngineSpec extends AnyFunSuite {

  private val patterns: Seq[(String, Pattern)] =
    (Patterns.motifs(3) ++ Patterns.motifs(4)).map(p => Patterns.nameOf(p) -> p) ++
      Seq("5-clique" -> Patterns.clique(5), "5-path" -> Patterns.path(5), "4-star" -> Patterns.star(5))

  // ---- exhaustive cross-check vs naive matcher -----------------------
  for {
    (gName, g) <- TestGraphs.forMatching
    (pName, p) <- patterns
    induced <- Seq(false, true)
  } test(s"DFS == naive: $pName on $gName induced=$induced") {
    val expected = NaiveMatcher.countUnique(g, p, induced)
    val plan = Planner.plan(p, induced)
    val m = DfsEngine.runLocal(g, plan, DfsConfig())
    assert(m.count == expected, s"plan=$plan")
  }

  // ---- configuration invariance ---------------------------------------
  private def allConfigs: Seq[(String, DfsConfig)] = Seq(
    "default" -> DfsConfig(),
    "no-orientation" -> DfsConfig(orientation = false),
    "vertex-parallel" -> DfsConfig(edgeParallel = false),
    "no-reduction" -> DfsConfig(edgelistReduction = false),
    "no-buffering" -> DfsConfig(buffering = false),
    "lgs" -> DfsConfig(lgs = true),
    "lgs-no-orient" -> DfsConfig(lgs = true, orientation = false),
    "everything-off" -> DfsConfig(edgeParallel = false, orientation = false,
      edgelistReduction = false, buffering = false),
  )

  for {
    (cfgName, cfg) <- allConfigs
    (pName, p) <- Seq("triangle" -> Patterns.triangle, "diamond" -> Patterns.diamond,
      "4-clique" -> Patterns.clique(4), "4-cycle" -> Patterns.cycle4,
      "3-star" -> Patterns.star(4))
  } test(s"config invariance: $cfgName for $pName on pl-mild") {
    val g = TestGraphs.plMild
    val induced = false
    val expected = NaiveMatcher.countUnique(g, p, induced)
    assert(DfsEngine.runLocal(g, Planner.plan(p, induced), cfg).count == expected)
  }

  for ((cfgName, cfg) <- allConfigs) test(s"config invariance (induced wedge): $cfgName") {
    val g = TestGraphs.plSkew
    val p = Patterns.wedge
    val expected = NaiveMatcher.countUnique(g, p, induced = true)
    assert(DfsEngine.runLocal(g, Planner.plan(p, induced = true), cfg).count == expected)
  }

  test("LGS equals global search for all hub 4-motifs on pl-dense") {
    val g = TestGraphs.plDense
    for (p <- Patterns.motifs(4).filter(_.isHubPattern); induced <- Seq(true, false)) {
      val plan = Planner.plan(p, induced)
      val a = DfsEngine.runLocal(g, plan, DfsConfig(lgs = true))
      val b = DfsEngine.runLocal(g, plan, DfsConfig(lgs = false))
      assert(a.count == b.count, s"${Patterns.nameOf(p)} induced=$induced")
    }
  }

  test("LGS respects the input-aware degree threshold") {
    val g = TestGraphs.plDense
    val plan = Planner.plan(Patterns.clique(4), induced = false)
    // threshold 0 forbids LGS — must silently fall back and stay correct
    val m = DfsEngine.runLocal(g, plan, DfsConfig(lgs = true, lgsMaxDegree = 0))
    assert(m.count == NaiveMatcher.countUnique(g, Patterns.clique(4), induced = false))
  }

  // ---- counting-only fusion --------------------------------------------
  test("fused diamond counting equals listing count on every fixture") {
    val plan = Planner.plan(Patterns.diamond, induced = false, countingOnly = true)
    assert(plan.fusedCount)
    for ((name, g) <- TestGraphs.forMatching) {
      val fused = DfsEngine.runLocal(g, plan, DfsConfig(countingOnly = true))
      val listed = NaiveMatcher.countUnique(g, Patterns.diamond, induced = false)
      assert(fused.count == listed, name)
    }
  }

  test("fused counting does less set-op work than listing on dense input") {
    val g = TestGraphs.plDense
    val fusedPlan = Planner.plan(Patterns.diamond, induced = false, countingOnly = true)
    val listPlan = Planner.plan(Patterns.diamond, induced = false)
    val fused = DfsEngine.runLocal(g, fusedPlan, DfsConfig(countingOnly = true))
    val listed = DfsEngine.runLocal(g, listPlan, DfsConfig())
    assert(fused.setOpWork <= listed.setOpWork)
  }

  // ---- metrics semantics ------------------------------------------------
  test("levelNodes(last) equals the match count") {
    val g = TestGraphs.plMild
    for (p <- Seq(Patterns.triangle, Patterns.diamond, Patterns.cycle4)) {
      val m = DfsEngine.runLocal(g, Planner.plan(p, induced = false), DfsConfig(orientation = false))
      assert(m.levelNodes.last == m.count)
    }
  }

  test("levelNodes(1) equals edge tasks after symmetry reduction") {
    val g = TestGraphs.plMild
    val m = DfsEngine.runLocal(g, Planner.plan(Patterns.triangle, induced = false),
      DfsConfig(orientation = false))
    assert(m.levelNodes(1) == g.numEdges) // v1 < v0: one per undirected edge
  }

  test("orientation reduces clique work on skewed inputs (within early-exit noise)") {
    // With bounded merges the unoriented search also exits early, so at
    // tiny scale the two are close; orientation must never be much worse
    // and wins clearly once hubs appear (bench-scale graphs).
    val g = repro.graph.SynthGraphs.powerLaw(800, 8000, 0.9, seed = 33)
    val plan = Planner.plan(Patterns.clique(4), induced = false)
    val withO = DfsEngine.runLocal(g, plan, DfsConfig())
    val withoutO = DfsEngine.runLocal(g, plan, DfsConfig(orientation = false))
    assert(withO.count == withoutO.count)
    assert(withO.setOpWork <= withoutO.setOpWork * 2)
  }

  test("buffering reports saved work on diamond") {
    val g = TestGraphs.plDense
    val plan = Planner.plan(Patterns.diamond, induced = false)
    val m = DfsEngine.runLocal(g, plan, DfsConfig())
    assert(m.bufferSavedWork > 0)
    val noBuf = DfsEngine.runLocal(g, plan, DfsConfig(buffering = false))
    assert(noBuf.bufferSavedWork == 0)
    assert(noBuf.setOpWork >= m.setOpWork)
  }

  test("edgelist reduction halves tasks when a root condition exists") {
    val g = TestGraphs.plMild
    val plan = Planner.plan(Patterns.cycle4, induced = false)
    val reduced = DfsEngine.runLocal(g, plan, DfsConfig(orientation = false))
    val full = DfsEngine.runLocal(g, plan, DfsConfig(orientation = false, edgelistReduction = false))
    if (plan.rootEdgeCond.isDefined) assert(reduced.tasks * 2 == full.tasks)
    assert(reduced.count == full.count)
  }

  test("perTaskWork sums near the run total and covers all tasks") {
    val g = TestGraphs.plMild
    val plan = Planner.plan(Patterns.triangle, induced = false)
    val w = DfsEngine.perTaskWork(g, plan, DfsConfig())
    val m = DfsEngine.runLocal(g, plan, DfsConfig())
    assert(w.length == m.tasks)
    assert(w.sum >= m.setOpWork) // +1 launch floor per task
    assert(w.forall(_ >= 1))
  }

  // ---- known closed-form counts -----------------------------------------
  test("K7 clique counts match binomials") {
    for (k <- 3 to 5) {
      val m = DfsEngine.runLocal(TestGraphs.k7, Planner.plan(Patterns.clique(k), induced = false), DfsConfig())
      val expected = (1 to k).map(i => (7 - i + 1).toLong).product / (1 to k).map(_.toLong).product
      assert(m.count == expected, s"k=$k")
    }
  }

  test("cycle9 has 9 induced wedges and no triangles") {
    val w = DfsEngine.runLocal(TestGraphs.cyc9, Planner.plan(Patterns.wedge, induced = true), DfsConfig())
    val t = DfsEngine.runLocal(TestGraphs.cyc9, Planner.plan(Patterns.triangle, induced = false), DfsConfig())
    assert(w.count == 9 && t.count == 0)
  }

  test("star8 has C(8,2) wedges and C(8,3) claws") {
    val w = DfsEngine.runLocal(TestGraphs.star8, Planner.plan(Patterns.wedge, induced = true), DfsConfig())
    val c = DfsEngine.runLocal(TestGraphs.star8, Planner.plan(Patterns.star(4), induced = true), DfsConfig())
    assert(w.count == 28 && c.count == 56)
  }

  test("grid 3x4 4-cycle count is the number of unit squares") {
    val m = DfsEngine.runLocal(TestGraphs.grid34, Planner.plan(Patterns.cycle4, induced = false), DfsConfig())
    assert(m.count == 6)
  }

  test("8-clique listing runs on K10 (large-pattern support, Fig. 11)") {
    val k10 = repro.graph.SynthGraphs.completeGraph(10)
    val m = DfsEngine.runLocal(k10, Planner.plan(Patterns.clique(8), induced = false), DfsConfig())
    assert(m.count == 45) // C(10,8)
  }

  test("TPC-H bipartite graph has no triangles (SynthData substrate)") {
    val spark = repro.SparkSpec.shared
    val g = repro.graph.SynthGraphs.tpchBipartite(spark, sf = 0.001)
    val m = DfsEngine.runLocal(g, Planner.plan(Patterns.triangle, induced = false), DfsConfig())
    assert(m.count == 0)
    val c4 = DfsEngine.runLocal(g, Planner.plan(Patterns.cycle4, induced = false), DfsConfig())
    assert(c4.count == NaiveMatcher.countUnique(g, Patterns.cycle4, induced = false))
  }
}
