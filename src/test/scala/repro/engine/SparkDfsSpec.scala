package repro.engine

import repro.{SparkSpec, TestGraphs}
import repro.pattern.Patterns
import repro.plan.Planner

/** Distributed path of the DFS engine: Dataset task distribution over the
  * broadcast CSR must agree with the local interpreter and the naive
  * matcher.
  */
class SparkDfsSpec extends SparkSpec {

  for {
    (pName, p, induced) <- Seq(
      ("triangle", Patterns.triangle, false),
      ("diamond", Patterns.diamond, false),
      ("4-cycle", Patterns.cycle4, false),
      ("4-clique", Patterns.clique(4), false),
      ("wedge-induced", Patterns.wedge, true),
      ("3-star-induced", Patterns.star(4), true),
      ("tailed-tri-induced", Patterns.tailedTriangle, true),
    )
  } test(s"Spark run == local run == naive: $pName") {
    val g = TestGraphs.plMild
    val plan = Planner.plan(p, induced)
    val dist = DfsEngine.run(spark, g, plan, DfsConfig())
    val local = DfsEngine.runLocal(g, plan, DfsConfig())
    assert(dist.count == local.count)
    assert(dist.count == NaiveMatcher.countUnique(g, p, induced))
    assert(dist.setOpWork == local.setOpWork)
    assert(dist.levelNodes.toSeq == local.levelNodes.toSeq)
    assert(dist.tasks == local.tasks)
  }

  test("Spark run with LGS agrees on hub patterns") {
    val g = TestGraphs.plDense
    val plan = Planner.plan(Patterns.clique(4), induced = false)
    val m = DfsEngine.run(spark, g, plan, DfsConfig(lgs = true))
    assert(m.count == NaiveMatcher.countUnique(g, Patterns.clique(4), induced = false))
  }

  test("Spark run on a DataGraphs tiny analog") {
    val g = repro.graph.DataGraphs.tiny(repro.graph.DataGraphs.lj)
    val m = DfsEngine.run(spark, g, Planner.plan(Patterns.triangle, induced = false), DfsConfig())
    assert(m.count == NaiveMatcher.countUnique(g, Patterns.triangle, induced = false))
  }

  test("metrics combine is associative enough: partition count independence") {
    val g = TestGraphs.plSkew
    val plan = Planner.plan(Patterns.diamond, induced = false)
    val a = DfsEngine.run(spark, g, plan, DfsConfig())
    val b = DfsEngine.runLocal(g, plan, DfsConfig())
    assert(a.count == b.count && a.setOpWork == b.setOpWork && a.bufferSavedWork == b.bufferSavedWork)
  }
}
