package repro.plan

import org.scalatest.funsuite.AnyFunSuite
import repro.pattern.Patterns

class PlannerSpec extends AnyFunSuite {

  test("every level of every motif plan has a backward connection") {
    for (k <- Seq(3, 4); p <- Patterns.motifs(k); induced <- Seq(true, false)) {
      val plan = Planner.plan(p, induced)
      assert(plan.levels.forall(_.conn.nonEmpty))
      assert(plan.levels.length == p.n - 1)
    }
  }

  test("induced plans carry anti-connectivity, non-induced do not") {
    val pInd = Planner.plan(Patterns.cycle4, induced = true)
    val pNon = Planner.plan(Patterns.cycle4, induced = false)
    assert(pInd.levels.exists(_.anti.nonEmpty))
    assert(pNon.levels.forall(_.anti.isEmpty))
  }

  test("diamond plan reuses the triangle buffer at the last level") {
    val plan = Planner.plan(Patterns.diamond, induced = false)
    // positions 2 and 3 both intersect N(v0) ∩ N(v1)
    assert(plan.levels(1).conn == Vector(0, 1))
    assert(plan.levels(2).conn == Vector(0, 1))
    assert(plan.bufferReuse(2) == Some(2))
  }

  test("diamond fuses under counting-only") {
    val plan = Planner.plan(Patterns.diamond, induced = false, countingOnly = true)
    assert(plan.fusedCount)
  }

  test("4-cycle does not fuse under counting-only (paper §5.4)") {
    val plan = Planner.plan(Patterns.cycle4, induced = false, countingOnly = true)
    assert(!plan.fusedCount)
  }

  test("clique plans do not fuse (chain bounds at every level)") {
    val plan = Planner.plan(Patterns.clique(4), induced = false, countingOnly = true)
    assert(!plan.fusedCount)
  }

  test("oriented clique plan has no bounds and full connectivity") {
    val plan = Planner.orientedCliquePlan(4)
    assert(plan.levels.forall(l => l.uppers.isEmpty && l.lowers.isEmpty))
    assert(plan.levels(1).conn == Vector(0, 1))
    assert(plan.levels(2).conn == Vector(0, 1, 2))
    assert(plan.conds.isEmpty)
  }

  test("rootEdgeCond present for symmetric-rooted patterns") {
    assert(Planner.plan(Patterns.triangle, induced = false).rootEdgeCond.isDefined)
    assert(Planner.plan(Patterns.diamond, induced = false).rootEdgeCond.isDefined)
  }

  test("hubRooted for cliques, diamond, star; not for 4-cycle/4-path") {
    assert(Planner.plan(Patterns.clique(4), induced = false).hubRooted)
    assert(Planner.plan(Patterns.diamond, induced = false).hubRooted)
    assert(Planner.plan(Patterns.star(4), induced = true).hubRooted)
    assert(!Planner.plan(Patterns.cycle4, induced = false).hubRooted)
    assert(!Planner.plan(Patterns.path(4), induced = false).hubRooted)
  }

  test("bounds reference earlier positions only") {
    for (p <- Patterns.motifs(4); induced <- Seq(true, false)) {
      val plan = Planner.plan(p, induced)
      plan.levels.zipWithIndex.foreach { case (l, li) =>
        val i = li + 1
        assert((l.uppers ++ l.lowers ++ l.conn ++ l.anti).forall(_ < i))
      }
    }
  }

  test("buffer reuse never references a level whose inputs changed") {
    for (p <- Patterns.motifs(4) ++ Patterns.motifs(5); induced <- Seq(true, false)) {
      val plan = Planner.plan(p, induced)
      plan.bufferReuse.zipWithIndex.foreach {
        case (Some(j), li) =>
          val i = li + 1
          assert(j < i)
          assert(plan.levels(li).maxRef < j)
          assert(plan.levels(j - 1).sameSets(plan.levels(li)))
        case _ => ()
      }
    }
  }
}
