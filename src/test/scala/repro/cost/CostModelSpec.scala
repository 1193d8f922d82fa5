package repro.cost

import org.scalatest.funsuite.AnyFunSuite
import repro.cost.CostModel._

class CostModelSpec extends AnyFunSuite {

  test("more work means more time") {
    val a = simulate(Workload(1000000, 0, 0), G2MinerGpu).seconds.get
    val b = simulate(Workload(2000000, 0, 0), G2MinerGpu).seconds.get
    assert(b > a)
  }

  test("equal work: GPU beats CPU by the architecture ratio (~15x)") {
    val w = Workload(1000000000L, 0, 0)
    val gpu = simulate(w, G2MinerGpu).seconds.get
    val cpu = simulate(w, GraphZeroCpu).seconds.get
    assert(cpu / gpu > 10 && cpu / gpu < 25, s"ratio=${cpu / gpu}")
  }

  test("Peregrine is slower than GraphZero at equal work (engine overhead)") {
    val w = Workload(1000000L, 0, 0)
    assert(simulate(w, PeregrineCpu).seconds.get > simulate(w, GraphZeroCpu).seconds.get)
  }

  test("Pangolin pays memory traffic for materialization") {
    val noRows = simulate(Workload(1000000, 0, 0), PangolinGpu).seconds.get
    val rows = simulate(Workload(1000000, 10000000, 0), PangolinGpu).seconds.get
    assert(rows > noRows)
  }

  test("OoM when peak bytes exceed the device budget") {
    val w = Workload(1000, 1000, peakRowBytes = V100.memBudgetBytes + 1)
    assert(simulate(w, PangolinGpu).isOoM)
    assert(!simulate(w, G2MinerGpu).isOoM) // non-materializing systems never OoM
  }

  test("PBE pays communication") {
    val base = simulate(Workload(1000000, 1000, 0, commRows = 0), PbeGpu).seconds.get
    val comm = simulate(Workload(1000000, 1000, 0, commRows = 100000000L), PbeGpu).seconds.get
    assert(comm > base)
  }

  test("bfsRows sums materialized levels (excluding the vertex set)") {
    assert(bfsRows(Array(100L, 1000L, 10000L)) == 11000L)
  }

  test("OomModel: orientation halves the base and skew dominates for Tw-like stats") {
    import repro.graph.DataGraphs
    val lvl = Array(100L, 1000L, 10000L, 500L)
    val tw4 = OomModel.pangolinBytes(DataGraphs.tw4.paper, oriented = true, lvl, 1000L)
    val fr = OomModel.pangolinBytes(DataGraphs.fr.paper, oriented = true, lvl, 1000L)
    // Fr has more edges but tiny max degree: the skew term must invert the
    // base ordering for TC-like workloads (paper footnote 3)
    val tw4NoInter = OomModel.pangolinBytes(DataGraphs.tw4.paper, oriented = true, Array(1L, 1L, 1L), 1000L)
    val frNoInter = OomModel.pangolinBytes(DataGraphs.fr.paper, oriented = true, Array(1L, 1L, 1L), 1000L)
    assert(tw4NoInter > frNoInter)
    assert(tw4 > 0 && fr > 0)
  }

  test("OomModel: unoriented base doubles") {
    import repro.graph.DataGraphs
    val a = OomModel.pangolinBytes(DataGraphs.lj.paper, oriented = true, Array(1L, 1L, 1L), 1000L)
    val b = OomModel.pangolinBytes(DataGraphs.lj.paper, oriented = false, Array(1L, 1L, 1L), 1000L)
    assert(b > a)
  }

  test("OomModel: fsmBytes scales with replication and degree") {
    import repro.graph.DataGraphs
    val a = OomModel.fsmBytes(DataGraphs.yo.paper, 1.0)
    val b = OomModel.fsmBytes(DataGraphs.yo.paper, 6.0)
    assert(math.abs(b - 6.0 * a) / b < 1e-12)
  }

  test("render formats OoM and seconds") {
    assert(Sim(None).render == "OoM")
    assert(Sim(Some(1.5)).render.nonEmpty)
  }

  test("fixed overhead is additive") {
    val sysA = GraphZeroCpu
    val sysB = GraphZeroCpu.copy(fixedOverheadSec = 1.0)
    val w = Workload(1000, 0, 0)
    val delta = simulate(w, sysB).seconds.get - simulate(w, sysA).seconds.get
    assert(math.abs(delta - 1.0) < 1e-9)
  }
}
