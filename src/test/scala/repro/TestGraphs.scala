package repro

import repro.graph.{CSRGraph, SynthGraphs}

/** Shared small graph fixtures for cross-checking engines against the
  * naive matcher and the DuckDB oracle. All deterministic.
  */
object TestGraphs {
  lazy val k7: CSRGraph = SynthGraphs.completeGraph(7)
  lazy val cyc9: CSRGraph = SynthGraphs.cycle(9)
  lazy val star8: CSRGraph = SynthGraphs.starGraph(8)
  lazy val grid34: CSRGraph = SynthGraphs.grid(3, 4)
  lazy val plSkew: CSRGraph = SynthGraphs.powerLaw(60, 150, 0.8, seed = 1)
  lazy val plMild: CSRGraph = SynthGraphs.powerLaw(100, 300, 0.5, seed = 2)
  lazy val plDense: CSRGraph = SynthGraphs.powerLaw(40, 220, 0.6, seed = 3)
  lazy val labeled: CSRGraph = SynthGraphs.powerLaw(80, 200, 0.6, seed = 4, numLabels = 4)
  lazy val labeledTiny: CSRGraph = SynthGraphs.powerLaw(18, 30, 0.5, seed = 5, numLabels = 3)

  /** Fixtures for engine cross-checks (name, graph). */
  def forMatching: Seq[(String, CSRGraph)] = Seq(
    "K7" -> k7,
    "cycle9" -> cyc9,
    "star8" -> star8,
    "grid3x4" -> grid34,
    "pl-skew" -> plSkew,
    "pl-mild" -> plMild,
    "pl-dense" -> plDense,
  )
}
