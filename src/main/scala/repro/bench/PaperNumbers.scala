package repro.bench

/** The paper's reported numbers (Tables 4–9), kept next to our measured
  * simulations so benches and EXPERIMENTS.md can diff the *shape*.
  */
object PaperNumbers {
  sealed trait Cell { def render: String }
  final case class Sec(v: Double) extends Cell { def render: String = f"$v%.4g" }
  case object OoM extends Cell { def render = "OoM" }
  case object TO extends Cell { def render = "TO" }

  type Table = Map[(String, String), Cell] // (system, column) -> value

  private def row(sys: String, cols: Seq[String], vals: Seq[Cell]): Table =
    cols.zip(vals).map { case (c, v) => (sys, c) -> v }.toMap

  private def s(xs: Double*): Seq[Cell] = xs.map(Sec)

  val tcGraphs = Seq("Lj", "Or", "Tw2", "Tw4", "Fr", "Uk")
  val table4: Table =
    row("G2Miner", tcGraphs, s(0.03, 0.14, 1.6, 5.1, 3.2, 7.5)) ++
    row("Pangolin", tcGraphs, s(0.06, 0.25, 3.0) ++ Seq(OoM, Sec(5.2), OoM)) ++
    row("PBE", tcGraphs, s(0.27, 1.12, 13.4, 53.5, 23.0, 55.3)) ++
    row("Peregrine", tcGraphs, s(1.63, 7.25, 112.1, 8492.4, 100.3, 3640.9)) ++
    row("GraphZero", tcGraphs, s(0.61, 2.22, 24.4, 1399.3, 49.0, 1041.3))

  val clCols = Seq("4CL/Lj", "4CL/Or", "4CL/Tw2", "4CL/Tw4", "4CL/Fr", "5CL/Lj", "5CL/Or", "5CL/Fr")
  val table5: Table =
    row("G2Miner", clCols, s(0.32, 0.54, 113.3, 362.9, 7.3, 3.2, 1.7, 13.1)) ++
    row("Pangolin", clCols, s(1.48, 4.04) ++ Seq.fill(6)(OoM)) ++
    row("PBE", clCols, s(3.90, 11.11, 3640.1) ++ Seq(TO) ++ s(117.8, 246.4, 99.2, 399.8)) ++
    row("Peregrine", clCols, s(15.90, 73.70, 39921.0) ++ Seq(TO) ++ s(397.3, 520.8, 782.1, 957.6)) ++
    row("GraphZero", clCols, s(3.48, 12.96, 2152.2, 20591.1, 177.7, 60.0, 48.3, 243.3))

  val slCols = Seq("dia/Lj", "dia/Or", "dia/Tw2", "dia/Tw4", "dia/Fr", "c4/Lj", "c4/Or", "c4/Fr")
  val table6: Table =
    row("G2Miner", slCols, s(0.29, 0.75, 26.8, 183.1, 12.8, 2.7, 33.7, 1291.2)) ++
    row("PBE", slCols, s(0.48, 1.71, 26.3, 102.0, 39.9, 17.3, 177.8, 5211.3)) ++
    row("Peregrine", slCols, s(5.38, 10.24, 553.6, 20898.4, 178.1, 144.4, 1867.2, 32276.8)) ++
    row("GraphZero", slCols, s(1.73, 7.27, 165.1, 7938.6, 136.4, 34.0, 345.5, 9251.5))

  val mcCols = Seq("3MC/Lj", "3MC/Or", "3MC/Tw2", "3MC/Tw4", "3MC/Fr", "4MC/Lj", "4MC/Or", "4MC/Fr")
  val table7: Table =
    row("G2Miner", mcCols, s(0.17, 0.97, 33.3, 1703.6, 22.0, 138.1, 2068.4, 15475.4)) ++
    row("Pangolin", mcCols, s(2.05, 22.62, 1165.5) ++ Seq.fill(5)(OoM)) ++
    row("Peregrine", mcCols, s(9.36, 19.46, 418.7, 27954.9, 367.9, 1435.4, 20219.1) ++ Seq(TO)) ++
    row("GraphZero", mcCols, s(1.50, 7.74, 276.5, 7439.4, 169.6, 3039.6, 16394.6) ++ Seq(TO))

  val fsmCols: Seq[String] =
    for { g <- Seq("Mi", "Pa", "Yo"); sig <- Seq(300, 500, 1000, 5000) } yield s"$g/$sig"
  val table8: Table =
    row("G2Miner", fsmCols, s(0.6, 0.4, 0.3, 0.1, 2.6, 2.6, 2.6, 1.7, 7.2, 6.0, 6.0, 8.7)) ++
    row("Pangolin", fsmCols, s(0.6, 0.5, 0.3, 0.2, 2.7, 2.7, 2.7, 1.7) ++ Seq.fill(4)(OoM)) ++
    row("Peregrine", fsmCols, s(4.4, 4.4, 4.2, 4.3, 94.2, 103.8, 118.4, 94.3, 59.3, 52.8, 69.9, 60.8)) ++
    row("DistGraph", fsmCols, s(56.1, 61.0, 57.6, 57.0, 13.2, 13.1, 13.0, 14.1) ++ Seq.fill(4)(OoM))

  val t9Cols = Seq("dia/Lj", "dia/Or", "dia/Tw2", "dia/Tw4", "dia/Fr",
    "3MC/Lj", "3MC/Or", "3MC/Tw2", "3MC/Tw4", "3MC/Fr", "4MC/Lj", "4MC/Or", "4MC/Fr")
  val table9: Table =
    row("G2Miner", t9Cols, s(0.09, 0.47, 9.9, 66.9, 10.4, 0.06, 0.27, 6.8, 21.4, 5.2, 2.6, 34.2, 1307.2)) ++
    row("Peregrine", t9Cols, s(2.20, 8.66, 245.8, 16312.6, 158.8, 2.51, 4.90, 116.0, 8447.4, 165.3, 163.6, 1701.4) ++ Seq(TO))
}
