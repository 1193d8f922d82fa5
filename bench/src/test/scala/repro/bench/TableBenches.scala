package repro.bench

import repro.SparkSpec

/** Full-scale reproduction benches, one suite per paper table. Each prints
  * the reproduced table (simulated seconds derived from measured work)
  * interleaved with the paper's numbers, and asserts the paper's *shape*:
  * which system wins, where the OoM cells fall, and rough magnitude
  * orderings. Copy the printed blocks into EXPERIMENTS.md.
  */
class Table4Bench extends SparkSpec {
  lazy val t: TableResult = Tables.table4(spark, Tables.benchLoader)

  test("Table 4 (TC) reproduces") {
    println(t.render)
    for (c <- t.columns; s <- t.systems if s != "G2Miner"; sec <- t.sim(s, c).seconds)
      assert(t.sim("G2Miner", c).seconds.get <= sec, s"G2Miner not fastest on $c vs $s")
  }

  test("Table 4 shape: GraphZero beats Peregrine, PBE slowest GPU") {
    for (c <- t.columns) {
      assert(t.sim("GraphZero", c).seconds.get < t.sim("Peregrine", c).seconds.get)
      for (sec <- t.sim("Pangolin", c).seconds)
        assert(sec < t.sim("PBE", c).seconds.get, s"Pangolin vs PBE on $c")
    }
  }

  test("Table 4 shape: graph difficulty ordering holds for G2Miner") {
    def g2(c: String) = t.sim("G2Miner", c).seconds.get
    assert(g2("Lj") < g2("Tw2") && g2("Or") < g2("Tw2"))
    assert(g2("Tw2") < g2("Tw4"))
  }
}

class Table5Bench extends SparkSpec {
  lazy val t: TableResult = Tables.table5(spark, Tables.benchLoader)

  test("Table 5 (k-CL) reproduces") {
    println(t.render)
    for (c <- t.columns; s <- t.systems if s != "G2Miner"; sec <- t.sim(s, c).seconds)
      assert(t.sim("G2Miner", c).seconds.get <= sec, s"$c vs $s")
  }

  test("Table 5 shape: Pangolin OoM cells match the paper") {
    // paper: Pangolin only survives 4CL on Lj and Or
    for (c <- t.columns) {
      val paperOoM = PaperNumbers.table5(("Pangolin", c)) == PaperNumbers.OoM
      assert(t.sim("Pangolin", c).isOoM == paperOoM, s"OoM mismatch on $c")
    }
  }

  test("Table 5 shape: GPU advantage holds for 5-cliques") {
    for (c <- t.columns if c.startsWith("5CL"))
      assert(t.sim("GraphZero", c).seconds.get / t.sim("G2Miner", c).seconds.get > 5)
  }
}

class Table6Bench extends SparkSpec {
  lazy val t: TableResult = Tables.table6(spark, Tables.benchLoader)

  test("Table 6 (SL) reproduces") {
    println(t.render)
    for (c <- t.columns; s <- t.systems if s != "G2Miner"; sec <- t.sim(s, c).seconds)
      assert(t.sim("G2Miner", c).seconds.get <= sec * 2.5, s"$c vs $s") // PBE ties G2Miner on some diamond cells in the paper
  }

  test("Table 6 shape: 4-cycle is the hardest SL workload per graph") {
    def g2(c: String) = t.sim("G2Miner", c).seconds.get
    assert(g2("c4/Fr") > g2("dia/Fr"))
    assert(g2("c4/Or") > g2("dia/Or"))
  }

  test("Table 6 shape: CPU systems trail the GPU systems") {
    for (c <- t.columns)
      assert(t.sim("Peregrine", c).seconds.get > t.sim("G2Miner", c).seconds.get * 5)
  }
}

class Table7Bench extends SparkSpec {
  lazy val t: TableResult = Tables.table7(spark, Tables.benchLoader)

  test("Table 7 (k-MC) reproduces") {
    println(t.render)
    for (c <- t.columns; s <- t.systems if s != "G2Miner"; sec <- t.sim(s, c).seconds)
      assert(t.sim("G2Miner", c).seconds.get <= sec, s"$c vs $s")
  }

  test("Table 7 shape: Pangolin OoM cells match the paper") {
    for (c <- t.columns) {
      val paperOoM = PaperNumbers.table7(("Pangolin", c)) == PaperNumbers.OoM
      assert(t.sim("Pangolin", c).isOoM == paperOoM, s"OoM mismatch on $c")
    }
  }

  test("Table 7 shape: 4-motif costs more than 3-motif per graph") {
    def g2(c: String) = t.sim("G2Miner", c).seconds.get
    for (g <- Seq("Lj", "Or", "Fr")) assert(g2(s"4MC/$g") > g2(s"3MC/$g"))
  }
}

class Table8Bench extends SparkSpec {
  lazy val t: TableResult = Tables.table8(spark, Tables.benchLoader)

  test("Table 8 (3-FSM) reproduces") {
    println(t.render)
    for (c <- t.columns; sec <- t.sim("Peregrine", c).seconds)
      assert(t.sim("G2Miner", c).seconds.get < sec, s"$c")
  }

  test("Table 8 shape: Pangolin and DistGraph OoM on Yo, survive Mi/Pa") {
    for (c <- t.columns) {
      val paperOoMPangolin = PaperNumbers.table8(("Pangolin", c)) == PaperNumbers.OoM
      val paperOoMDist = PaperNumbers.table8(("DistGraph", c)) == PaperNumbers.OoM
      assert(t.sim("Pangolin", c).isOoM == paperOoMPangolin, s"Pangolin OoM mismatch on $c")
      assert(t.sim("DistGraph", c).isOoM == paperOoMDist, s"DistGraph OoM mismatch on $c")
    }
  }

  test("Table 8 shape: G2Miner competitive with Pangolin where both run") {
    for (c <- t.columns; sec <- t.sim("Pangolin", c).seconds)
      assert(t.sim("G2Miner", c).seconds.get <= sec)
  }
}

class Table9Bench extends SparkSpec {
  lazy val t: TableResult = Tables.table9(spark, Tables.benchLoader)

  test("Table 9 (counting-only) reproduces") {
    println(t.render)
    for (c <- t.columns)
      assert(t.sim("G2Miner", c).seconds.get < t.sim("Peregrine", c).seconds.get)
  }

  test("Table 9 shape: counting-only beats listing (vs Table 6/7 G2Miner)") {
    val t6 = Tables.table6(spark, Tables.benchLoader)
    for (g <- Seq("Lj", "Or", "Tw2", "Tw4", "Fr"))
      assert(t.sim("G2Miner", s"dia/$g").seconds.get <=
        t6.sim("G2Miner", s"dia/$g").seconds.get)
  }
}

class MultiGpuBench extends SparkSpec {
  test("multi-GPU scaling: chunked RR near-linear to 8 devices, even-split is not") {
    val (rows, rendered) = Tables.multiGpuScaling(spark, Tables.benchLoader)
    println(rendered)
    val chunk8 = rows.find(r => r.n == 8 && r.policy == "chunked-rr").get.speedup
    val even8 = rows.find(r => r.n == 8 && r.policy == "even-split").get.speedup
    assert(chunk8 > 6.0, s"chunked-rr 8-GPU speedup $chunk8")
    assert(even8 < chunk8)
    // monotone scaling for chunked RR
    val cs = (1 to 8).map(n => rows.find(r => r.n == n && r.policy == "chunked-rr").get.speedup)
    assert(cs.zip(cs.tail).forall { case (a, b) => b >= a * 0.98 })
  }
}
