package repro.pattern

/** The pattern analyzer (§4.2): chooses a matching order with a cost model
  * and generates a symmetry order (partial order among data vertices) that
  * breaks all automorphisms.
  *
  * A symmetry condition `(a, b)` means: the data vertex matched at search
  * position `a` must have a smaller id than the one matched at position `b`
  * (`v_a < v_b`). The generated condition set is *verified* at construction
  * time: over all rank assignments of distinct ids to positions, each
  * automorphism orbit must contain exactly one assignment satisfying every
  * condition — the paper's completeness + uniqueness guarantee.
  */
final case class SearchOrder(
    pattern: Pattern,          // original pattern
    order: Vector[Int],        // position i matches pattern vertex order(i)
    posPattern: Pattern,       // pattern re-indexed into position space
    conds: Vector[(Int, Int)], // (a, b): v_a < v_b, in position space
)

object Analyzer {

  /** Connected matching orders: every position (after the first) is
    * adjacent to some earlier position, so each DFS level has at least one
    * neighbor list to intersect.
    */
  def connectedOrders(p: Pattern): Iterator[Vector[Int]] =
    (0 until p.n).toVector.permutations.filter { ord =>
      (1 until p.n).forall(i => (0 until i).exists(j => p.isEdge(ord(i), ord(j))))
    }

  /** GraphZero-style cost model: estimate the expected number of search-tree
    * nodes per level given a generic power-law input (average degree `d`,
    * intersection selectivity `q`, difference retention `r`), and sum the
    * per-level costs. Lower is better. Constraints (backward edges) early
    * in the order shrink the frontier fastest — the model rewards that.
    */
  def orderCost(p: Pattern, ord: Vector[Int], induced: Boolean,
                d: Double = 16.0, q: Double = 0.15, r: Double = 0.8): Double = {
    var frontier = 1.0
    var cost = 0.0
    for (i <- 1 until p.n) {
      val conn = (0 until i).count(j => p.isEdge(ord(i), ord(j)))
      val anti = if (induced) (0 until i).count(j => !p.isEdge(ord(i), ord(j))) else 0
      val candidates = d * math.pow(q, (conn - 1).toDouble) * math.pow(r, anti.toDouble)
      cost += frontier * (conn + anti) * d // set-op cost at this level
      frontier *= candidates
    }
    cost + frontier
  }

  /** Pick the best matching order. Cliques short-circuit to the identity
    * order (all orders are equivalent by symmetry). Deterministic
    * tie-breaking on the order itself.
    */
  def chooseOrder(p: Pattern, induced: Boolean): Vector[Int] = {
    if (p.isClique) return (0 until p.n).toVector
    // Prefer a hub root if one exists (enables local-graph search, §5.4).
    val all = connectedOrders(p).toVector
    val hubs = p.hubVertices.toSet
    val pool = if (hubs.nonEmpty) {
      val hubFirst = all.filter(o => hubs.contains(o.head))
      if (hubFirst.nonEmpty) hubFirst else all
    } else all
    pool.minBy(o => (orderCost(p, o, induced), o.mkString(",")))
  }

  /** Automorphisms of the pattern expressed in *position* space. */
  private def positionAutomorphisms(pos: Pattern): Vector[Vector[Int]] =
    pos.automorphisms

  /** All rank assignments (position -> relative id rank) for orbit checks. */
  private def rankPerms(k: Int): Vector[Vector[Int]] =
    (0 until k).toVector.permutations.toVector

  private def satisfies(rank: Vector[Int], conds: Seq[(Int, Int)]): Boolean =
    conds.forall { case (a, b) => rank(a) < rank(b) }

  /** Orbits of rank assignments under the automorphism group: two
    * assignments describe the same data subgraph iff one is the other
    * composed with an automorphism (`rank2 = rank1 ∘ π`).
    */
  private def orbits(k: Int, auts: Vector[Vector[Int]]): Vector[Vector[Vector[Int]]] = {
    val all = rankPerms(k)
    val seen = scala.collection.mutable.HashSet.empty[Vector[Int]]
    val out = Vector.newBuilder[Vector[Vector[Int]]]
    for (r <- all if !seen.contains(r)) {
      val orb = auts.map(pi => pi.map(r)).distinct
      orb.foreach(seen += _)
      out += orb
    }
    out.result()
  }

  /** Check the paper's uniqueness+completeness invariant: each orbit keeps
    * exactly one representative under `conds`.
    */
  def condsValid(pos: Pattern, conds: Seq[(Int, Int)]): Boolean = {
    val auts = positionAutomorphisms(pos)
    orbits(pos.n, auts).forall(_.count(satisfies(_, conds)) == 1)
  }

  /** Generate symmetry conditions for the given order.
    *
    * Cliques get the total chain `v_{i+1} < v_i` (the classical total
    * order). Otherwise we use the lex-min construction (GraphZero [73]):
    * for every non-identity automorphism σ, add `v_a < v_{σ(a)}` where `a`
    * is σ's first non-fixed position. A rank assignment satisfies all
    * those conditions iff it is lexicographically smaller than each of its
    * automorphic images — i.e. iff it is the unique lex-min of its orbit,
    * which gives exactly the paper's completeness + uniqueness guarantee.
    * Redundant conditions are then dropped while validity (brute-force
    * checked) is preserved.
    */
  def symmetryConds(pos: Pattern): Vector[(Int, Int)] = {
    val k = pos.n
    if (pos.isClique && pos.labels.isEmpty) {
      val chain = (1 until k).map(i => (i, i - 1)).toVector // v_i < v_{i-1}
      require(condsValid(pos, chain), "clique chain conditions failed validation")
      return chain
    }
    val id = (0 until k).toVector
    val auts = positionAutomorphisms(pos).filterNot(_ == id)
    if (auts.isEmpty) return Vector.empty
    var conds = auts.map { sigma =>
      val a = (0 until k).find(i => sigma(i) != i).get
      (a, sigma(a))
    }.distinct.sortBy { case (a, b) => (a, b) }
    require(condsValid(pos, conds), s"lex-min conditions invalid for $pos: $conds")
    // minimize: drop any condition implied by the rest
    for (c <- conds) {
      val without = conds.filterNot(_ == c)
      if (condsValid(pos, without)) conds = without
    }
    conds
  }

  /** Full analysis: order + verified symmetry conditions. */
  def analyze(p: Pattern, induced: Boolean): SearchOrder = {
    val ord = chooseOrder(p, induced)
    val pos = p.permuted(ord)
    SearchOrder(p, ord, pos, symmetryConds(pos))
  }
}
