package repro.sched

/** Multi-GPU task scheduling (§7.1), simulated over *measured* per-task
  * work. A task is one edge (or vertex) subtree of the DFS search; the
  * engines report each task's exact set-op work, so policy quality — the
  * paper's Fig. 8/9/10 story — is a pure function of the assignment.
  */
object Scheduler {

  sealed trait Policy { def name: String }

  /** Policy 1: Ω split into n consecutive equal ranges. No overhead,
    * terrible balance on skewed graphs (hubs cluster in id ranges).
    */
  case object EvenSplit extends Policy { val name = "even-split" }

  /** Policy 2: task j goes to queue j mod n. Fine-grained; per-task copy
    * overhead.
    */
  case object RoundRobin extends Policy { val name = "round-robin" }

  /** Policy 3: chunks of `chunk` tasks assigned round-robin — the paper's
    * default with c = α × totalWarps, α = 2.
    */
  final case class ChunkedRoundRobin(chunk: Int) extends Policy { val name = s"chunked-rr(c=$chunk)" }

  /** Device index for every task. */
  def assign(m: Int, n: Int, policy: Policy): Array[Int] = {
    val out = new Array[Int](m)
    policy match {
      case EvenSplit =>
        var i = 0
        while (i < m) { out(i) = math.min(n - 1, (i.toLong * n / math.max(1, m)).toInt); i += 1 }
      case RoundRobin =>
        var i = 0
        while (i < m) { out(i) = i % n; i += 1 }
      case ChunkedRoundRobin(c) =>
        require(c >= 1)
        var i = 0
        while (i < m) { out(i) = (i / c) % n; i += 1 }
    }
    out
  }

  /** Paper's chunk size: α × total warps (α = 2), clamped so that every
    * device still receives several chunks when the task list is small
    * relative to the warp count (the paper's graphs guarantee m >> warps;
    * scaled-down inputs do not).
    */
  def paperChunkSize(m: Int, warpsPerDevice: Int, alpha: Int = 2, devices: Int = 8): Int =
    math.max(1, math.min(alpha * warpsPerDevice, m / (devices * 4)))

  final case class SimOutcome(
      policy: String,
      n: Int,
      perDeviceWork: Vector[Long],
      perDeviceSeconds: Vector[Double],
      makespanSeconds: Double,
  )

  /** Simulate an n-device run: per-device time = assigned work / device
    * throughput + scheduling overhead (copy cost per chunk boundary for
    * the round-robin family; overlapped as in §7.1 so only a small
    * per-task constant remains).
    */
  def simulate(work: Array[Long], n: Int, policy: Policy,
               deviceThroughput: Double, copyNsPerTask: Double = 2.0): SimOutcome = {
    val asg = assign(work.length, n, policy)
    val acc = new Array[Long](n)
    var i = 0
    while (i < work.length) { acc(asg(i)) += work(i); i += 1 }
    val copySecs = policy match {
      case EvenSplit => 0.0
      case _         => work.length.toDouble * copyNsPerTask * 1e-9 / n
    }
    val secs = acc.map(w => w.toDouble / deviceThroughput + copySecs).toVector
    SimOutcome(policy.name, n, acc.toVector, secs, secs.max)
  }
}
