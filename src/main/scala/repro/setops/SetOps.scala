package repro.setops

/** Set primitives over sorted Int array *views* — the analog of the paper's
  * GPU device-function library (§6). A view is (array, offset, length), so
  * neighbor lists can be used in place inside the CSR arrays. Every
  * primitive reports the number of element steps it performed through a
  * [[WorkCounter]]; those counts feed the cost model that converts measured
  * work into simulated device time.
  *
  * Outputs are always written from index 0 of `out`. In-place chaining
  * (`out eq a` with offset 0) is safe for intersect/difference because the
  * write cursor never passes the read cursor.
  */
final class WorkCounter extends Serializable {
  var ops: Long = 0L
  @inline def add(n: Long): Unit = ops += n
}

object SetOps {

  /** out = A ∩ B by linear merge, keeping only elements < `ub` — the merge
    * stops as soon as A passes the bound (symmetry-break early exit on
    * sorted lists). Pass `ub = Int.MaxValue` for an unbounded intersect.
    * Returns |out|.
    */
  def intersect(a: Array[Int], aOff: Int, aLen: Int,
                b: Array[Int], bOff: Int, bLen: Int,
                out: Array[Int], wc: WorkCounter, ub: Int = Int.MaxValue): Int = {
    var i = 0; var j = 0; var o = 0
    while (i < aLen && j < bLen) {
      val x = a(aOff + i)
      if (x >= ub) { wc.add((i + j).toLong); return o }
      val y = b(bOff + j)
      if (x == y) { out(o) = x; o += 1; i += 1; j += 1 }
      else if (x < y) i += 1
      else j += 1
    }
    wc.add((i + j).toLong)
    o
  }

  /** out = A − B by linear merge, keeping only elements < `ub`; returns |out|. */
  def difference(a: Array[Int], aOff: Int, aLen: Int,
                 b: Array[Int], bOff: Int, bLen: Int,
                 out: Array[Int], wc: WorkCounter, ub: Int = Int.MaxValue): Int = {
    var i = 0; var j = 0; var o = 0
    while (i < aLen) {
      val x = a(aOff + i)
      if (x >= ub) { wc.add(i.toLong + j.toLong); return o }
      while (j < bLen && b(bOff + j) < x) j += 1
      if (j >= bLen || b(bOff + j) != x) { out(o) = x; o += 1 }
      i += 1
    }
    wc.add(aLen.toLong + math.min(bLen, aLen).toLong)
    o
  }

  /** Number of elements of the view strictly below `bound` — the paper's
    * "set bounding" primitive, via binary search (early exit on sorted
    * lists after symmetry breaking).
    */
  def countBelow(a: Array[Int], off: Int, len: Int, bound: Int, wc: WorkCounter): Int = {
    var lo = 0; var hi = len
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (a(off + mid) < bound) lo = mid + 1 else hi = mid
      wc.add(1)
    }
    lo
  }

  /** Membership test via binary search over the view. */
  def contains(a: Array[Int], off: Int, len: Int, x: Int, wc: WorkCounter): Boolean = {
    var lo = 0; var hi = len - 1
    while (lo <= hi) {
      val mid = (lo + hi) >>> 1
      wc.add(1)
      val v = a(off + mid)
      if (v == x) return true
      else if (v < x) lo = mid + 1
      else hi = mid - 1
    }
    false
  }
}
