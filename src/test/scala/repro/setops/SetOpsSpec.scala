package repro.setops

import org.scalatest.funsuite.AnyFunSuite

class SetOpsSpec extends AnyFunSuite {

  private val rnd = new scala.util.Random(42)
  private def randomSortedSet(maxLen: Int = 40, maxVal: Int = 300): Array[Int] =
    Array.fill(rnd.nextInt(maxLen))(rnd.nextInt(maxVal)).distinct.sorted

  private def run2(a: Array[Int], b: Array[Int])(
      f: (Array[Int], Int, Int, Array[Int], Int, Int, Array[Int], WorkCounter) => Int): Array[Int] = {
    val out = new Array[Int](math.max(a.length, b.length) + 1)
    val wc = new WorkCounter
    val len = f(a, 0, a.length, b, 0, b.length, out, wc)
    out.take(len)
  }

  test("intersect matches Set semantics (200 random cases)") {
    for (_ <- 1 to 200) {
      val a = randomSortedSet(); val b = randomSortedSet()
      val got = run2(a, b)(SetOps.intersect(_, _, _, _, _, _, _, _))
      assert(got.toSeq == a.toSet.intersect(b.toSet).toSeq.sorted, s"a=${a.toSeq} b=${b.toSeq}")
    }
  }

  test("difference matches Set semantics (200 random cases)") {
    for (_ <- 1 to 200) {
      val a = randomSortedSet(); val b = randomSortedSet()
      val got = run2(a, b)(SetOps.difference(_, _, _, _, _, _, _, _))
      assert(got.toSeq == a.toSet.diff(b.toSet).toSeq.sorted, s"a=${a.toSeq} b=${b.toSeq}")
    }
  }

  test("countBelow matches filter (200 random cases)") {
    for (_ <- 1 to 200) {
      val a = randomSortedSet()
      val bound = rnd.nextInt(320) - 10
      val wc = new WorkCounter
      assert(SetOps.countBelow(a, 0, a.length, bound, wc) == a.count(_ < bound))
    }
  }

  test("contains matches Set membership (200 random cases)") {
    for (_ <- 1 to 200) {
      val a = randomSortedSet()
      val x = rnd.nextInt(320) - 10
      val wc = new WorkCounter
      assert(SetOps.contains(a, 0, a.length, x, wc) == a.contains(x))
    }
  }

  test("offset views are honored") {
    val a = Array(1, 3, 5, 7, 9, 11)
    val b = Array(0, 5, 7, 100)
    val out = new Array[Int](6)
    val wc = new WorkCounter
    // view of a = [5,7,9]
    val len = SetOps.intersect(a, 2, 3, b, 0, b.length, out, wc)
    assert(out.take(len).toSeq == Seq(5, 7))
    assert(SetOps.countBelow(a, 2, 3, 9, wc) == 2)
    assert(SetOps.contains(a, 2, 3, 9, wc))
    assert(!SetOps.contains(a, 2, 3, 3, wc))
  }

  test("in-place chaining is safe (out eq a at offset 0)") {
    val buf = Array(2, 4, 6, 8, 10, 0, 0)
    val b = Array(4, 8, 12)
    val wc = new WorkCounter
    val len = SetOps.intersect(buf, 0, 5, b, 0, 3, buf, wc)
    assert(buf.take(len).toSeq == Seq(4, 8))
    val buf2 = Array(1, 2, 3, 4, 5)
    val len2 = SetOps.difference(buf2, 0, 5, Array(2, 4), 0, 2, buf2, wc)
    assert(buf2.take(len2).toSeq == Seq(1, 3, 5))
  }

  test("in-place chaining matches fresh-buffer results (100 random cases)") {
    for (_ <- 1 to 100) {
      val a = randomSortedSet(); val b = randomSortedSet()
      val fresh = run2(a, b)(SetOps.intersect(_, _, _, _, _, _, _, _))
      val buf = java.util.Arrays.copyOf(a, math.max(1, a.length))
      val wc = new WorkCounter
      val len = SetOps.intersect(buf, 0, a.length, b, 0, b.length, buf, wc)
      assert(buf.take(len).toSeq == fresh.toSeq)
    }
  }

  test("bounded intersect keeps only elements below ub (200 random cases)") {
    for (_ <- 1 to 200) {
      val a = randomSortedSet(); val b = randomSortedSet()
      val ub = rnd.nextInt(320) - 10
      val out = new Array[Int](math.max(a.length, b.length) + 1)
      val wcB = new WorkCounter; val wcF = new WorkCounter
      val len = SetOps.intersect(a, 0, a.length, b, 0, b.length, out, wcB, ub)
      assert(out.take(len).toSeq == a.toSet.intersect(b.toSet).filter(_ < ub).toSeq.sorted)
      SetOps.intersect(a, 0, a.length, b, 0, b.length, out, wcF)
      assert(wcB.ops <= wcF.ops) // early exit never costs more
    }
  }

  test("bounded difference keeps only elements below ub (200 random cases)") {
    for (_ <- 1 to 200) {
      val a = randomSortedSet(); val b = randomSortedSet()
      val ub = rnd.nextInt(320) - 10
      val out = new Array[Int](a.length + 1)
      val wc = new WorkCounter
      val len = SetOps.difference(a, 0, a.length, b, 0, b.length, out, wc, ub)
      assert(out.take(len).toSeq == a.toSet.diff(b.toSet).filter(_ < ub).toSeq.sorted)
    }
  }

  test("work counters are populated") {
    val wc = new WorkCounter
    val out = new Array[Int](4)
    SetOps.intersect(Array(1, 2, 3), 0, 3, Array(2, 3, 4), 0, 3, out, wc)
    assert(wc.ops > 0)
  }

  test("empty inputs") {
    val wc = new WorkCounter
    val out = new Array[Int](1)
    assert(SetOps.intersect(Array.empty[Int], 0, 0, Array(1), 0, 1, out, wc) == 0)
    assert(SetOps.difference(Array.empty[Int], 0, 0, Array(1), 0, 1, out, wc) == 0)
    assert(SetOps.countBelow(Array.empty[Int], 0, 0, 5, wc) == 0)
    assert(!SetOps.contains(Array.empty[Int], 0, 0, 5, wc))
  }
}
