package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class SetOpsSpec extends AnyFunSuite {

  private def randSorted(rng: Random, max: Int = 60): Array[Int] =
    (0 until rng.nextInt(40)).map(_ => rng.nextInt(max)).distinct.sorted.toArray

  for (seed <- 1 to 12) {
    val rng = new Random(seed)
    val a = randSorted(rng); val b = randSorted(rng); val c = randSorted(rng)

    test(s"intersect agrees with Set.intersect (seed=$seed)") {
      assert(SetOps.intersect(a, b).toSet == a.toSet.intersect(b.toSet))
      val r = SetOps.intersect(a, b)
      assert(r.toSeq == r.toSeq.distinct.sorted)
    }

    test(s"union agrees with Set.union (seed=$seed)") {
      assert(SetOps.union(a, b).toSet == a.toSet.union(b.toSet))
      val r = SetOps.union(a, b)
      assert(r.toSeq == r.toSeq.distinct.sorted)
    }

    test(s"diff agrees with Set.diff (seed=$seed)") {
      assert(SetOps.diff(a, b).toSet == a.toSet.diff(b.toSet))
      assert(SetOps.diff(b, a).toSet == b.toSet.diff(a.toSet))
    }

    test(s"contains agrees with Set.contains (seed=$seed)") {
      (0 to 60).foreach(x => assert(SetOps.contains(a, x) == a.toSet.contains(x)))
    }

    test(s"subsetOf agrees with Set.subsetOf (seed=$seed)") {
      assert(SetOps.subsetOf(a, b) == a.toSet.subsetOf(b.toSet))
      assert(SetOps.subsetOf(SetOps.intersect(a, b), a))
      assert(SetOps.subsetOf(a, SetOps.union(a, b)))
    }

    test(s"intersectAll and coverSize (seed=$seed)") {
      assert(SetOps.intersectAll(Seq(a, b, c)).toSet ==
        a.toSet.intersect(b.toSet).intersect(c.toSet))
      assert(SetOps.coverSize(Seq(a, b, c)) == (a.toSet ++ b.toSet ++ c.toSet).size)
    }
  }

  test("empty-array identities") {
    val e = Array.empty[Int]
    val a = Array(1, 3, 5)
    assert(SetOps.intersect(e, a).isEmpty)
    assert(SetOps.union(e, a).toSeq == a.toSeq)
    assert(SetOps.diff(a, e).toSeq == a.toSeq)
    assert(SetOps.diff(e, a).isEmpty)
    assert(SetOps.subsetOf(e, a))
    assert(!SetOps.subsetOf(a, e))
    assert(SetOps.coverSize(Seq(e)) == 0)
  }
}
