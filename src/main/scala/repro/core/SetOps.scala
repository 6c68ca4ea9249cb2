package repro.core

/** Set algebra over sorted, distinct Int arrays — the vertex-set currency of
  * the DCCS algorithms (layer cores, candidates, potential sets).
  */
object SetOps {

  /** Intersection of two sorted distinct arrays. */
  def intersect(a: Array[Int], b: Array[Int]): Array[Int] = {
    val out = new Array[Int](math.min(a.length, b.length))
    var i = 0; var j = 0; var n = 0
    while (i < a.length && j < b.length) {
      if (a(i) < b(j)) i += 1
      else if (a(i) > b(j)) j += 1
      else { out(n) = a(i); n += 1; i += 1; j += 1 }
    }
    java.util.Arrays.copyOf(out, n)
  }

  /** Intersection of several sorted distinct arrays. */
  def intersectAll(sets: Seq[Array[Int]]): Array[Int] =
    sets.reduceLeft(intersect)

  /** Union of two sorted distinct arrays. */
  def union(a: Array[Int], b: Array[Int]): Array[Int] = {
    val out = new Array[Int](a.length + b.length)
    var i = 0; var j = 0; var n = 0
    while (i < a.length && j < b.length) {
      if (a(i) < b(j)) { out(n) = a(i); i += 1 }
      else if (a(i) > b(j)) { out(n) = b(j); j += 1 }
      else { out(n) = a(i); i += 1; j += 1 }
      n += 1
    }
    while (i < a.length) { out(n) = a(i); i += 1; n += 1 }
    while (j < b.length) { out(n) = b(j); j += 1; n += 1 }
    java.util.Arrays.copyOf(out, n)
  }

  /** `a \ b` for sorted distinct arrays. */
  def diff(a: Array[Int], b: Array[Int]): Array[Int] = {
    val out = new Array[Int](a.length)
    var i = 0; var j = 0; var n = 0
    while (i < a.length) {
      while (j < b.length && b(j) < a(i)) j += 1
      if (j >= b.length || b(j) != a(i)) { out(n) = a(i); n += 1 }
      i += 1
    }
    java.util.Arrays.copyOf(out, n)
  }

  /** Membership test in a sorted distinct array. */
  def contains(a: Array[Int], x: Int): Boolean =
    java.util.Arrays.binarySearch(a, x) >= 0

  /** Is sorted distinct `a` a subset of sorted distinct `b`? */
  def subsetOf(a: Array[Int], b: Array[Int]): Boolean = {
    var i = 0; var j = 0
    while (i < a.length && j < b.length) {
      if (a(i) == b(j)) { i += 1; j += 1 }
      else if (a(i) > b(j)) j += 1
      else return false
    }
    i == a.length
  }

  /** Size of the union of a collection of vertex sets (cover size). */
  def coverSize(sets: Iterable[Array[Int]]): Int = {
    val seen = new java.util.BitSet()
    sets.foreach(_.foreach(seen.set))
    seen.cardinality()
  }
}
