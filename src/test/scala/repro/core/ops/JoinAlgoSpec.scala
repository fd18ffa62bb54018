package repro.core.ops

import org.scalatest.funsuite.AnyFunSuite
import repro.tensor._

/** Algorithm 1 (sort join) and Algorithm 2 (hash join) against a naive
  * nested-loop reference, over uniform, skewed, collision-heavy, and empty
  * key distributions.
  */
class JoinAlgoSpec extends AnyFunSuite {

  private def refJoin(l: Array[Long], r: Array[Long]): Set[(Long, Long)] =
    (for {
      i <- l.indices; j <- r.indices
      if l(i) == r(j)
    } yield (i.toLong, j.toLong)).toSet

  private def pairsOf(res: (I64Tensor, I64Tensor)): Set[(Long, Long)] =
    res._1.data.zip(res._2.data).toSet

  private def checkBoth(l: Array[Long], r: Array[Long]): Unit = {
    val expected = refJoin(l, r)
    val k = (l ++ r).foldLeft(0L)(math.max) + 1
    val sortRes = SortJoin.join(I64Tensor(l), I64Tensor(r), k.toInt)
    assert(pairsOf(sortRes) == expected, "sort join")
    assert(sortRes._1.length == expected.size, "sort join emits no duplicates")
    val hashRes = HashJoin.join(I64Tensor(l), I64Tensor(r))
    assert(pairsOf(hashRes) == expected, "hash join")
    assert(hashRes._1.length == expected.size, "hash join emits no duplicates")
  }

  test("uniform keys") {
    val rnd = new scala.util.Random(42)
    checkBoth(Array.fill(200)(rnd.nextLong(50)), Array.fill(300)(rnd.nextLong(50)))
  }

  test("skewed keys (many duplicates on both sides)") {
    val rnd = new scala.util.Random(7)
    val l = Array.fill(150)(if (rnd.nextBoolean()) 3L else rnd.nextLong(10))
    val r = Array.fill(120)(if (rnd.nextInt(3) == 0) 3L else rnd.nextLong(10))
    checkBoth(l, r)
  }

  test("unique-unique (primary key to primary key)") {
    checkBoth(Array.tabulate(100)(_.toLong), Array.tabulate(60)(i => (i * 2).toLong))
  }

  test("no matches") {
    checkBoth(Array(1L, 2L, 3L), Array(10L, 11L))
  }

  test("empty sides") {
    checkBoth(Array.empty[Long], Array(1L, 2L))
    checkBoth(Array(1L, 2L), Array.empty[Long])
    checkBoth(Array.empty[Long], Array.empty[Long])
  }

  test("hash join with forced collisions (keys far apart)") {
    // Keys spaced by large strides alias heavily modulo the table size.
    val l = Array.tabulate(64)(i => i * 1024L + 1)
    val r = Array.tabulate(80)(i => (i % 40) * 1024L + 1)
    val expected = refJoin(l, r)
    assert(pairsOf(HashJoin.join(I64Tensor(l), I64Tensor(r))) == expected)
  }

  test("sort join histogram arithmetic on a worked example") {
    // Mirrors Figure 3: left=[5,7,5,5], right=[7,5,5,7] → 5-bucket: 3x2, 7-bucket: 1x2.
    val l = Array(5L, 7L, 5L, 5L)
    val r = Array(7L, 5L, 5L, 7L)
    val res = SortJoin.join(I64Tensor(l), I64Tensor(r), 8)
    assert(res._1.length == 3 * 2 + 1 * 2)
    assert(pairsOf(res) == refJoin(l, r))
  }

  test("joint key encoding over composite keys") {
    import repro.core.data.{Column, DType}
    val l1 = Column("a", DType.I64, I64Tensor(Array(1L, 1L, 2L, 9L)))
    val l2 = Column("b", DType.Str, StringTensor.fromStrings(Array("x", "y", "x", "x")))
    val r1 = Column("c", DType.I64, I64Tensor(Array(1L, 2L, 1L)))
    val r2 = Column("d", DType.Str, StringTensor.fromStrings(Array("y", "x", "q")))
    val (lc, rc, k) = KeyEncoder.encodeJoint(Seq(l1, l2), Seq(r1, r2))
    assert(k > 0 && lc.length == 4 && rc.length == 3)
    // (1,y) matches; (2,x) matches; (1,x) vs (1,q) don't.
    assert(lc.data(1) == rc.data(0))
    assert(lc.data(2) == rc.data(1))
    assert(lc.data(0) != rc.data(2))
    assert(lc.data.forall(c => c >= 0 && c < k) && rc.data.forall(c => c >= 0 && c < k))
  }

  test("KeyEncoder.packColumns packs small ranges and rejects wide ones") {
    val a = I64Tensor(Array(5L, 6L, 7L))
    val b = I64Tensor(Array(100L, 100L, 101L))
    val packed = KeyEncoder.packColumns(Seq(a, b)).get
    assert(packed.data.toSeq.distinct.length == 3)
    val wide = I64Tensor(Array(Long.MinValue + 1, Long.MaxValue - 1, 0L))
    assert(KeyEncoder.packColumns(Seq(wide, wide)).isEmpty)
  }

  test("groupsOf yields sorted segments and representatives") {
    val keys = I64Tensor(Array(3L, 1L, 3L, 2L, 1L, 3L))
    val g = KeyEncoder.groupsOf(Seq(keys))
    assert(g.nGroups == 3)
    // segIdSorted monotonic
    assert(g.segIdSorted.data.toSeq == g.segIdSorted.data.sorted.toSeq)
    // representative rows carry the right key values
    val repKeys = g.repRows.data.map(i => keys.data(i.toInt)).toSeq
    assert(repKeys == Seq(1L, 2L, 3L))
  }

  test("HashGrouping matches sort grouping semantics") {
    val rnd = new scala.util.Random(11)
    val keys = I64Tensor(Array.fill(500)(rnd.nextLong(37)))
    val sortG = KeyEncoder.groupsOf(Seq(keys))
    val hashG = HashGrouping.groupsOf(Seq(keys))
    assert(hashG.nGroups == sortG.nGroups)
    // Same partition of rows into groups (group labels may differ).
    def partition(g: KeyEncoder.Groups): Set[Set[Long]] = {
      val m = scala.collection.mutable.Map[Long, Set[Long]]().withDefaultValue(Set.empty)
      g.perm.data.indices.foreach { p => m(g.segIdSorted.data(p)) += g.perm.data(p) }
      m.values.toSet
    }
    assert(partition(hashG) == partition(sortG))
  }
}
