package repro.core.grouping

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Types.Group

class PartitionerSpec extends AnyFunSuite {

  private val si: Int => Int = _ => 1000 // 60 points/min each

  test("points per minute sums over members") {
    val g = Group(1, IndexedSeq(1, 2, 3))
    assert(Partitioner.pointsPerMinute(g, si) == 180.0)
  }

  test("each group lands on exactly one partition") {
    val groups = (1 to 10).map(i => Group(i, IndexedSeq(i)))
    val assign = Partitioner.partition(groups, 3, si)
    assert(assign.keySet == (1 to 10).toSet)
    assert(assign.values.forall(p => p >= 0 && p < 3))
  }

  test("equal groups balance perfectly") {
    val groups = (1 to 9).map(i => Group(i, IndexedSeq(i)))
    val assign = Partitioner.partition(groups, 3, si)
    assert(Partitioner.imbalance(groups, assign, 3, si) == 0.0)
  }

  test("LPT keeps imbalance below the largest group's rate") {
    val groups = (1 to 20).map(i => Group(i, (1 to (i % 5 + 1)).map(j => i * 10 + j).toIndexedSeq))
    val assign = Partitioner.partition(groups, 4, si)
    val largest = groups.map(Partitioner.pointsPerMinute(_, si)).max
    assert(Partitioner.imbalance(groups, assign, 4, si) <= largest)
  }

  test("mixed sampling intervals are weighted") {
    val siOf: Int => Int = t => if (t == 1) 100 else 1000 // tid 1: 600/min
    val groups = Seq(Group(1, IndexedSeq(1)), Group(2, IndexedSeq(2)), Group(3, IndexedSeq(3)))
    val assign = Partitioner.partition(groups, 2, siOf)
    // the heavy group must sit alone on its partition
    assert(assign(2) == assign(3) && assign(1) != assign(2))
  }

  test("more partitions than groups leaves empties") {
    val groups = Seq(Group(1, IndexedSeq(1)))
    val assign = Partitioner.partition(groups, 8, si)
    assert(assign.size == 1)
  }

  test("zero partitions rejected") {
    intercept[IllegalArgumentException](Partitioner.partition(Nil, 0, si))
  }
}
