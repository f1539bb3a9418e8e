package repro.core.grouping

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Types.TimeSeriesMeta

class DimensionsSpec extends AnyFunSuite {

  // The paper's running example (Figure 7): Location with 4 named levels.
  private val location = DimensionSpec("Location", IndexedSeq("Country", "Region", "Park", "Turbine"))

  private def ts(tid: Int, members: String*): TimeSeriesMeta =
    TimeSeriesMeta(tid, 100, dims = Map("Location" -> members.toIndexedSeq))

  private val t1 = ts(1, "DK", "North", "Aalborg", "9834")
  private val t2 = ts(2, "DK", "North", "Aalborg", "9835")
  private val t3 = ts(3, "DK", "North", "Aalborg", "9836")
  private val t4 = ts(4, "DK", "North", "Thisted", "1200")
  private val t5 = ts(5, "DE", "South", "Munich", "7")

  test("LCA of identical series is the full depth") {
    assert(Dimensions.lcaLevel(Seq(t1, t1), location) == 4)
  }

  test("paper example: series sharing a park have LCA level 3") {
    assert(Dimensions.lcaLevel(Seq(t2, t3), location) == 3)
  }

  test("series sharing only region have LCA 2, country 1, nothing 0") {
    assert(Dimensions.lcaLevel(Seq(t1, t4), location) == 2)
    assert(Dimensions.lcaLevel(Seq(t1, t5), location) == 0)
  }

  test("LCA over more than two series takes all into account") {
    assert(Dimensions.lcaLevel(Seq(t1, t2, t4), location) == 2)
  }

  test("series without the dimension share only the top") {
    val bare = TimeSeriesMeta(9, 100)
    assert(Dimensions.lcaLevel(Seq(t1, bare), location) == 0)
  }

  test("paper example distance: park-sharing series have distance 0.25") {
    // dist = 1 * ((4-3)/4) = 0.25 (paper Section IV-C)
    assert(Dimensions.distance(Seq(t2), Seq(t3), Seq(location)) == 0.25)
  }

  test("distance 0 for identical members, 1 for fully distinct") {
    assert(Dimensions.distance(Seq(t1), Seq(t1), Seq(location)) == 0.0)
    assert(Dimensions.distance(Seq(t1), Seq(t5), Seq(location)) == 1.0)
  }

  test("user weight raises a dimension's influence via the reciprocal") {
    val measure = DimensionSpec("Measure", IndexedSeq("Category", "Concrete"))
    val a = TimeSeriesMeta(1, 100, dims = Map(
      "Location" -> IndexedSeq("DK", "North", "Aalborg", "1"),
      "Measure"  -> IndexedSeq("temp", "t1")))
    val b = TimeSeriesMeta(2, 100, dims = Map(
      "Location" -> IndexedSeq("DK", "North", "Aalborg", "2"),
      "Measure"  -> IndexedSeq("temp", "t1")))
    val unweighted = Dimensions.distance(Seq(a), Seq(b), Seq(location, measure))
    val weighted   = Dimensions.distance(Seq(a), Seq(b), Seq(location, measure),
                                         Map("Location" -> 2.0))
    // weight 2 on Location halves its contribution: (1/2·(1/4) + 0)/2
    assert(unweighted == ((1.0 * 0.25) + 0.0) / 2)
    assert(weighted == ((0.5 * 0.25) + 0.0) / 2)
  }

  test("distance is capped at 1.0") {
    // a weight below 1 can push the raw sum above 1
    val d = Dimensions.distance(Seq(t1), Seq(t5), Seq(location), Map("Location" -> 0.25))
    assert(d == 1.0)
  }

  test("auto distance formula (paper Section IV-B)") {
    val measure = DimensionSpec("Measure", IndexedSeq("Category", "Concrete"))
    // (1/max(levels))/|D| = (1/4)/2
    assert(Dimensions.autoDistance(Seq(location, measure)) == 0.125)
    assert(Dimensions.autoDistance(Seq(measure)) == 0.5)
  }

  test("empty dimension list rejected") {
    intercept[IllegalArgumentException](Dimensions.autoDistance(Nil))
    intercept[IllegalArgumentException](Dimensions.distance(Seq(t1), Seq(t2), Nil))
  }
}
