package repro.core

import org.scalatest.funsuite.AnyFunSuite

class FeatureTableSpec extends AnyFunSuite {
  private val t = FeatureTable(
    Vector("lrsm_a", "beh_b", "mou_c", "seq_P", "spa_move_P"),
    Map(1L -> Array(1.0, 2.0, 3.0, 4.0, 5.0), 2L -> Array(6.0, 7.0, 8.0, 9.0, 10.0)))

  test("select keeps only the requested groups, preserving order") {
    val s = t.select(Set("lrsm", "seq"))
    assert(s.names === Vector("lrsm_a", "seq_P"))
    assert(s.vector(1L).toSeq === Seq(1.0, 4.0))
    assert(s.vector(2L).toSeq === Seq(6.0, 9.0))
  }

  test("select all groups is identity") {
    val s = t.select(FeatureTable.AllGroups)
    assert(s.names === t.names)
    assert(s.vector(1L).toSeq === t.vector(1L).toSeq)
  }

  test("selecting an unknown group fails fast") {
    intercept[IllegalArgumentException](t.select(Set("nope")))
  }

  test("concatenation appends columns for matching ids") {
    val u = FeatureTable(Vector("beh_z"), Map(1L -> Array(0.1), 2L -> Array(0.2)))
    val c = t ++ u
    assert(c.names.last === "beh_z")
    assert(c.vector(1L).last === 0.1)
  }

  test("concatenation with mismatched ids fails") {
    val u = FeatureTable(Vector("beh_z"), Map(3L -> Array(0.1)))
    intercept[IllegalArgumentException](t ++ u)
  }

  test("ragged rows are rejected") {
    intercept[IllegalArgumentException](
      FeatureTable(Vector("a_1", "a_2"), Map(1L -> Array(1.0))))
  }
}
