package repro.core

import org.scalatest.funsuite.AnyFunSuite

class GroupEncodingSpec extends AnyFunSuite {
  import GroupEncoding._

  private val universe = Seq("Female", "Male", "Jazz", "Pop", "Rock")

  test("level-1 subgroups are the singleton groups") {
    assert(level(universe, 1).map(_.groups) ==
      universe.sorted.map(Set(_)))
  }
  test("level-2 subgroup count is C(5,2)=10") {
    assert(level(universe, 2).size == 10)
  }
  test("level-3 subgroup count is C(5,3)=10") {
    assert(level(universe, 3).size == 10)
  }
  test("hierarchy up to level 2 has 5+10 subgroups") {
    assert(hierarchy(universe, 2).size == 15)
  }
  test("duplicate groups in the universe are collapsed") {
    assert(level(Seq("a", "a", "b"), 1).size == 2)
  }
  test("subgroup level equals its cardinality") {
    assert(Subgroup(Set("Female", "Pop")).level == 2)
  }
  test("subgroup key is sorted and &-joined") {
    assert(Subgroup(Set("Pop", "Female")).key == "Female&Pop")
  }

  test("membership: record covers the subgroup (Example of Fig 1)") {
    val femalePop = Subgroup(Set("Female", "Pop"))
    assert(femalePop.contains(Seq("Female", "Pop", "Rock")))
    assert(!femalePop.contains(Seq("Female", "Rock")))
    assert(!femalePop.contains(Seq("Pop")))
  }

  test("Appendix A Example 4: entity encoding") {
    // universe sorted: Female, Jazz, Male, Pop, Rock (lexicographic)
    val e = encode(Seq("Female", "Male", "Jazz", "Pop", "Rock"), Set("Female", "Pop", "Rock"))
    assert(e.toSeq == Seq(1, 0, 0, 1, 1))
  }
  test("Appendix A Example 4: subgroup encoding") {
    val s = encode(Seq("Female", "Male", "Jazz", "Pop", "Rock"), Set("Female", "Pop"))
    assert(s.toSeq == Seq(1, 0, 0, 1, 0))
  }
  test("encoded membership: (s AND e) == s") {
    val u = Seq("Female", "Male", "Jazz", "Pop", "Rock")
    val e = encode(u, Set("Female", "Pop", "Rock"))
    assert(encodedContains(encode(u, Set("Female", "Pop")), e))
    assert(!encodedContains(encode(u, Set("Male", "Pop")), e))
  }
  test("encoded membership rejects length mismatch") {
    intercept[IllegalArgumentException] {
      encodedContains(Array(1), Array(1, 0))
    }
  }
  test("encoding of a level-k subgroup has exactly k ones") {
    val s = encode(universe, Set("Jazz", "Rock"))
    assert(s.sum == 2)
  }

  test("occurring subgroups filter to those present in data") {
    val records = Seq(Seq("Female", "Pop"), Seq("Male", "Rock"), Seq("Female", "Rock"))
    val occ = occurring(records, 2).map(_.key)
    assert(occ.contains("Female&Pop") && occ.contains("Female&Rock") && occ.contains("Male&Rock"))
    assert(!occ.contains("Male&Pop"))
    // non-sensical combos (two values no record holds together) are excluded
    assert(!occ.contains("Pop&Rock"))
  }
  test("occurring at level 1 lists all present groups") {
    val occ = occurring(Seq(Seq("a"), Seq("b")), 1).map(_.key)
    assert(occ.toSet == Set("a", "b"))
  }
}
