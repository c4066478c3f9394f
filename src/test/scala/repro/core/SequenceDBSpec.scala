package repro.core

import org.scalatest.funsuite.AnyFunSuite

class SequenceDBSpec extends AnyFunSuite {

  test("sequenceOf run-length-encodes consecutive identical symbols") {
    val seq = SequenceDB.sequenceOf("C", Vector("1", "1", "0"), fineStart = 1)
    assert(seq == Vector(
      Instance(Event("C", "1"), Interval(1, 2)),
      Instance(Event("C", "0"), Interval(3, 3))))
  }

  test("sequenceOf with a non-unit fine start offset") {
    val seq = SequenceDB.sequenceOf("D", Vector("0", "0", "0"), fineStart = 10)
    assert(seq == Vector(Instance(Event("D", "0"), Interval(10, 12))))
  }

  test("sequenceOf of an empty slice is empty") {
    assert(SequenceDB.sequenceOf("X", Vector.empty, 1).isEmpty)
  }

  test("sequenceOf alternating symbols produces one instance each") {
    val seq = SequenceDB.sequenceOf("X", Vector("a", "b", "a"), 1)
    assert(seq.size == 3)
    assert(seq.map(_.interval.duration).forall(_ == 1))
  }

  test("build: Table IV granule count and granularity") {
    val db = Fixtures.tableIV
    assert(db.size == 14)
    assert(db.m == 3)
  }

  test("build: Table IV H1 sequences match the paper") {
    val h1 = Fixtures.tableIV.row(1)
    val expected = Vector(
      "(C:1,[1,2])", "(C:0,[3,3])", "(D:1,[1,1])", "(D:0,[2,3])",
      "(F:0,[1,2])", "(F:1,[3,3])", "(M:1,[1,3])", "(N:1,[1,2])", "(N:0,[3,3])")
    assert(h1.instances.map(_.toString).toSet == expected.toSet)
  }

  test("build: Table IV H5 — whole-granule runs") {
    val h5 = Fixtures.tableIV.row(5)
    val expected = Vector(
      "(C:0,[13,15])", "(D:0,[13,15])", "(F:1,[13,15])", "(M:1,[13,15])", "(N:1,[13,15])")
    assert(h5.instances.map(_.toString) == expected.sorted)
  }

  test("build: Table IV H12 — the M:0 / N:1 full-granule case") {
    val h12 = Fixtures.tableIV.row(12)
    val expected = Set(
      "(C:1,[34,35])", "(C:0,[36,36])", "(D:1,[34,34])", "(D:0,[35,36])",
      "(F:0,[34,35])", "(F:1,[36,36])", "(M:0,[34,36])", "(N:1,[34,36])")
    assert(h12.instances.map(_.toString).toSet == expected)
  }

  test("build: Table IV H14 — last granule") {
    val h14 = Fixtures.tableIV.row(14)
    val expected = Set(
      "(C:1,[40,41])", "(C:0,[42,42])", "(D:1,[40,41])", "(D:0,[42,42])",
      "(F:0,[40,41])", "(F:1,[42,42])", "(M:0,[40,42])", "(N:0,[40,42])")
    assert(h14.instances.map(_.toString).toSet == expected)
  }

  test("build keeps a trailing partial granule") {
    val syb = SymbolicDB(Vector(SymbolicSeries("X", Vector("1", "1", "0", "1", "1"))))
    val db = SequenceDB.build(syb, 3)
    assert(db.size == 2)
    assert(db.row(2).instances == Vector(Instance(Event("X", "1"), Interval(4, 5))))
  }

  test("build with m = 1: every granule holds unit instances") {
    val syb = SymbolicDB(Vector(SymbolicSeries("X", Vector("1", "0", "1"))))
    val db = SequenceDB.build(syb, 1)
    assert(db.size == 3)
    assert(db.rows.forall(_.instances.forall(_.interval.duration == 1)))
  }

  test("instances within each granule are canonically ordered") {
    for (row <- Fixtures.tableIV.rows)
      assert(row.instances == row.instances.sorted(Instance.ordering))
  }

  test("every instance lies inside its granule's fine range") {
    val db = Fixtures.tableIV
    for (row <- db.rows; i <- row.instances) {
      val (lo, hi) = Granularity.fineRange(row.pos, db.m)
      assert(i.start >= lo && i.end <= hi)
    }
  }
}
