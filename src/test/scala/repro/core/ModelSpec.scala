package repro.core

import org.scalatest.funsuite.AnyFunSuite

class ModelSpec extends AnyFunSuite {

  test("event key and parse round-trip") {
    val e = Event("C", "1")
    assert(e.key == "C:1")
    assert(Event.parse("C:1") == e)
    assert(Event.parse("Temp:high") == Event("Temp", "high"))
  }

  test("event parse keeps the last colon as separator") {
    assert(Event.parse("a:b:c") == Event("a:b", "c"))
    intercept[IllegalArgumentException](Event.parse("nocolon"))
  }

  test("event ordering is (series, symbol) lexicographic") {
    val v = Vector(Event("D", "0"), Event("C", "1"), Event("C", "0")).sorted
    assert(v == Vector(Event("C", "0"), Event("C", "1"), Event("D", "0")))
  }

  test("interval duration is inclusive; empty intervals rejected") {
    assert(Interval(3, 3).duration == 1)
    assert(Interval(1, 4).duration == 4)
    intercept[IllegalArgumentException](Interval(5, 4))
  }

  test("instance ordering is chronological with deterministic ties") {
    val a = Instance(Event("C", "1"), Interval(1, 2))
    val b = Instance(Event("D", "1"), Interval(1, 2))
    val c = Instance(Event("C", "1"), Interval(1, 3))
    val d = Instance(Event("A", "1"), Interval(2, 2))
    assert(Vector(d, c, b, a).sorted(Instance.ordering) == Vector(a, b, c, d))
  }

  test("granule row rejects out-of-order instances") {
    val a = Instance(Event("C", "1"), Interval(4, 4))
    val b = Instance(Event("D", "1"), Interval(1, 2))
    intercept[IllegalArgumentException](GranuleRow(1, Vector(a, b)))
    GranuleRow(1, Vector(b, a)) // ordered: fine
  }

  test("granule row event lookup") {
    val a = Instance(Event("C", "1"), Interval(1, 2))
    val b = Instance(Event("C", "0"), Interval(3, 3))
    val row = GranuleRow(1, Vector(a, b))
    assert(row.events == Set(Event("C", "1"), Event("C", "0")))
    assert(row.instancesOf(Event("C", "1")) == Vector(a))
    assert(row.instancesOf(Event("X", "9")).isEmpty)
  }

  test("SeqDB requires dense 1-based granule positions") {
    val r1 = GranuleRow(1, Vector.empty)
    val r3 = GranuleRow(3, Vector.empty)
    intercept[IllegalArgumentException](SeqDB(3, Vector(r1, r3)))
    assert(SeqDB(3, Vector(r1, GranuleRow(2, Vector.empty))).size == 2)
  }

  test("SeqDB.allEvents is sorted and distinct") {
    val db = Fixtures.tableIV
    assert(db.allEvents == db.allEvents.distinct.sorted)
    assert(db.allEvents.size == 10) // 5 series x 2 symbols
  }

  test("SeqDB.row is 1-based") {
    val db = Fixtures.tableIV
    assert(db.row(1).pos == 1)
    assert(db.row(14).pos == 14)
  }
}
