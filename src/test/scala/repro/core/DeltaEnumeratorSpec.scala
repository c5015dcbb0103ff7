package repro.core

import repro.{SparkSpec, TestKit}
import repro.queries.Queries

class DeltaEnumeratorSpec extends SparkSpec {

  for ((name, q) <- Seq("line2" -> Queries.lineK(2), "line3" -> Queries.lineK(3),
                        "star3" -> Queries.starK(3), "qx" -> Queries.qx)) {
    test(s"union of deltas equals the recomputed full join: $name") {
      TestKit.forCases(3, seed0 = name.hashCode) { rng =>
        val stream = IndexHarness.randomStream(q, steps = 80, domain = 4, rng)
        val d = new DeltaEnumerator(q)
        var acc = Set.empty[Proj.JoinRow]
        for ((rel, t) <- stream) {
          val delta = d.insertAndDelta(rel, t)
          // deltas are disjoint from what we have seen
          assert(delta.forall(r => !acc.contains(r)), "delta overlaps prior results")
          acc ++= delta
        }
        assert(acc === d.fullJoin().toSet)
      }
    }
  }

  test("deltas are empty while any relation is empty") {
    val d = new DeltaEnumerator(Queries.lineK(3))
    assert(d.insertAndDelta("g1", Array(1L, 2L)).isEmpty)
    assert(d.insertAndDelta("g2", Array(2L, 3L)).isEmpty)
    val delta = d.insertAndDelta("g3", Array(3L, 4L))
    assert(delta.toList === List(Map("v1" -> 1L, "v2" -> 2L, "v3" -> 3L, "v4" -> 4L)))
  }

  test("insertOnly defers work but keeps the store consistent") {
    val d = new DeltaEnumerator(Queries.lineK(2))
    d.insertOnly("g1", Array(1L, 2L))
    d.insertOnly("g2", Array(2L, 3L))
    assert(d.fullJoin().toSet ===
      Set(Map("v1" -> 1L, "v2" -> 2L, "v3" -> 3L)))
  }

  test("cross-product queries enumerate the full Cartesian product") {
    val q = JoinQuery("cp", Vector(
      RelSchema("a", Vector("x")), RelSchema("b", Vector("y"))))
    val d = new DeltaEnumerator(q)
    d.insertOnly("a", Array(1L)); d.insertOnly("a", Array(2L))
    d.insertOnly("b", Array(10L))
    val delta = d.insertAndDelta("b", Array(20L))
    assert(delta.size === 2) // pairs with both a-tuples
    assert(d.fullJoin().size === 4)
  }

  test("rejects cyclic queries") {
    val tri = JoinQuery("tri", Vector(
      RelSchema("r1", Vector("x", "y")), RelSchema("r2", Vector("y", "z")),
      RelSchema("r3", Vector("z", "x"))))
    intercept[IllegalArgumentException](new DeltaEnumerator(tri))
  }
}
