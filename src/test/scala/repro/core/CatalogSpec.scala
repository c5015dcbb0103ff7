package repro.core

import repro.SparkSpec
import repro.queries.Queries

class CatalogSpec extends SparkSpec {

  test("RelSchema rejects duplicate attributes") {
    intercept[IllegalArgumentException](RelSchema("r", Vector("a", "a")))
  }

  test("RelSchema idxOf computes projection positions") {
    val s = RelSchema("r", Vector("a", "b", "c"))
    assert(s.idxOf(Seq("c", "a")).toSeq === Seq(2, 0))
  }

  test("JoinQuery rejects duplicate relation names") {
    intercept[IllegalArgumentException](
      JoinQuery("q", Vector(RelSchema("r", Vector("a")), RelSchema("r", Vector("b")))))
  }

  test("line-k joins are acyclic for k = 2..6") {
    for (k <- 2 to 6) assert(JoinTree.isAcyclic(Queries.lineK(k)), s"line$k")
  }

  test("star-k joins are acyclic for k = 2..6") {
    for (k <- 2 to 6) assert(JoinTree.isAcyclic(Queries.starK(k)), s"star$k")
  }

  test("QX, QY, QZ, Q10 are acyclic") {
    for (q <- Seq(Queries.qx, Queries.qy, Queries.qz, Queries.q10))
      assert(JoinTree.isAcyclic(q), q.name)
  }

  test("triangle and dumbbell are detected as cyclic") {
    val tri = JoinQuery("tri", Vector(
      RelSchema("r1", Vector("x", "y")), RelSchema("r2", Vector("y", "z")),
      RelSchema("r3", Vector("z", "x"))))
    assert(!JoinTree.isAcyclic(tri))
    assert(!JoinTree.isAcyclic(JoinQuery("dumbbell", Queries.dumbbellRelations)))
  }

  test("4-cycle is cyclic, 4-path is acyclic") {
    val cyc = JoinQuery("c4", Vector(
      RelSchema("r1", Vector("a", "b")), RelSchema("r2", Vector("b", "c")),
      RelSchema("r3", Vector("c", "d")), RelSchema("r4", Vector("d", "a"))))
    assert(!JoinTree.isAcyclic(cyc))
    assert(JoinTree.isAcyclic(Queries.lineK(4)))
  }

  test("cross products (disconnected hypergraphs) are acyclic") {
    val q = JoinQuery("cp", Vector(
      RelSchema("r1", Vector("a", "b")), RelSchema("r2", Vector("c", "d"))))
    assert(JoinTree.isAcyclic(q))
    val tree = JoinTree.rooted(q, JoinTree.unrooted(q).get, 0)
    assert(tree.key(1) === Vector.empty)
  }

  test("single-relation query builds a root-only tree") {
    val q = JoinQuery("one", Vector(RelSchema("r", Vector("a", "b"))))
    val tree = JoinTree.rooted(q, JoinTree.unrooted(q).get, 0)
    assert(tree.root === 0)
    assert(tree.children(0).isEmpty)
  }

  test("line-3 rooted trees have the expected structure") {
    val q = Queries.lineK(3)
    val edges = JoinTree.unrooted(q).get
    // chain g1 - g2 - g3 regardless of edge order
    val t0 = JoinTree.rooted(q, edges, 0)
    assert(t0.children(0) === Vector(1))
    assert(t0.children(1) === Vector(2))
    assert(t0.key(1) === Vector("v2"))
    assert(t0.key(2) === Vector("v3"))
    val t1 = JoinTree.rooted(q, edges, 1)
    assert(t1.children(1).toSet === Set(0, 2))
    assert(t1.key(0) === Vector("v2"))
  }

  test("rooted trees satisfy parent/child consistency for all roots") {
    for (q <- Seq(Queries.lineK(4), Queries.starK(5), Queries.qz, Queries.q10)) {
      val edges = JoinTree.unrooted(q).get
      for (r <- q.relations.indices) {
        val t = JoinTree.rooted(q, edges, r)
        assert(t.parent(r) === -1)
        for (v <- q.relations.indices if v != r) {
          assert(t.parent(v) >= 0, s"${q.name}: $v has no parent")
          assert(t.children(t.parent(v)).contains(v))
          // key(v) must be exactly the attrs shared with the parent
          val shared = q.relations(v).attrs.toSet
            .intersect(q.relations(t.parent(v)).attrs.toSet)
          assert(t.key(v).toSet === shared)
        }
      }
    }
  }

  test("key of child under star root is the hub attribute") {
    val q = Queries.starK(4)
    val t = JoinTree.rooted(q, JoinTree.unrooted(q).get, 0)
    for (v <- 1 until 4) assert(t.key(v) === Vector("s"))
  }
}
