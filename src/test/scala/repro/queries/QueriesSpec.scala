package repro.queries

import repro.SparkSpec
import repro.core.JoinTree

class QueriesSpec extends SparkSpec {

  test("lineK relations chain on consecutive vertex attributes") {
    val q = Queries.lineK(5)
    assert(q.arity === 5)
    for (i <- 1 to 5)
      assert(q.relations(i - 1).attrs === Vector(s"v$i", s"v${i + 1}"))
    assert(q.attributes === (1 to 6).map(i => s"v$i").toVector)
  }

  test("starK relations share exactly the hub attribute") {
    val q = Queries.starK(6)
    assert(q.relations.forall(_.attrs.head == "s"))
    assert(q.relations.map(_.attrs(1)).distinct.size === 6)
  }

  test("lineK and starK reject k < 2") {
    intercept[IllegalArgumentException](Queries.lineK(1))
    intercept[IllegalArgumentException](Queries.starK(1))
  }

  test("QX ⊂ QY ⊂ QZ relation-wise") {
    val qx = Queries.qx.relations.map(_.name).toSet
    val qy = Queries.qy.relations.map(_.name).toSet
    val qz = Queries.qz.relations.map(_.name).toSet
    assert(qx.subsetOf(qy) && qy.subsetOf(qz))
    assert(qz -- qy === Set("i1", "i2"))
  }

  test("QZ join graph has the documented shape") {
    val q = Queries.qz
    // ss joins c1 on cust1 and i1 on item1; d1–d2 meet on income; i1–i2 on cat
    def attrs(n: String) = q.relations(q.relIdx(n)).attrs.toSet
    assert((attrs("ss") & attrs("c1")) === Set("cust1"))
    assert((attrs("ss") & attrs("i1")) === Set("item1"))
    assert((attrs("d1") & attrs("d2")) === Set("income"))
    assert((attrs("i1") & attrs("i2")) === Set("cat"))
    assert((attrs("c2") & attrs("d2")) === Set("hdemo2"))
  }

  test("Q10 has 11 relations and every FK target attribute exists") {
    assert(Queries.q10.arity === 11)
    for (fk <- Queries.q10Fks) {
      val child = Queries.q10.relations(Queries.q10.relIdx(fk.childRel))
      val parent = Queries.q10.relations(Queries.q10.relIdx(fk.parentRel))
      assert(fk.keyAttrs.forall(child.attrs.contains), s"$fk child attrs")
      assert(fk.keyAttrs.forall(parent.attrs.contains), s"$fk parent attrs")
    }
  }

  test("dumbbell relations cover the 7-edge SQL pattern") {
    val rels = Queries.dumbbellRelations
    assert(rels.size === 7)
    assert(rels.map(_.name) === (1 to 7).map(i => s"g$i").toVector)
    // bridge joins the two triangle anchors
    assert(rels(6).attrs === Vector("x1", "x4"))
  }

  test("every acyclic catalog query admits a rooted tree at every relation") {
    for (q <- Seq(Queries.lineK(3), Queries.starK(4), Queries.qx, Queries.qy,
                  Queries.qz, Queries.q10)) {
      val edges = JoinTree.unrooted(q).get
      for (r <- q.relations.indices) {
        val t = JoinTree.rooted(q, edges, r)
        assert(t.root === r)
      }
    }
  }
}
