package repro.queries

import repro.core.{JoinQuery, RelSchema}
import repro.core.fk.FkSpec

/** The paper's evaluation queries (Appendix A), expressed as natural joins:
  * each SQL alias becomes a distinct relation with renamed attributes so that
  * shared names encode exactly the SQL equality predicates.
  */
object Queries {

  // -------------------------------------------------------------------------
  // Graph queries over an edge table G(src, dst); alias Gi streams its own
  // shuffled copy of the edge list, as in the paper's setup.
  // -------------------------------------------------------------------------

  /** Line-k join: paths of length k. Relations g1..gk, gi = (v_i, v_{i+1}). */
  def lineK(k: Int): JoinQuery = {
    require(k >= 2, s"line-$k needs k >= 2")
    JoinQuery(s"line$k",
      (1 to k).map(i => RelSchema(s"g$i", Vector(s"v$i", s"v${i + 1}"))).toVector)
  }

  /** Star-k join: k edges sharing a source vertex. gi = (s, d_i). */
  def starK(k: Int): JoinQuery = {
    require(k >= 2, s"star-$k needs k >= 2")
    JoinQuery(s"star$k",
      (1 to k).map(i => RelSchema(s"g$i", Vector("s", s"d$i"))).toVector)
  }

  /** The cyclic dumbbell query (handled by the GHD engine, not RSJoin). */
  val dumbbellRelations: Vector[RelSchema] = Vector(
    RelSchema("g1", Vector("x1", "x2")), RelSchema("g2", Vector("x2", "x3")),
    RelSchema("g3", Vector("x3", "x1")), RelSchema("g4", Vector("x4", "x5")),
    RelSchema("g5", Vector("x5", "x6")), RelSchema("g6", Vector("x6", "x4")),
    RelSchema("g7", Vector("x1", "x4")),
  )

  // -------------------------------------------------------------------------
  // TPC-DS-lite (QX, QY, QZ). Attribute-name key:
  //   cust1/hdemo1: ss → c1 → d1 chain       income: d1 ⋈ d2 band join
  //   hdemo2/cust2: d2 ← c2 chain            item1/cat: ss → i1 ⋈ i2
  // *pay columns are non-join payload (they make grouping meaningful).
  // -------------------------------------------------------------------------

  val ss = RelSchema("ss", Vector("cust1", "item1", "sspay"))
  val c1 = RelSchema("c1", Vector("cust1", "hdemo1", "c1pay"))
  val d1 = RelSchema("d1", Vector("hdemo1", "income", "d1pay"))
  val d2 = RelSchema("d2", Vector("hdemo2", "income", "d2pay"))
  val c2 = RelSchema("c2", Vector("cust2", "hdemo2", "c2pay"))
  val i1 = RelSchema("i1", Vector("item1", "cat", "i1pay"))
  val i2 = RelSchema("i2", Vector("item2", "cat", "i2pay"))

  /** QX: store_sales ⋈ customer ⋈ household_demographics (FK chain). */
  val qx: JoinQuery = JoinQuery("qx", Vector(ss, c1, d1))
  val qxFks: Seq[FkSpec] = Seq(
    FkSpec("ss", Vector("cust1"), "c1"), FkSpec("c1", Vector("hdemo1"), "d1"))

  /** QY: QX extended through the income band to a second customer branch. */
  val qy: JoinQuery = JoinQuery("qy", Vector(ss, c1, d1, d2, c2))
  val qyFks: Seq[FkSpec] = qxFks :+ FkSpec("c2", Vector("hdemo2"), "d2")

  /** QZ: QY plus the item branch ss ⋈ i1 ⋈_cat i2. */
  val qz: JoinQuery = JoinQuery("qz", Vector(ss, c1, d1, d2, c2, i1, i2))
  val qzFks: Seq[FkSpec] = qyFks :+ FkSpec("ss", Vector("item1"), "i1")

  // -------------------------------------------------------------------------
  // LDBC-SNB-lite BI Q10 (11 relations, acyclic, FK-heavy).
  // -------------------------------------------------------------------------

  val message  = RelSchema("message", Vector("mid", "p1"))
  val hastag1  = RelSchema("hastag1", Vector("mid", "tag1"))
  val tag1     = RelSchema("tag1", Vector("tag1", "tc1", "t1pay"))
  val hastag2  = RelSchema("hastag2", Vector("mid", "tag2"))
  val tag2     = RelSchema("tag2", Vector("tag2", "tc2", "t2pay"))
  val tagclass = RelSchema("tagclass", Vector("tc2", "tcpay"))
  val person1  = RelSchema("person1", Vector("p1", "city", "p1pay"))
  val city     = RelSchema("city", Vector("city", "country", "citypay"))
  val country  = RelSchema("country", Vector("country", "ctrypay"))
  val knows    = RelSchema("knows", Vector("p1", "p2"))
  val person2  = RelSchema("person2", Vector("p2", "p2pay"))

  val q10: JoinQuery = JoinQuery("q10", Vector(
    message, hastag1, tag1, hastag2, tag2, tagclass,
    person1, city, country, knows, person2))

  /** Conservative FK plan (no shared-parent duplication):
    * {hastag1,tag1}, {hastag2,tag2,tagclass}, {message,person1,city,country},
    * {knows,person2} → a 4-relation acyclic query.
    */
  val q10Fks: Seq[FkSpec] = Seq(
    FkSpec("hastag1", Vector("tag1"), "tag1"),
    FkSpec("hastag2", Vector("tag2"), "tag2"),
    FkSpec("tag2", Vector("tc2"), "tagclass"),
    FkSpec("message", Vector("p1"), "person1"),
    FkSpec("person1", Vector("city"), "city"),
    FkSpec("city", Vector("country"), "country"),
    FkSpec("knows", Vector("p2"), "person2"),
  )
}
