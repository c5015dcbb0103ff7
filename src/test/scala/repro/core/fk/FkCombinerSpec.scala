package repro.core.fk

import repro.{SparkSpec, TestKit}
import repro.core._
import repro.data.StreamGen
import repro.queries.Queries

class FkCombinerSpec extends SparkSpec {

  test("QX collapses to a single combined relation") {
    val c = new FkCombiner(Queries.qx, Queries.qxFks)
    assert(c.combinedQuery.arity === 1)
    assert(c.combinedQuery.relations.head.attrs.toSet ===
      Set("cust1", "item1", "sspay", "hdemo1", "c1pay", "income", "d1pay"))
  }

  test("QZ collapses to three combined relations") {
    val c = new FkCombiner(Queries.qz, Queries.qzFks)
    assert(c.combinedQuery.arity === 3)
    val names = c.combinedQuery.relations.map(_.name).toSet
    assert(names.exists(_.contains("ss")), names.toString)
    assert(JoinTree.isAcyclic(c.combinedQuery))
  }

  test("Q10 collapses to four combined relations, still acyclic") {
    val c = new FkCombiner(Queries.q10, Queries.q10Fks)
    assert(c.combinedQuery.arity === 4)
    assert(JoinTree.isAcyclic(c.combinedQuery))
  }

  test("translate emits a combined tuple only once the FK chain is complete") {
    val c = new FkCombiner(Queries.qx, Queries.qxFks)
    // fact first: no dimensions yet, nothing emitted
    assert(c.translate("ss", Array(1L, 1L, 100L)).isEmpty)
    assert(c.translate("c1", Array(1L, 7L, 200L)).isEmpty)  // d1 still missing
    val out = c.translate("d1", Array(7L, 3L, 300L))
    assert(out.size === 1) // releases the waiting chain
    val (_, row) = out.head
    val schema = c.combinedQuery.relations.head
    val m = schema.attrs.zip(row).toMap
    assert(m("cust1") === 1L && m("hdemo1") === 7L && m("income") === 3L)
  }

  test("late dimension releases all waiting facts") {
    val c = new FkCombiner(Queries.qx, Queries.qxFks)
    c.translate("c1", Array(5L, 9L, 1L))
    for (i <- 1 to 4) assert(c.translate("ss", Array(5L, i.toLong, 0L)).isEmpty)
    val out = c.translate("d1", Array(9L, 2L, 0L))
    assert(out.size === 4)
  }

  for ((name, q, fks, sf) <- Seq(
    ("qx", Queries.qx, Queries.qxFks, 0.05),
    ("qy", Queries.qy, Queries.qyFks, 0.05),
    ("qz", Queries.qz, Queries.qzFks, 0.04))) {
    test(s"FK-combined engine covers exactly the DuckDB join: $name") {
      val w = StreamGen.tpcds(q, fks, sf, seed = 13)
      val tuples = w.preload ++ w.stream
      val e = FkEngine.rs(q, fks, k = 300000, seed = 5)
      IndexHarness.feed(e, tuples)
      OracleCheck.sampleEqualsJoin(spark, q, tuples, e.sample)
    }
  }

  test("FK-combined engine covers exactly the DuckDB join: q10") {
    val w = StreamGen.q10(sf = 0.4, seed = 19)
    val tuples = w.preload ++ w.stream
    val e = FkEngine.rs(w.query, w.fks, k = 400000, seed = 6)
    IndexHarness.feed(e, tuples)
    OracleCheck.sampleEqualsJoin(spark, w.query, tuples, e.sample)
  }

  test("RSJoin with and without FK combination agree on full coverage (qy)") {
    val w = StreamGen.qy(sf = 0.05, seed = 23)
    val tuples = w.preload ++ w.stream
    val plain = new ReservoirJoinEngine(Queries.qy, 300000, 1)
    val opt = FkEngine.rs(Queries.qy, Queries.qyFks, 300000, 2)
    IndexHarness.feed(plain, tuples)
    IndexHarness.feed(opt, tuples)
    assert(plain.sample.toSet === opt.sample.toSet)
  }

  test("SJoin_opt agrees with RSJoin_opt on full coverage (qz)") {
    val w = StreamGen.qz(sf = 0.04, seed = 29)
    val tuples = w.preload ++ w.stream
    val a = FkEngine.rs(Queries.qz, Queries.qzFks, 300000, 1)
    val b = FkEngine.sj(Queries.qz, Queries.qzFks, 300000, 2)
    IndexHarness.feed(a, tuples)
    IndexHarness.feed(b, tuples)
    assert(a.sample.toSet === b.sample.toSet)
  }

  test("FK-combined sampling is uniform (qy, small instance)") {
    TestKit.forCases(1) { rng =>
      val q = Queries.qy
      val payload = Set("sspay", "c1pay", "d1pay", "d2pay", "c2pay")
      // Build a stream satisfying the FK property: dimension tuples get
      // unique keys (domain tuples deduped by randomStream are not unique
      // per key) — so generate dimensions explicitly.
      val dims =
        (1 to 6).map(i => ("d1", Array(i.toLong, 1L + (i % 2).toLong, rng.nextLong(5)))) ++
        (1 to 6).map(i => ("d2", Array(i.toLong, 1L + (i % 2).toLong, rng.nextLong(5)))) ++
        (1 to 8).map(i => ("c1", Array(i.toLong, 1L + rng.nextLong(6), rng.nextLong(5)))) ++
        (1 to 8).map(i => ("c2", Array(i.toLong, 1L + rng.nextLong(6), rng.nextLong(5))))
      // Set semantics: the paper assumes a duplicate-free stream, so dedupe
      // the generated fact tuples.
      val facts = (1 to 15).map(_ =>
        ("ss", Seq(1L + rng.nextLong(8), 1L + rng.nextLong(3), rng.nextLong(5))))
        .distinct.map { case (r, v) => (r, v.toArray) }
      val stream = StreamGen.shuffle((dims ++ facts).toIndexedSeq, rng)
      val all = OracleCheck.bruteJoin(q, stream)
      val m = all.size
      assert(m >= 15 && m <= 3000, s"inconvenient instance size $m")
      val k = 5
      val runs = 1000
      val counts = IndexHarness.inclusionCounts(
        s => FkEngine.rs(q, Queries.qyFks, k, s), stream, runs)
      assert(counts.keySet.subsetOf(all))
      TestKit.assertUniform(counts, m, k, runs, "fk-qy")
    }
  }
}
