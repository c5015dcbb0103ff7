package repro.core

import repro.{SparkSpec, TestKit}
import repro.data.StreamGen
import repro.queries.Queries

/** Operation (2) of Theorem 4.2: single-shot uniform samples from the full
  * join at any stream position.
  */
class FullJoinSamplerSpec extends SparkSpec {

  test("draw returns None on an empty join") {
    val e = new ReservoirJoinEngine(Queries.lineK(3), 1, 1)
    val s = new FullJoinSampler(e, seed = 2)
    assert(s.draw() === None)
    e.insert("g1", Array(1L, 2L))
    assert(s.draw() === None) // still no complete path
  }

  test("joinUpperBound sandwiches the true join size") {
    TestKit.forCases(5) { rng =>
      val q = Queries.lineK(3)
      val stream = IndexHarness.randomStream(q, steps = 100, domain = 4, rng)
      val e = new ReservoirJoinEngine(q, 1, 1)
      stream.foreach { case (r, t) => e.updateOnly(r, t) }
      val m = OracleCheck.bruteJoin(q, stream).size.toLong
      val s = new FullJoinSampler(e, seed = 3)
      val phi = math.pow(0.5, 2 * q.arity) // conservative density floor
      assert(s.joinUpperBound >= m)
      assert(m.toDouble >= phi * s.joinUpperBound - 1e-9,
        s"bound ${s.joinUpperBound} too loose for |Q|=$m")
    }
  }

  test("draws are members of the join and uniformly distributed (line-3)") {
    val q = Queries.lineK(3)
    val es = StreamGen.graphEdges(18, 7, 21)
    val stream = StreamGen.lineK(3, es, 21).stream
    val e = new ReservoirJoinEngine(q, 1, 1)
    stream.foreach { case (r, t) => e.updateOnly(r, t) }
    val all = OracleCheck.bruteJoin(q, stream)
    val m = all.size
    assert(m >= 20)
    val sampler = new FullJoinSampler(e, seed = 17)
    val draws = 20000
    val counts = scala.collection.mutable.HashMap.empty[Proj.JoinRow, Int].withDefaultValue(0)
    for (_ <- 0 until draws) {
      val row = sampler.draw().get
      assert(all.contains(row), s"drew non-result $row")
      counts(row) += 1
    }
    // Single draws with replacement: k=1 per "run", runs=draws.
    TestKit.assertUniform(counts.toMap, m, 1, draws, "full-join draw")
  }

  test("sampler keeps working as the stream grows (dynamic index)") {
    val q = Queries.starK(3)
    val es = StreamGen.graphEdges(30, 9, 5)
    val stream = StreamGen.starK(3, es, 5).stream
    val e = new ReservoirJoinEngine(q, 1, 1)
    val brute = new DeltaEnumerator(q)
    val sampler = new FullJoinSampler(e, seed = 4)
    var join = Set.empty[Proj.JoinRow]
    for ((r, t) <- stream) {
      e.updateOnly(r, t)
      join ++= brute.insertAndDelta(r, t.clone())
      if (join.nonEmpty) {
        val row = sampler.draw().get
        assert(join.contains(row))
      } else assert(sampler.draw() === None)
    }
  }
}
