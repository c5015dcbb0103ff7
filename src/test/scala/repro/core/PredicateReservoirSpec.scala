package repro.core

import repro.{SparkSpec, TestKit}

class PredicateReservoirSpec extends SparkSpec {

  private def runMany(items: IndexedSeq[Int], k: Int, theta: Int => Boolean,
                      runs: Int, algo: String): Map[Int, Int] = {
    val counts = scala.collection.mutable.HashMap.empty[Int, Int].withDefaultValue(0)
    for (r <- 0 until runs) {
      val rng = new Rng(1000L * r + 17)
      val s = algo match {
        case "alg1"  => PredicateReservoir.run(items, k, theta, rng)
        case "naive" => PredicateReservoir.naive(items, k, theta, rng)
      }
      s.foreach(x => counts(x) += 1)
    }
    counts.toMap
  }

  test("returns every real item when fewer than k pass the predicate") {
    TestKit.forCases(50) { rng =>
      val n = 30 + rng.nextInt(100)
      val items = (0 until n).toIndexedSeq
      val theta = (x: Int) => x % 7 == 0
      val expect = items.filter(theta).toSet
      val s = PredicateReservoir.run(items, k = n, theta, rng)
      assert(s.toSet === expect)
      assert(s.size === expect.size)
    }
  }

  test("sample is without replacement (distinct items)") {
    TestKit.forCases(50) { rng =>
      val items = (0 until 500).toIndexedSeq
      val s = PredicateReservoir.run(items, 20, (_: Int) => true, rng)
      assert(s.distinct.size === s.size)
      assert(s.size === 20)
    }
  }

  test("all-dummy stream yields an empty sample") {
    val rng = new Rng(1)
    assert(PredicateReservoir.run((0 until 200).toIndexedSeq, 5, (_: Int) => false, rng).isEmpty)
  }

  test("empty stream yields an empty sample") {
    val rng = new Rng(1)
    assert(PredicateReservoir.run(IndexedSeq.empty[Int], 5, (_: Int) => true, rng).isEmpty)
  }

  // Uniformity across densities — the heart of Theorem 3.1 (and of the
  // erratum fix: with the literally-typeset q-reuse these fail).
  for (densityPct <- Seq(10, 30, 50, 70, 100)) {
    test(s"uniform over real items at density $densityPct%") {
      val n = 400
      val m = 40 // real items
      val k = 8
      val runs = 3000
      // place m real items deterministically pseudo-randomly among n
      val placer = new Rng(densityPct)
      val realPos = scala.collection.mutable.LinkedHashSet.empty[Int]
      val window = math.max(m, n * densityPct / 100)
      while (realPos.size < m) realPos += placer.nextInt(window)
      val theta = (x: Int) => realPos.contains(x)
      val counts = runMany((0 until n).toIndexedSeq, k, theta, runs, "alg1")
      assert(counts.keys.forall(theta), "sampled a dummy item")
      TestKit.assertUniform(counts, m, k, runs, s"alg1 d=$densityPct")
    }
  }

  test("naive oracle is itself uniform (sanity of the test harness)") {
    val n = 300
    val k = 6
    val runs = 3000
    val theta = (x: Int) => x % 3 == 0
    val m = (0 until n).count(theta)
    val counts = runMany((0 until n).toIndexedSeq, k, theta, runs, "naive")
    TestKit.assertUniform(counts, m, k, runs, "naive")
  }

  test("sample at every prefix is uniform (streaming correctness)") {
    // Maintain over a growing stream; check uniformity at an intermediate cut
    // by stopping the stream there.
    val n = 120
    val k = 5
    val runs = 3000
    val cut = 60
    val items = (0 until n).toIndexedSeq
    val counts = runMany(items.take(cut), k, (_: Int) => true, runs, "alg1")
    TestKit.assertUniform(counts, cut, k, runs, "prefix")
  }

  test("dense streams are processed in far fewer than N touches") {
    val n = 200000
    val k = 50
    val stats = new ReservoirStats
    PredicateReservoir.run((0 until n).toIndexedSeq, k, (_: Int) => true, new Rng(5), stats)
    // theory: k + k·ln(N/k) ≈ 50 + 50·8.3 ≈ 465; allow wide slack
    assert(stats.touched < 4000, s"touched ${stats.touched}")
    assert(stats.nextCalls === k)
  }

  test("all-dummy streams cannot skip (must touch every item)") {
    val n = 5000
    val stats = new ReservoirStats
    PredicateReservoir.run((0 until n).toIndexedSeq, 5, (_: Int) => false, new Rng(5), stats)
    assert(stats.nextCalls === n)
    assert(stats.stops === 0)
  }

  test("expected touches track the instance-optimal bound (Theorem 3.2)") {
    // Stream: 1000 real then 9000 dummy then 1000 real. Bound:
    // Σ min(1, k/(r_i+1)) computed explicitly; average observed touches over
    // trials must be within a small constant factor.
    val k = 10
    val items = (0 until 11000).toIndexedSeq
    val theta = (x: Int) => x < 1000 || x >= 10000
    var bound = 0.0
    var r = 0
    for (i <- items) { bound += math.min(1.0, k.toDouble / (r + 1)); if (theta(i)) r += 1 }
    val trials = 30
    var touched = 0L
    for (t <- 0 until trials) {
      val st = new ReservoirStats
      PredicateReservoir.run(items, k, theta, new Rng(t + 1), st)
      touched += st.touched
    }
    val avg = touched.toDouble / trials
    assert(avg < 6 * bound + 50, s"avg touches $avg vs bound $bound")
  }
}
