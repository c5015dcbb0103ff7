package repro.core

import repro.{SparkSpec, TestKit}

class BatchReservoirSpec extends SparkSpec {

  private def splitIntoBatches(items: IndexedSeq[Int], rng: Rng): Seq[IndexedSeq[Int]] = {
    val out = Seq.newBuilder[IndexedSeq[Int]]
    var i = 0
    while (i < items.length) {
      val sz = 1 + rng.nextInt(17)
      out += items.slice(i, math.min(items.length, i + sz))
      i += sz
    }
    out.result()
  }

  test("identical to Algorithm 1 on the concatenated stream (same RNG)") {
    // Algorithms 4/5 are the same stochastic process as Algorithm 1 — with a
    // shared seed the two must produce byte-identical reservoirs, whatever
    // the batch boundaries.
    TestKit.forCases(60) { rng =>
      val n = 200 + rng.nextInt(800)
      val k = 1 + rng.nextInt(20)
      val seed = rng.nextLong()
      val items = (0 until n).toIndexedSeq
      val theta = (x: Int) => (x * 2654435761L >>> 3) % 3 != 0 // ~2/3 dense
      val s1 = PredicateReservoir.run(items, k, theta, new Rng(seed))
      val br = new BatchReservoir[Int](k, new Rng(seed))
      splitIntoBatches(items, rng).foreach(b => br.update(Batch.fromSeq(b, theta)))
      assert(br.sample === s1)
    }
  }

  for (k <- Seq(1, 2, 5, 17, 64)) {
    test(s"batched ≡ Algorithm 1 for k = $k") {
      TestKit.forCases(15, seed0 = k) { rng =>
        val seed = rng.nextLong()
        val items = (0 until 400).toIndexedSeq
        val theta = (x: Int) => x % 5 != 0
        val s1 = PredicateReservoir.run(items, k, theta, new Rng(seed))
        val br = new BatchReservoir[Int](k, new Rng(seed))
        splitIntoBatches(items, rng).foreach(b => br.update(Batch.fromSeq(b, theta)))
        assert(br.sample === s1)
      }
    }
  }

  test("skip counts carry across batch boundaries (many tiny batches)") {
    TestKit.forCases(30) { rng =>
      val seed = rng.nextLong()
      val items = (0 until 2000).toIndexedSeq
      val theta = (_: Int) => true
      val s1 = PredicateReservoir.run(items, 3, theta, new Rng(seed))
      val br = new BatchReservoir[Int](3, new Rng(seed))
      items.foreach(x => br.update(Batch.fromSeq(IndexedSeq(x), theta))) // batch size 1
      assert(br.sample === s1)
    }
  }

  test("empty batches are no-ops") {
    val seed = 42L
    val items = (0 until 500).toIndexedSeq
    val s1 = PredicateReservoir.run(items, 7, (_: Int) => true, new Rng(seed))
    val br = new BatchReservoir[Int](7, new Rng(seed))
    for (x <- items) {
      br.update(Batch.fromSeq(IndexedSeq.empty[Int], (_: Int) => true))
      br.update(Batch.fromSeq(IndexedSeq(x), (_: Int) => true))
    }
    assert(br.sample === s1)
  }

  test("w/q initialized exactly once even when the fill spans many batches") {
    // k=10 but batches of size 1 with only every 3rd item real: the fill
    // phase spans 30 batches; afterwards sampling must still be uniform.
    val k = 4
    val runs = 2500
    val n = 90
    val theta = (x: Int) => x % 3 == 0
    val m = (0 until n).count(theta)
    val counts = scala.collection.mutable.HashMap.empty[Int, Int].withDefaultValue(0)
    for (r <- 0 until runs) {
      val br = new BatchReservoir[Int](k, new Rng(r * 31L + 5))
      (0 until n).foreach(x => br.update(Batch.fromSeq(IndexedSeq(x), theta)))
      br.sample.foreach(x => counts(x) += 1)
    }
    TestKit.assertUniform(counts.toMap, m, k, runs, "batched fill")
  }

  test("uniform over items spread across uneven batches") {
    val k = 6
    val runs = 2500
    val items = (0 until 300).toIndexedSeq
    val theta = (x: Int) => x % 2 == 0
    val m = items.count(theta)
    val counts = scala.collection.mutable.HashMap.empty[Int, Int].withDefaultValue(0)
    for (r <- 0 until runs) {
      val rng = new Rng(r * 77L + 3)
      val br = new BatchReservoir[Int](k, new Rng(r * 13L + 1))
      splitIntoBatches(items, rng).foreach(b => br.update(Batch.fromSeq(b, theta)))
      br.sample.foreach(x => counts(x) += 1)
    }
    TestKit.assertUniform(counts.toMap, m, k, runs, "uneven batches")
  }

  test("itemsOffered accumulates batch sizes") {
    val br = new BatchReservoir[Int](3, new Rng(1))
    br.update(Batch.fromSeq((0 until 10).toIndexedSeq, (_: Int) => true))
    br.update(Batch.fromSeq((0 until 5).toIndexedSeq, (_: Int) => false))
    assert(br.itemsOffered === 15L)
  }

  test("rejects non-positive k") {
    intercept[IllegalArgumentException](new BatchReservoir[Int](0, new Rng(1)))
  }
}
