package repro.core

import repro.SparkSpec

class RngSpec extends SparkSpec {

  test("deterministic for the same seed") {
    val a = new Rng(42); val b = new Rng(42)
    assert((1 to 100).map(_ => a.nextLong()) === (1 to 100).map(_ => b.nextLong()))
  }

  test("different seeds diverge") {
    val a = new Rng(1); val b = new Rng(2)
    assert((1 to 10).map(_ => a.nextLong()) !== (1 to 10).map(_ => b.nextLong()))
  }

  test("nextDouble in [0,1) and roughly uniform") {
    val rng = new Rng(7)
    val xs = Seq.fill(20000)(rng.nextDouble())
    assert(xs.forall(x => x >= 0.0 && x < 1.0))
    val mean = xs.sum / xs.size
    assert(math.abs(mean - 0.5) < 0.02, s"mean $mean far from 0.5")
  }

  test("nextDoubleOpen never returns 0") {
    val rng = new Rng(9)
    assert((1 to 100000).forall(_ => rng.nextDoubleOpen() > 0.0))
  }

  test("nextLong(bound) stays in range and is roughly uniform") {
    val rng = new Rng(11)
    val bound = 10L
    val counts = new Array[Int](10)
    for (_ <- 1 to 50000) {
      val v = rng.nextLong(bound)
      assert(v >= 0 && v < bound)
      counts(v.toInt) += 1
    }
    // expected 5000 per cell; 5σ ≈ 335
    assert(counts.forall(c => math.abs(c - 5000) < 400), counts.mkString(","))
  }

  test("nextLong(bound) works for non-power-of-two and 1") {
    val rng = new Rng(13)
    assert((1 to 1000).forall(_ => rng.nextLong(1) == 0))
    assert((1 to 1000).forall(_ => { val v = rng.nextLong(7); v >= 0 && v < 7 }))
  }

  test("nextInt(bound) rejects non-positive bounds") {
    intercept[IllegalArgumentException](new Rng(1).nextInt(0))
  }

  test("survives java serialization with identical continuation") {
    val rng = new Rng(99)
    rng.nextLong(); rng.nextLong()
    val bos = new java.io.ByteArrayOutputStream
    val oos = new java.io.ObjectOutputStream(bos); oos.writeObject(rng); oos.close()
    val copy = new java.io.ObjectInputStream(
      new java.io.ByteArrayInputStream(bos.toByteArray)).readObject().asInstanceOf[Rng]
    assert((1 to 50).map(_ => rng.nextLong()) === (1 to 50).map(_ => copy.nextLong()))
  }
}
