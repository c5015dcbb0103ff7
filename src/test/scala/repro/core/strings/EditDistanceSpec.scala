package repro.core.strings

import repro.{SparkSpec, TestKit}
import repro.core.Rng

class EditDistanceSpec extends SparkSpec {

  test("distance basics") {
    assert(EditDistance.distance("", "") === 0)
    assert(EditDistance.distance("abc", "abc") === 0)
    assert(EditDistance.distance("abc", "abd") === 1)
    assert(EditDistance.distance("abc", "ab") === 1)
    assert(EditDistance.distance("kitten", "sitting") === 3)
    assert(EditDistance.distance("", "xyz") === 3)
  }

  test("within agrees with full distance on random pairs, all taus") {
    TestKit.forCases(200) { rng =>
      val a = StringStream.randomString(1 + rng.nextInt(30), rng)
      val b = StringStream.randomString(1 + rng.nextInt(30), rng)
      val d = EditDistance.distance(a, b)
      for (tau <- 0 to 12)
        assert(EditDistance.within(a, b, tau) === (d <= tau),
          s"a=$a b=$b d=$d tau=$tau")
    }
  }

  test("within handles perturbed strings near the threshold") {
    TestKit.forCases(100) { rng =>
      val base = StringStream.randomString(64, rng)
      val d = rng.nextInt(17)
      val s = StringStream.perturb(base, d, rng)
      val dist = EditDistance.distance(base, s)
      assert(dist <= d)
      assert(EditDistance.within(base, s, 16) === (dist <= 16))
    }
  }

  test("perturb changes exactly d positions") {
    val rng = new Rng(5)
    val base = StringStream.randomString(100, rng)
    val s = StringStream.perturb(base, 10, rng)
    assert(base.zip(s).count { case (x, y) => x != y } === 10)
  }

  test("generate hits the requested density approximately") {
    val (base, items) = StringStream.generate(4000, 64, 8, 0.3, seed = 17)
    val real = items.count(EditDistance.within(base, _, 8))
    val frac = real.toDouble / items.size
    assert(math.abs(frac - 0.3) < 0.05, s"density $frac")
  }

  test("generate with density 0 and 1") {
    val (b0, i0) = StringStream.generate(300, 64, 8, 0.0, seed = 3)
    assert(i0.forall(!EditDistance.within(b0, _, 8)))
    val (b1, i1) = StringStream.generate(300, 64, 8, 1.0, seed = 4)
    assert(i1.forall(EditDistance.within(b1, _, 8)))
  }
}
