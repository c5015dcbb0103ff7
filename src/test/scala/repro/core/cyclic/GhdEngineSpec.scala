package repro.core.cyclic

import scala.collection.mutable

import repro.{Oracle, SparkSpec, SynthDataX, TestKit}
import repro.core.{RelSchema, Rng}
import repro.data.StreamGen

class GhdEngineSpec extends SparkSpec {

  /** Brute-force triangles of the directed 3-cycle pattern. */
  private def bruteTriangles(e1: Seq[(Long, Long)], e2: Seq[(Long, Long)],
                             e3: Seq[(Long, Long)]): Set[(Long, Long, Long)] = {
    val s2 = e2.toSet; val s3 = e3.toSet
    (for {
      (x, y) <- e1
      (yy, z) <- e2 if yy == y
      if s3.contains((z, x))
    } yield (x, y, z)).toSet
  }

  test("triangle node produces each triangle exactly once, on its last edge") {
    TestKit.forCases(10) { rng =>
      val edges = StreamGen.graphEdges(60, 14, rng.nextLong())
      val stream = StreamGen.shuffle(
        (for (i <- 1 to 3; e <- edges) yield (s"g$i", Array(e._1, e._2))).toIndexedSeq, rng)
      val node = new TriangleNode("g1", "g2", "g3", "x1", "x2", "x3")
      val got = mutable.ArrayBuffer.empty[(Long, Long, Long)]
      for ((rel, t) <- stream) node.insert(rel, t).foreach(a => got += ((a(0), a(1), a(2))))
      val expected = bruteTriangles(edges, edges, edges)
      assert(got.size === got.toSet.size, "triangle produced twice")
      assert(got.toSet === expected)
    }
  }

  test("triangle GHD engine with k >= all samples every triangle (DuckDB oracle)") {
    val edges = StreamGen.graphEdges(80, 16, 7)
    val rng = new Rng(3)
    val stream = StreamGen.shuffle(
      (for (i <- 1 to 3; e <- edges) yield (s"g$i", Array(e._1, e._2))).toIndexedSeq, rng)
    val engine = GhdEngine.triangle(k = 100000, seed = 5)
    stream.foreach { case (r, t) => engine.insert(r, t) }
    val sample = engine.sample
    assert(sample.nonEmpty, "no triangles in the test graph")
    // Oracle: DuckDB triangle SQL over the edge table.
    val schema = RelSchema("tri", Vector("x1", "x2", "x3"))
    val df = SynthDataX.tableDf(spark, schema,
      sample.map(r => Array(r("x1"), r("x2"), r("x3"))))
    Oracle.assertEquivalent(df,
      """SELECT g1.src AS x1, g1.dst AS x2, g2.dst AS x3
        |FROM g AS g1, g AS g2, g AS g3
        |WHERE g1.dst = g2.src AND g2.dst = g3.src AND g3.dst = g1.src""".stripMargin,
      "g" -> SynthDataX.edgesDf(spark, edges))
  }

  test("dumbbell engine with k >= all covers the brute-force dumbbell join") {
    val edges = StreamGen.graphEdges(40, 11, 11)
    val stream = StreamGen.dumbbell(edges, seed = 9)
    val engine = GhdEngine.dumbbell(k = 500000, seed = 5)
    stream.foreach { case (r, t) => engine.insert(r, t) }
    val tris = bruteTriangles(edges, edges, edges)
    val bridge = edges.toSet
    val expected = for {
      (x1, x2, x3) <- tris
      (b1, x4) <- bridge if b1 == x1
      (y4, y5, y6) <- tris if y4 == x4
    } yield Map("x1" -> x1, "x2" -> x2, "x3" -> x3, "x4" -> x4, "x5" -> y5, "x6" -> y6)
    val got = engine.sample.toSet
    assert(got === expected.toSet,
      s"got ${got.size} expected ${expected.size} dumbbells")
  }

  test("dumbbell sampling is uniform over dumbbells (small instance)") {
    // Find a seed with a convenient number of dumbbells.
    val edges = StreamGen.graphEdges(35, 9, 13)
    val stream = StreamGen.dumbbell(edges, seed = 2)
    val probe = GhdEngine.dumbbell(k = 500000, seed = 1)
    stream.foreach { case (r, t) => probe.insert(r, t) }
    val all = probe.sample.toSet
    val m = all.size
    assert(m >= 10, s"only $m dumbbells — enlarge the instance")
    val k = 4
    val runs = 800
    val counts = mutable.HashMap.empty[Map[String, Long], Int].withDefaultValue(0)
    for (r <- 0 until runs) {
      val e = GhdEngine.dumbbell(k, seed = 100 + r)
      stream.foreach { case (rel, t) => e.insert(rel, t) }
      e.sample.foreach(row => counts(row) += 1)
    }
    assert(counts.keySet.subsetOf(all))
    repro.TestKit.assertUniform(counts.toMap, m, k, runs, "dumbbell")
  }

  test("simulated stream size is bounded and counted") {
    val edges = StreamGen.graphEdges(50, 12, 17)
    val stream = StreamGen.dumbbell(edges, seed = 3)
    val engine = GhdEngine.dumbbell(k = 10, seed = 4)
    stream.foreach { case (r, t) => engine.insert(r, t) }
    // Simulated inserts = 2·(#triangles) + |G7| exactly.
    val tris = bruteTriangles(edges, edges, edges).size
    assert(engine.simulatedInserts === 2L * tris + edges.size)
  }

  test("unknown relation is rejected") {
    intercept[IllegalArgumentException](
      GhdEngine.triangle(1, 1).insert("g9", Array(1L, 2L)))
  }
}
