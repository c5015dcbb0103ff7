package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.bench.Experiments
import repro.bench.Experiments.Scale

/** Shared plumbing for the spark-submit entrypoints (one object per
  * evaluation table; see DESIGN.md §4). All heavy computation runs on the
  * driver (the paper's engines are single-threaded); Spark provides the
  * execution harness and, where used, the data plane.
  *
  * Args (all optional, positional): edges nodes kGraph kRel tpcdsSf q10Sf budgetSec
  */
object Jobs {
  def scaleFrom(args: Array[String]): Scale = {
    val d = Scale()
    Scale(
      graphEdges = args.lift(0).map(_.toInt).getOrElse(d.graphEdges),
      graphNodes = args.lift(1).map(_.toInt).getOrElse(d.graphNodes),
      kGraph = args.lift(2).map(_.toInt).getOrElse(d.kGraph),
      kRel = args.lift(3).map(_.toInt).getOrElse(d.kRel),
      tpcdsSf = args.lift(4).map(_.toDouble).getOrElse(d.tpcdsSf),
      q10Sf = args.lift(5).map(_.toDouble).getOrElse(d.q10Sf),
      budgetSec = args.lift(6).map(_.toDouble).getOrElse(d.budgetSec),
    )
  }

  def withSession[A](name: String)(f: SparkSession => A): A = {
    val spark = SparkSession.builder().master(
      sys.env.getOrElse("SPARK_MASTER", "local[*]")).appName(name).getOrCreate()
    try f(spark) finally spark.stop()
  }
}

/** T1 — Fig. 5. */
object RunningTimeJob {
  def main(args: Array[String]): Unit = Jobs.withSession("t1-running-time") { _ =>
    println(Experiments.t1RunningTime(Jobs.scaleFrom(args)))
  }
}

/** T2 — Fig. 6. */
object UpdateTimeJob {
  def main(args: Array[String]): Unit = Jobs.withSession("t2-update-time") { _ =>
    println(Experiments.t2UpdateTime(Jobs.scaleFrom(args)))
  }
}

/** T3 — Fig. 7. */
object InputJoinSizeJob {
  def main(args: Array[String]): Unit = Jobs.withSession("t3-input-join-size") { _ =>
    println(Experiments.t3InputJoinSize(Jobs.scaleFrom(args)))
  }
}

/** T4 — Fig. 8. */
object SampleSizeJob {
  def main(args: Array[String]): Unit = Jobs.withSession("t4-sample-size") { _ =>
    val s = Jobs.scaleFrom(args)
    val n = s.graphEdges * 3
    println(Experiments.t4SampleSize(s, Seq(100, 1000, 10000, n, 4 * n, 20 * n)))
  }
}

/** T5 — Fig. 9 (table). */
object OptimizationsJob {
  def main(args: Array[String]): Unit = Jobs.withSession("t5-optimizations") { _ =>
    println(Experiments.t5Optimizations(Jobs.scaleFrom(args)))
  }
}

/** T6 — Fig. 10. */
object ScalabilityJob {
  def main(args: Array[String]): Unit = Jobs.withSession("t6-scalability") { _ =>
    println(Experiments.t6Scalability(Jobs.scaleFrom(args), Seq(1, 3, 10, 30)))
  }
}

/** T7 — Fig. 11. */
object MemoryJob {
  def main(args: Array[String]): Unit = Jobs.withSession("t7-memory") { _ =>
    println(Experiments.t7Memory(Jobs.scaleFrom(args)))
  }
}

/** T8/T9 — Figs. 12–13. */
object RswpJob {
  def main(args: Array[String]): Unit = Jobs.withSession("t8-t9-rswp") { _ =>
    println(Experiments.t8RswpProgress())
    println()
    println(Experiments.t9RswpDensity())
  }
}

/** Demo of the Structured Streaming operator: streams a line-3 workload
  * through `flatMapGroupsWithState` micro-batches and prints snapshots.
  */
object StreamingDemoJob {
  def main(args: Array[String]): Unit = Jobs.withSession("streaming-demo") { spark =>
    import spark.implicits._
    import org.apache.spark.sql.execution.streaming.runtime.MemoryStream
    import repro.data.StreamGen
    import repro.queries.Queries
    import repro.spark.{StreamingReservoirJoin, TaggedTuple}

    implicit val sqlCtx: org.apache.spark.sql.SQLContext = spark.sqlContext
    val s = Jobs.scaleFrom(args)
    val edges = StreamGen.graphEdges(math.min(s.graphEdges, 5000), s.graphNodes, s.seed)
    val stream = StreamGen.lineK(3, edges, s.seed).stream
    val ms = MemoryStream[TaggedTuple]
    val out = StreamingReservoirJoin.attach(ms.toDS(), Queries.lineK(3), k = 1000, seed = s.seed)
    val q = out.writeStream.format("memory").queryName("snaps").outputMode("update").start()
    val tagged = stream.zipWithIndex.map { case ((r, v), i) => TaggedTuple(i.toLong, r, v.toSeq) }
    tagged.grouped(math.max(1, tagged.size / 8)).foreach { chunk =>
      ms.addData(chunk); q.processAllAvailable()
    }
    q.stop()
    spark.table("snaps").orderBy("lastSeq")
      .select("lastSeq", "tuplesSeen", "sampleSize").show(20, truncate = false)
  }
}
