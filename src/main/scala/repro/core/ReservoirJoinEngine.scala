package repro.core

import Proj.JoinRow

/** RSJoin (Algorithm 6): reservoir sampling over an acyclic join.
  *
  * One [[TreeIndex]] is maintained per relation (the tree rooted at that
  * relation generates the delta batch when a tuple arrives there). Each
  * insert updates every tree in O(log N) amortized, then feeds the implicit
  * `ΔJ` batch into the predicate-enabled batched reservoir.
  *
  * The engine is serializable end-to-end so the Spark streaming operator can
  * keep it in the state store between micro-batches.
  *
  * @param grouping  enable the Section 4.4 grouping optimization
  */
final class ReservoirJoinEngine(
    val query: JoinQuery,
    val k: Int,
    seed: Long,
    grouping: Boolean = false,
    trackFullJoin: Boolean = true,
) extends SamplingEngine {

  val stores: Vector[RelationStore] = query.relations.map(new RelationStore(_))
  val counters = new EngineCounters

  private val unrootedEdges: Vector[(Int, Int)] = JoinTree.unrooted(query).getOrElse(
    throw new IllegalArgumentException(
      s"query ${query.name} is cyclic — use the GHD engine (Section 5)"))

  val trees: Vector[TreeIndex] =
    query.relations.indices.map { r =>
      new TreeIndex(JoinTree.rooted(query, unrootedEdges, r), stores, grouping,
        counters, trackRoot = trackFullJoin)
    }.toVector

  val rng = new Rng(seed)
  val reservoir = new BatchReservoir[JoinRow](k, rng)
  var inserts: Long = 0L

  /** Index maintenance only — what Fig. 6 times with sampling disabled.
    * Returns the delta batch of the inserted tuple.
    */
  def updateOnly(rel: String, values: Array[Long]): Batch[JoinRow] = {
    val r = query.relIdx.getOrElse(rel,
      throw new IllegalArgumentException(s"unknown relation $rel in ${query.name}"))
    val id = stores(r).insert(values)
    var i = 0
    while (i < trees.length) { trees(i).onInsert(r, id); i += 1 }
    inserts += 1
    trees(r).deltaBatch(id)
  }

  /** Full Algorithm 6 step: update the index, then sample the delta batch. */
  def insert(rel: String, values: Array[Long]): Unit =
    reservoir.update(updateOnly(rel, values))

  def updateIndexOnly(rel: String, values: Array[Long]): Unit = {
    updateOnly(rel, values); ()
  }

  def propagations: Long = counters.propagations

  /** Current reservoir contents (uniform k-sample of `Q(R)` w/o replacement). */
  def sample: Seq[JoinRow] = reservoir.sample.toSeq

  /** Structure-proportional memory estimate (Fig. 11). */
  def approxBytes: Long =
    stores.map(_.approxBytes).sum + trees.map(_.approxBytes).sum
}

/** Dynamic sampling over the full join (operation (2) of Theorem 4.2):
  * draw single uniform samples from `Q(R)` at any point of the stream, in
  * O(log N) expected time, via the root ∅-key structure of one tree.
  */
final class FullJoinSampler(engine: ReservoirJoinEngine, seed: Long, treeIdx: Int = 0)
    extends Serializable {
  private val tree = engine.trees(treeIdx)
  private val rng = new Rng(seed)

  /** `|J|` — a constant-factor upper bound on `|Q(R)|`. */
  def joinUpperBound: Long = tree.fullCount

  /** One uniform sample from `Q(R)`, or None if the join is empty.
    * Expected O(1) rejection rounds thanks to the density guarantee.
    */
  def draw(maxTries: Int = 100000): Option[JoinRow] = {
    val total = tree.fullCount
    if (total == 0) return None
    var tries = 0
    while (tries < maxTries) {
      val z = rng.nextLong(total)
      tree.retrieveFull(z) match {
        case some @ Some(_) => return some
        case None           => tries += 1
      }
    }
    None // statistically unreachable for dense J unless the join is empty
  }
}
