package repro.core

import Proj.JoinRow

/** Common surface of every reservoir-over-join engine in this repo
  * (RSJoin, RSJoin+grouping, SJoin, the FK-combined variants, the GHD
  * engine), so the benchmark harnesses and cross-engine tests are generic.
  */
trait SamplingEngine extends Serializable {

  /** Process one streamed tuple: maintain the index and the reservoir. */
  def insert(rel: String, values: Array[Long]): Unit

  /** Index maintenance only — used by the update-time experiment (Fig. 6). */
  def updateIndexOnly(rel: String, values: Array[Long]): Unit

  /** Current uniform sample (≤ k rows) of the join results so far. */
  def sample: Seq[JoinRow]

  /** Executions of the update-propagation loop so far (Fig. 9 metric). */
  def propagations: Long

  /** Structure-proportional memory estimate in bytes (Fig. 11 metric). */
  def approxBytes: Long
}
