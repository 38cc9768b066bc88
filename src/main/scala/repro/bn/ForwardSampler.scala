package repro.bn

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.util.Rng

/** One training observation in the distributed stream.
  *
  * @param id   global arrival index (0-based); defines stream order
  * @param site the site that receives the event (uniform random, as in the paper)
  * @param x    full assignment of all n variables
  */
final case class Event(id: Long, site: Int, x: Array[Int])

/** Distributed ancestral sampling of training events on Spark.
  *
  * Each event is deterministic in (seed, id) via the counter-based RNG, so
  * a Spark-generated stream and a driver-side regeneration are identical —
  * the DuckDB oracle and the sequential simulator see the same data.
  */
object ForwardSampler {

  /** Dataset of `m` events sampled from `net`, routed to `k` sites. */
  def events(spark: SparkSession, net: BayesianNetwork, m: Long, k: Int,
             seed: Long): Dataset[Event] = {
    import spark.implicits._
    require(k >= 1, s"need at least one site, got $k")
    spark.range(m).mapPartitions { ids =>
      ids.map { id => sampleEvent(net, k, seed, id) }
    }
  }

  /** The single-event sampler shared by Spark and driver-side generation. */
  def sampleEvent(net: BayesianNetwork, k: Int, seed: Long, id: Long): Event =
    Event(id, Rng.uniformInt(k, seed, 0x517eL, id), net.sample(seed, id))

  /** Driver-side generation of the full stream in arrival order. */
  def localEvents(net: BayesianNetwork, m: Long, k: Int, seed: Long): Iterator[Event] =
    Iterator.range(0L, m).map(id => sampleEvent(net, k, seed, id))
}
