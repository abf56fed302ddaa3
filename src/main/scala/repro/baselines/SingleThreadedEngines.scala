package repro.baselines

import org.apache.spark.sql.SparkSession
import repro.core.Rumble
import repro.core.runtime.RumbleConf

/** Single-threaded JSONiq engine stand-ins for the §6.3 comparison.
  *
  * '''Substitution''': Zorba (C++) and Xidel (Pascal) binaries are not
  * available offline. Both stand-ins run the *same* JSONiq front-end but
  * with Spark disabled, reproducing the architectural properties the paper
  * measures:
  *
  *  - '''Zorba-sim''': streaming single-threaded iterators; group-by and
  *    order-by materialize the tuple stream, bounded by a modeled heap →
  *    like the real Zorba it filters any size but runs out of memory on
  *    group/sort past a threshold.
  *  - '''Xidel-sim''': loads the *entire* parsed input into memory before
  *    evaluating (DOM style) and pays extra per-item representation
  *    overhead → slower everywhere, DNFs on every query past its (smaller)
  *    threshold, like the real Xidel in Fig. 12.
  */
object SingleThreadedEngines {

  /** Zorba stand-in: streaming, single-threaded, heap-capped group/sort. */
  def zorbaSim(spark: SparkSession, heapCapItems: Option[Long]): Rumble =
    new Rumble(spark, RumbleConf(
      forceLocal = true,
      heapModelCap = heapCapItems,
      engineName = "zorba-sim"))

  /** Xidel stand-in: eager parse-all input, extra per-item overhead. */
  def xidelSim(spark: SparkSession, heapCapItems: Option[Long]): Rumble =
    new Rumble(spark, RumbleConf(
      forceLocal = true,
      heapModelCap = heapCapItems,
      engineName = "xidel-sim",
      eagerInput = true,
      perItemOverhead = 2))
}
