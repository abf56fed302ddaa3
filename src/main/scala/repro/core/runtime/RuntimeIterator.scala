package repro.core.runtime

import org.apache.spark.rdd.RDD
import repro.core.model._

/** Base of all expression runtime iterators (paper §5.4–5.6).
  *
  * Two execution APIs, between which consumers switch seamlessly:
  *
  *  - '''local pull API''' (§5.5): `open(ctx)` / `hasNext` / `next()` /
  *    `reset(ctx)` / `close()`. If the iterator is RDD-capable in the given
  *    context, opening it locally transparently *materializes* the RDD
  *    (streamed via `toLocalIterator`, warning past the configured cap).
  *  - '''RDD API''' (§5.6): `isRDD(ctx)` / `getRDD(ctx)` return the sequence
  *    of items as an `RDD[Item]` built by applying Spark transformations to
  *    the children's RDDs. Never available inside Spark closures
  *    (`ctx.insideClosure`), since Spark jobs do not nest.
  *
  * Subclasses implement `compute` (local semantics as a lazy iterator — the
  * pull API is layered on top, keeping streaming behaviour) and optionally
  * the RDD API.
  */
abstract class RuntimeIterator extends Serializable {

  /** Local streaming semantics of this expression. */
  protected def compute(ctx: DynamicContext): Iterator[Item]

  /** Whether this expression can produce its result as an RDD here. */
  def isRDD(ctx: DynamicContext): Boolean = false

  /** The sequence of items as an RDD of Items; only when `isRDD(ctx)`. */
  def getRDD(ctx: DynamicContext): RDD[Item] =
    throw new RumbleException("RBML0001", s"${getClass.getSimpleName} has no RDD API")

  // ------------------------------------------------------ local pull API

  @transient private var current: Iterator[Item] = _

  def open(ctx: DynamicContext): Unit  = { current = localIterator(ctx) }
  def hasNext: Boolean                 = current.hasNext
  def next(): Item                     = current.next()
  def reset(ctx: DynamicContext): Unit = open(ctx)
  def close(): Unit                    = { current = null }

  /** Local iterator over the result, collecting from the RDD if this
    * expression is Spark-backed (the §5.5 seamless switch). */
  final def localIterator(ctx: DynamicContext): Iterator[Item] =
    if (isRDD(ctx)) RddUtils.collectWithCap(getRDD(ctx), ctx.conf)
    else compute(ctx)

  /** Fully materialized result (used for singleton/small sequences). */
  final def materialize(ctx: DynamicContext): List[Item] = localIterator(ctx).toList

  /** Materialize expecting zero-or-one item (value-comparison operands,
    * sort keys, lookup indices, ...). */
  final def materializeAtMostOne(ctx: DynamicContext): Option[Item] = {
    val it = localIterator(ctx)
    if (!it.hasNext) None
    else {
      val first = it.next()
      if (it.hasNext)
        throw new RumbleException("XPTY0004", "expected a singleton sequence")
      Some(first)
    }
  }

  /** Effective boolean value of this expression's result. */
  final def effectiveBoolean(ctx: DynamicContext): Boolean = {
    val it = localIterator(ctx)
    if (!it.hasNext) false
    else {
      val first = it.next()
      if (!it.hasNext) first.effectiveBoolean
      else if (first.isObject || first.isArray) true
      else throw new RumbleException("FORG0006", "EBV undefined for this sequence")
    }
  }
}

object RddUtils {
  /** Stream an RDD's items to the driver, warning once past the cap
    * (paper §5.5: "a warning is issued if the RDD has more items"). */
  def collectWithCap(rdd: RDD[Item], conf: RumbleConf): Iterator[Item] = {
    var count  = 0L
    var warned = false
    rdd.toLocalIterator.map { item =>
      count += 1
      if (count > conf.materializationCap && !warned) {
        warned = true
        Console.err.println(
          s"[${conf.engineName}] warning: materializing more than " +
          s"${conf.materializationCap} items through the local API")
      }
      item
    }
  }
}
