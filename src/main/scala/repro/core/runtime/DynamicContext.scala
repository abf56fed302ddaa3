package repro.core.runtime

import repro.core.model._

/** Engine configuration.
  *
  * @param forceLocal          disable all Spark execution (used by the
  *                            single-threaded Zorba/Xidel stand-ins, §6.3)
  * @param materializationCap  max items materialized from an RDD through the
  *                            local API before a warning is issued (§5.5)
  * @param heapModelCap        if set, local materialization points (group-by,
  *                            order-by, parse-all) throw [[HeapModelExceeded]]
  *                            past this many items — models the 16 GB laptop
  *                            OOMs of the paper's single-threaded baselines
  * @param engineName          name used in heap-model errors / warnings
  * @param defaultParallelism  partitions for json-file when not specified
  * @param eagerInput          parse the *whole* input file into memory before
  *                            evaluation starts (models Xidel's DOM-style
  *                            loading; counts against the heap model)
  * @param perItemOverhead     extra serialize+parse round-trips per input
  *                            item (models a less optimized item
  *                            representation in the naive engine)
  */
final case class RumbleConf(
    forceLocal: Boolean = false,
    materializationCap: Long = 10_000_000L,
    heapModelCap: Option[Long] = None,
    engineName: String = "rumble",
    defaultParallelism: Option[Int] = None,
    eagerInput: Boolean = false,
    perItemOverhead: Int = 0,
) extends Serializable

object HeapModel {
  /** Enforce the modeled heap cap at a materialization point. */
  def check(ctx: DynamicContext, n: Long): Unit =
    ctx.conf.heapModelCap.foreach { cap =>
      if (n > cap) throw new HeapModelExceeded(ctx.conf.engineName, n, cap)
    }
}

/** Dynamic context (paper §5.5): chained variable bindings plus the context
  * item (`$$`, bound inside predicates). Serializable so it can travel into
  * Spark closures together with the runtime iterators it parameterizes
  * (§5.6). `insideClosure` marks contexts used on executors, where the RDD
  * API must not be invoked ("Spark jobs do not nest").
  */
final class DynamicContext(
    val parent: Option[DynamicContext],
    val vars: Map[String, List[Item]],
    val contextItem: Option[Item],
    val insideClosure: Boolean,
    val conf: RumbleConf,
) extends Serializable {

  def lookup(name: String): Option[List[Item]] =
    vars.get(name).orElse(parent.flatMap(_.lookup(name)))

  def lookupOrFail(name: String): List[Item] =
    lookup(name).getOrElse(
      throw new RumbleException("XPDY0002", s"variable $$$name not bound at runtime"))

  def bind(name: String, seq: List[Item]): DynamicContext =
    new DynamicContext(Some(this), Map(name -> seq), contextItem, insideClosure, conf)

  def bindAll(m: Map[String, List[Item]]): DynamicContext =
    if (m.isEmpty) this
    else new DynamicContext(Some(this), m, contextItem, insideClosure, conf)

  def withContextItem(item: Item): DynamicContext =
    new DynamicContext(Some(this), Map.empty, Some(item), insideClosure, conf)

  /** Context handed to code that runs inside a Spark closure. */
  def enterClosure: DynamicContext =
    new DynamicContext(Some(this), Map.empty, contextItem, insideClosure = true, conf)
}

object DynamicContext {
  def root(conf: RumbleConf): DynamicContext =
    new DynamicContext(None, Map.empty, None, insideClosure = false, conf)
}
