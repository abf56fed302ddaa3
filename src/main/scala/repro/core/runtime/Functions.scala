package repro.core.runtime

import java.io.File
import org.apache.spark.rdd.RDD
import org.apache.spark.sql.SparkSession
import repro.core.json.JsonParser
import repro.core.model._

/** `json-file(path[, partitions])` (paper §5.7): reads a JSON-Lines file as
  * a sequence of items. On the RDD path it is `textFile` + `mapPartitions`
  * with the streaming JSON parser; on the local path (forced-local engines,
  * closures) it streams the file line by line without Spark.
  */
final class JsonFileIterator(pathExpr: RuntimeIterator, partitions: Option[RuntimeIterator])
    extends RuntimeIterator {

  private def path(ctx: DynamicContext): String =
    pathExpr.materializeAtMostOne(ctx) match {
      case Some(s) if s.isString => s.stringValue
      case other => throw new RumbleException("FODC0002", s"json-file needs a path, got $other")
    }

  override def isRDD(ctx: DynamicContext): Boolean =
    !ctx.conf.forceLocal && !ctx.insideClosure

  override def getRDD(ctx: DynamicContext): RDD[Item] = {
    val sc = SparkSession.active.sparkContext
    val p  = path(ctx)
    val parts = partitions
      .flatMap(_.materializeAtMostOne(ctx))
      .map(_.numericDouble.toInt)
      .orElse(ctx.conf.defaultParallelism)
      .getOrElse(sc.defaultParallelism)
    sc.textFile(p, parts)
      .mapPartitions(_.filter(_.trim.nonEmpty).map(JsonParser.parseLine))
  }

  protected def compute(ctx: DynamicContext): Iterator[Item] = {
    val f = new File(path(ctx))
    val files: Seq[File] =
      if (f.isDirectory)
        f.listFiles().filter(x => x.isFile && x.getName.startsWith("part-")).sortBy(_.getName).toSeq
      else Seq(f)
    val overhead = ctx.conf.perItemOverhead
    val parsed = files.iterator.flatMap { file =>
      val src = scala.io.Source.fromFile(file, "UTF-8")
      src.getLines().filter(_.trim.nonEmpty).map { l =>
        var item = JsonParser.parseLine(l)
        var k    = 0
        while (k < overhead) { // model an unoptimized item representation
          item = JsonParser.parse(repro.core.json.JsonWriter.write(item))
          k += 1
        }
        item
      }
    }
    if (!ctx.conf.eagerInput) parsed
    else {
      // Xidel-style: load the whole document set into memory up front,
      // counting against the modeled heap.
      val buf = scala.collection.mutable.ArrayBuffer.empty[Item]
      parsed.foreach { i =>
        HeapModel.check(ctx, buf.size + 1L)
        buf += i
      }
      buf.iterator
    }
  }
}

/** `parallelize(e[, partitions])`: materializes the child sequence on the
  * driver and distributes it as an RDD of items (paper §5.7), triggering
  * Spark-enabled behaviour downstream. */
final class ParallelizeIterator(child: RuntimeIterator, partitions: Option[RuntimeIterator])
    extends RuntimeIterator {
  override def isRDD(ctx: DynamicContext): Boolean =
    !ctx.conf.forceLocal && !ctx.insideClosure
  override def getRDD(ctx: DynamicContext): RDD[Item] = {
    val sc    = SparkSession.active.sparkContext
    val items = child.materialize(ctx)
    val parts = partitions
      .flatMap(_.materializeAtMostOne(ctx))
      .map(_.numericDouble.toInt)
      .getOrElse(sc.defaultParallelism)
    sc.parallelize(items, parts)
  }
  protected def compute(ctx: DynamicContext): Iterator[Item] = child.localIterator(ctx)
}

/** Aggregating and scalar builtin functions. Aggregations over RDD-backed
  * children run as Spark actions (count/sum/... on the cluster, §4.1.2 /
  * §5.5) and return a local singleton — invisible to the caller. */
final class FunctionIterator(name: String, args: List[RuntimeIterator]) extends RuntimeIterator {

  private def arg(i: Int): RuntimeIterator = args(i)

  private def requireArgs(n: Int): Unit =
    if (args.size != n)
      throw new StaticException("XPST0017", s"$name() expects $n argument(s), got ${args.size}")

  protected def compute(ctx: DynamicContext): Iterator[Item] = name match {

    // ----------------------------------------------------------- aggregates
    case "count" =>
      requireArgs(1)
      arg(0) match {
        case f: repro.core.runtime.flwor.FlworIterator =>
          f.tryCountPushdown(ctx).foreach(n => return Iterator.single(IntItem(n)))
        case f: repro.core.runtime.flwor.SimpleFlworRddIterator =>
          f.tryCountPushdown(ctx).foreach(n => return Iterator.single(IntItem(n)))
        case _ =>
      }
      val n =
        if (arg(0).isRDD(ctx)) arg(0).getRDD(ctx).count()
        else {
          var c = 0L; val it = arg(0).localIterator(ctx); while (it.hasNext) { it.next(); c += 1 }
          c
        }
      Iterator.single(IntItem(n))

    case "sum" =>
      requireArgs(1)
      if (arg(0).isRDD(ctx))
        Iterator.single(DoubleItem(arg(0).getRDD(ctx).map(_.numericDouble).sum()))
      else {
        var intSum = 0L; var dSum = 0.0; var allInt = true; var any = false
        arg(0).localIterator(ctx).foreach { i =>
          any = true
          if (i.isInteger && allInt) intSum += i.asInstanceOf[IntItem].value
          else { if (allInt) { dSum = intSum.toDouble; allInt = false }; dSum += i.numericDouble }
        }
        Iterator.single(if (!any) IntItem(0) else if (allInt) IntItem(intSum) else DoubleItem(dSum))
      }

    case "avg" =>
      requireArgs(1)
      if (arg(0).isRDD(ctx)) {
        val rdd   = arg(0).getRDD(ctx).map(_.numericDouble)
        val (s, n) = rdd.map(v => (v, 1L)).fold((0.0, 0L)) { case ((a, b), (c, d)) => (a + c, b + d) }
        if (n == 0) Iterator.empty else Iterator.single(DoubleItem(s / n))
      } else {
        var s = 0.0; var n = 0L
        arg(0).localIterator(ctx).foreach { i => s += i.numericDouble; n += 1 }
        if (n == 0) Iterator.empty else Iterator.single(DoubleItem(s / n))
      }

    case "min" | "max" =>
      requireArgs(1)
      val items =
        if (arg(0).isRDD(ctx)) {
          val rdd = arg(0).getRDD(ctx)
          if (rdd.isEmpty()) Iterator.empty
          else {
            val cmp: (Item, Item) => Item =
              if (name == "min") (a, b) => if (Item.compareAtomics(a, b) <= 0) a else b
              else (a, b) => if (Item.compareAtomics(a, b) >= 0) a else b
            Iterator.single(rdd.reduce(cmp))
          }
        } else {
          val it = arg(0).localIterator(ctx)
          if (!it.hasNext) Iterator.empty
          else {
            var best = it.next()
            while (it.hasNext) {
              val x = it.next()
              val c = Item.compareAtomics(x, best)
              if ((name == "min" && c < 0) || (name == "max" && c > 0)) best = x
            }
            Iterator.single(best)
          }
        }
      items

    case "empty" =>
      requireArgs(1)
      Iterator.single(BooleanItem(
        if (arg(0).isRDD(ctx)) arg(0).getRDD(ctx).isEmpty()
        else !arg(0).localIterator(ctx).hasNext))

    case "exists" =>
      requireArgs(1)
      Iterator.single(BooleanItem(
        if (arg(0).isRDD(ctx)) !arg(0).getRDD(ctx).isEmpty()
        else arg(0).localIterator(ctx).hasNext))

    case "distinct-values" =>
      requireArgs(1)
      if (arg(0).isRDD(ctx)) {
        val rdd = arg(0).getRDD(ctx)
        RddUtils.collectWithCap(
          rdd.map(i => (FunctionIterator.atomicKey(i), i)).reduceByKey((a, _) => a).map(_._2),
          ctx.conf)
      } else {
        val seen = scala.collection.mutable.LinkedHashSet.empty[(Int, String, Double)]
        arg(0).localIterator(ctx).flatMap { i =>
          if (seen.add(FunctionIterator.atomicKey(i))) Some(i) else None
        }
      }

    // ------------------------------------------------------------ sequences
    case "head" =>
      requireArgs(1)
      val it = arg(0).localIterator(ctx)
      if (it.hasNext) Iterator.single(it.next()) else Iterator.empty

    case "tail" =>
      requireArgs(1)
      val it = arg(0).localIterator(ctx)
      if (it.hasNext) { it.next(); it } else Iterator.empty

    case "subsequence" =>
      val it    = arg(0).localIterator(ctx)
      val start = arg(1).materializeAtMostOne(ctx).map(_.numericDouble.toLong).getOrElse(1L)
      val len   =
        if (args.size >= 3) arg(2).materializeAtMostOne(ctx).map(_.numericDouble.toLong)
        else None
      val dropped = it.drop(math.max(0L, start - 1).toInt)
      len match {
        case Some(l) => dropped.take(l.toInt)
        case None    => dropped
      }

    // -------------------------------------------------------------- objects
    case "keys" =>
      requireArgs(1)
      arg(0).localIterator(ctx).flatMap {
        case o: ObjectItem => o.keys.map(StringItem.apply)
        case _             => Vector.empty
      }

    case "values" =>
      requireArgs(1)
      arg(0).localIterator(ctx).flatMap {
        case ObjectItem(fields) => fields.map(_._2)
        case _                  => Vector.empty
      }

    case "size" =>
      requireArgs(1)
      arg(0).materializeAtMostOne(ctx) match {
        case None                  => Iterator.empty
        case Some(ArrayItem(vs))   => Iterator.single(IntItem(vs.size))
        case Some(other) =>
          throw new RumbleException("XPTY0004", s"size() expects an array, got $other")
      }

    // -------------------------------------------------------------- scalars
    case "string" =>
      requireArgs(1)
      arg(0).materializeAtMostOne(ctx) match {
        case None    => Iterator.single(StringItem(""))
        case Some(i) => Iterator.single(StringItem(i.castToString))
      }

    case "integer" =>
      requireArgs(1)
      arg(0).materializeAtMostOne(ctx) match {
        case None => Iterator.empty
        case Some(i) if i.isNumeric => Iterator.single(IntItem(i.numericDouble.toLong))
        case Some(s) if s.isString  =>
          Iterator.single(IntItem(s.stringValue.trim.toDouble.toLong))
        case Some(BooleanItem(b))   => Iterator.single(IntItem(if (b) 1 else 0))
        case Some(other) =>
          throw new RumbleException("XPTY0004", s"cannot cast to integer: $other")
      }

    case "double" | "number" =>
      requireArgs(1)
      arg(0).materializeAtMostOne(ctx) match {
        case None => Iterator.empty
        case Some(i) if i.isNumeric => Iterator.single(DoubleItem(i.numericDouble))
        case Some(s) if s.isString  =>
          Iterator.single(
            try DoubleItem(s.stringValue.trim.toDouble)
            catch { case _: NumberFormatException => DoubleItem(Double.NaN) })
        case Some(BooleanItem(b))   => Iterator.single(DoubleItem(if (b) 1.0 else 0.0))
        case Some(other) =>
          throw new RumbleException("XPTY0004", s"cannot cast to double: $other")
      }

    case "boolean" =>
      requireArgs(1)
      Iterator.single(BooleanItem(arg(0).effectiveBoolean(ctx)))

    case "not" =>
      requireArgs(1)
      Iterator.single(BooleanItem(!arg(0).effectiveBoolean(ctx)))

    case "abs" =>
      requireArgs(1)
      arg(0).materializeAtMostOne(ctx) match {
        case None                  => Iterator.empty
        case Some(IntItem(v))      => Iterator.single(IntItem(math.abs(v)))
        case Some(DoubleItem(v))   => Iterator.single(DoubleItem(math.abs(v)))
        case Some(DecimalItem(v))  => Iterator.single(DecimalItem(v.abs))
        case Some(other) =>
          throw new RumbleException("XPTY0004", s"abs() on non-number: $other")
      }

    case "round" =>
      arg(0).materializeAtMostOne(ctx) match {
        case None    => Iterator.empty
        case Some(i) =>
          val digits =
            if (args.size >= 2)
              arg(1).materializeAtMostOne(ctx).map(_.numericDouble.toInt).getOrElse(0)
            else 0
          val f = math.pow(10, digits)
          Iterator.single(
            if (digits == 0 && i.isInteger) i
            else DoubleItem(math.round(i.numericDouble * f) / f))
      }

    case "string-length" =>
      requireArgs(1)
      arg(0).materializeAtMostOne(ctx) match {
        case None    => Iterator.single(IntItem(0))
        case Some(i) => Iterator.single(IntItem(i.castToString.length.toLong))
      }

    case "substring" =>
      val s     = arg(0).materializeAtMostOne(ctx).map(_.castToString).getOrElse("")
      val start = arg(1).materializeAtMostOne(ctx).map(_.numericDouble.toInt).getOrElse(1)
      val from  = math.max(0, start - 1)
      val res =
        if (args.size >= 3) {
          val len = arg(2).materializeAtMostOne(ctx).map(_.numericDouble.toInt).getOrElse(0)
          s.slice(from, from + math.max(0, len))
        } else s.drop(from)
      Iterator.single(StringItem(res))

    case "lower-case" =>
      requireArgs(1)
      Iterator.single(StringItem(
        arg(0).materializeAtMostOne(ctx).map(_.castToString).getOrElse("").toLowerCase))

    case "upper-case" =>
      requireArgs(1)
      Iterator.single(StringItem(
        arg(0).materializeAtMostOne(ctx).map(_.castToString).getOrElse("").toUpperCase))

    case "contains" =>
      requireArgs(2)
      val s = arg(0).materializeAtMostOne(ctx).map(_.castToString).getOrElse("")
      val t = arg(1).materializeAtMostOne(ctx).map(_.castToString).getOrElse("")
      Iterator.single(BooleanItem(s.contains(t)))

    case "starts-with" =>
      requireArgs(2)
      val s = arg(0).materializeAtMostOne(ctx).map(_.castToString).getOrElse("")
      val t = arg(1).materializeAtMostOne(ctx).map(_.castToString).getOrElse("")
      Iterator.single(BooleanItem(s.startsWith(t)))

    case "concat" =>
      Iterator.single(StringItem(
        args.map(_.materializeAtMostOne(ctx).map(_.castToString).getOrElse("")).mkString))

    case "string-join" =>
      val sep =
        if (args.size >= 2) arg(1).materializeAtMostOne(ctx).map(_.castToString).getOrElse("")
        else ""
      Iterator.single(StringItem(
        arg(0).localIterator(ctx).map(_.castToString).mkString(sep)))

    case other =>
      throw new StaticException("XPST0017", s"unknown function: $other()")
  }
}

object FunctionIterator {
  /** Normalized atomic identity for distinct-values: numerics collapse by
    * value across integer/decimal/double. */
  def atomicKey(i: Item): (Int, String, Double) = i match {
    case NullItem        => (0, "", 0.0)
    case BooleanItem(b)  => (1, "", if (b) 1.0 else 0.0)
    case s if s.isString => (2, s.stringValue, 0.0)
    case n if n.isNumeric => (3, "", n.numericDouble)
    case other           => (4, other.toString, 0.0)
  }
}
