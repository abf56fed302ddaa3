package repro.core.runtime

import org.apache.spark.rdd.RDD
import repro.core.model._

/** Literal atomic value. */
final class LiteralIterator(item: Item) extends RuntimeIterator {
  protected def compute(ctx: DynamicContext): Iterator[Item] = Iterator.single(item)
}

/** `()` — the empty sequence. */
final class EmptySequenceIterator extends RuntimeIterator {
  protected def compute(ctx: DynamicContext): Iterator[Item] = Iterator.empty
}

/** `$name` — variable reference, resolved against the dynamic context. */
final class VarRefIterator(val name: String) extends RuntimeIterator {
  protected def compute(ctx: DynamicContext): Iterator[Item] =
    ctx.lookupOrFail(name).iterator
}

/** `$$` — context item (inside predicates). */
final class ContextItemIterator extends RuntimeIterator {
  protected def compute(ctx: DynamicContext): Iterator[Item] =
    ctx.contextItem match {
      case Some(item) => Iterator.single(item)
      case None => throw new RumbleException("XPDY0002", "context item ($$) not bound")
    }
}

/** `e1, e2, ...` — sequence concatenation. RDD-capable when every child is
  * (union of the children's RDDs); otherwise children are drained locally. */
final class CommaIterator(children: List[RuntimeIterator]) extends RuntimeIterator {
  protected def compute(ctx: DynamicContext): Iterator[Item] =
    children.iterator.flatMap(_.localIterator(ctx))
  override def isRDD(ctx: DynamicContext): Boolean =
    children.nonEmpty && children.forall(_.isRDD(ctx))
  override def getRDD(ctx: DynamicContext): RDD[Item] =
    children.map(_.getRDD(ctx)).reduce(_ union _)
}

/** `a to b` — integer range (inclusive); empty operand or a > b → empty. */
final class RangeIterator(from: RuntimeIterator, to: RuntimeIterator) extends RuntimeIterator {
  protected def compute(ctx: DynamicContext): Iterator[Item] =
    (from.materializeAtMostOne(ctx), to.materializeAtMostOne(ctx)) match {
      case (Some(a), Some(b)) =>
        val (lo, hi) = (asLong(a), asLong(b))
        if (lo > hi) Iterator.empty else (lo to hi).iterator.map(IntItem.apply)
      case _ => Iterator.empty
    }
  private def asLong(i: Item): Long =
    if (i.isInteger) i.asInstanceOf[IntItem].value
    else throw new RumbleException("XPTY0004", s"'to' requires integers, got $i")
}

/** Arithmetic `+ - * div idiv mod` with numeric promotion:
  * integer op integer stays integral (except div → double), any double
  * operand promotes to double, decimals use BigDecimal arithmetic.
  * Empty operand → empty result (XQuery semantics). */
final class ArithmeticIterator(op: String, lhs: RuntimeIterator, rhs: RuntimeIterator)
    extends RuntimeIterator {
  protected def compute(ctx: DynamicContext): Iterator[Item] =
    (lhs.materializeAtMostOne(ctx), rhs.materializeAtMostOne(ctx)) match {
      case (Some(a), Some(b)) => Iterator.single(apply(a, b))
      case _                  => Iterator.empty
    }

  private def apply(a: Item, b: Item): Item = {
    if (!a.isNumeric || !b.isNumeric)
      throw new RumbleException("XPTY0004", s"arithmetic on non-numbers: $a $op $b")
    (a, b) match {
      case (IntItem(x), IntItem(y)) =>
        op match {
          case "+"    => IntItem(x + y)
          case "-"    => IntItem(x - y)
          case "*"    => IntItem(x * y)
          case "div"  =>
            if (y == 0) throw new RumbleException("FOAR0001", "division by zero")
            DoubleItem(x.toDouble / y.toDouble)
          case "idiv" =>
            if (y == 0) throw new RumbleException("FOAR0001", "division by zero")
            IntItem(x / y)
          case "mod"  =>
            if (y == 0) throw new RumbleException("FOAR0001", "division by zero")
            IntItem(x % y)
        }
      case (DecimalItem(x), _) if !b.isInstanceOf[DoubleItem] => decimalOp(x, toDec(b))
      case (_, DecimalItem(y)) if !a.isInstanceOf[DoubleItem] => decimalOp(toDec(a), y)
      case _ =>
        val (x, y) = (a.numericDouble, b.numericDouble)
        op match {
          case "+"    => DoubleItem(x + y)
          case "-"    => DoubleItem(x - y)
          case "*"    => DoubleItem(x * y)
          case "div"  => DoubleItem(x / y)
          case "idiv" =>
            if (y == 0) throw new RumbleException("FOAR0001", "division by zero")
            IntItem((x / y).toLong)
          case "mod"  => DoubleItem(x % y)
        }
    }
  }

  private def toDec(i: Item): BigDecimal = i match {
    case IntItem(v)     => BigDecimal(v)
    case DecimalItem(v) => v
    case other          => BigDecimal(other.numericDouble)
  }

  private def decimalOp(x: BigDecimal, y: BigDecimal): Item = op match {
    case "+"    => DecimalItem(x + y)
    case "-"    => DecimalItem(x - y)
    case "*"    => DecimalItem(x * y)
    case "div"  =>
      if (y.signum == 0) throw new RumbleException("FOAR0001", "division by zero")
      DecimalItem(BigDecimal(x.bigDecimal.divide(y.bigDecimal, java.math.MathContext.DECIMAL64)))
    case "idiv" =>
      if (y.signum == 0) throw new RumbleException("FOAR0001", "division by zero")
      IntItem((x / y).toLong)
    case "mod"  => DecimalItem(x % y)
  }
}

final class UnaryMinusIterator(child: RuntimeIterator) extends RuntimeIterator {
  protected def compute(ctx: DynamicContext): Iterator[Item] =
    child.materializeAtMostOne(ctx) match {
      case None                  => Iterator.empty
      case Some(IntItem(v))      => Iterator.single(IntItem(-v))
      case Some(DoubleItem(v))   => Iterator.single(DoubleItem(-v))
      case Some(DecimalItem(v))  => Iterator.single(DecimalItem(-v))
      case Some(other) =>
        throw new RumbleException("XPTY0004", s"unary minus on non-number: $other")
    }
}

/** Value comparison `eq ne lt le gt ge`; empty operand → empty result.
  * `eq`/`ne` across incompatible non-null types is an error (XPTY0004);
  * null compares equal only to null, and orders below every other atomic. */
final class ComparisonIterator(op: String, lhs: RuntimeIterator, rhs: RuntimeIterator)
    extends RuntimeIterator {
  protected def compute(ctx: DynamicContext): Iterator[Item] =
    (lhs.materializeAtMostOne(ctx), rhs.materializeAtMostOne(ctx)) match {
      case (Some(a), Some(b)) => Iterator.single(BooleanItem(apply(a, b)))
      case _                  => Iterator.empty
    }

  private def comparable(a: Item, b: Item): Boolean =
    a.isNull || b.isNull ||
      (a.isNumeric && b.isNumeric) || (a.isString && b.isString) ||
      (a.isBoolean && b.isBoolean)

  private def apply(a: Item, b: Item): Boolean = {
    if (a.isObject || a.isArray || b.isObject || b.isArray)
      throw new RumbleException("XPTY0004", s"cannot compare non-atomics: $a $op $b")
    if (!comparable(a, b))
      throw new RumbleException("XPTY0004", s"items not comparable: $a $op $b")
    op match {
      case "eq" => Item.atomicEquals(a, b)
      case "ne" => !Item.atomicEquals(a, b)
      case _ =>
        val c = Item.compareAtomics(a, b)
        op match {
          case "lt" => c < 0
          case "le" => c <= 0
          case "gt" => c > 0
          case "ge" => c >= 0
        }
    }
  }
}

final class AndIterator(lhs: RuntimeIterator, rhs: RuntimeIterator) extends RuntimeIterator {
  protected def compute(ctx: DynamicContext): Iterator[Item] =
    Iterator.single(BooleanItem(lhs.effectiveBoolean(ctx) && rhs.effectiveBoolean(ctx)))
}

final class OrIterator(lhs: RuntimeIterator, rhs: RuntimeIterator) extends RuntimeIterator {
  protected def compute(ctx: DynamicContext): Iterator[Item] =
    Iterator.single(BooleanItem(lhs.effectiveBoolean(ctx) || rhs.effectiveBoolean(ctx)))
}

/** `e1 || e2` — string concatenation; empty operands become "". */
final class StringConcatIterator(lhs: RuntimeIterator, rhs: RuntimeIterator)
    extends RuntimeIterator {
  protected def compute(ctx: DynamicContext): Iterator[Item] = {
    def str(o: Option[Item]) = o.map(_.castToString).getOrElse("")
    Iterator.single(
      StringItem(str(lhs.materializeAtMostOne(ctx)) + str(rhs.materializeAtMostOne(ctx))))
  }
}

final class IfIterator(cond: RuntimeIterator, thenE: RuntimeIterator, elseE: RuntimeIterator)
    extends RuntimeIterator {
  protected def compute(ctx: DynamicContext): Iterator[Item] =
    if (cond.effectiveBoolean(ctx)) thenE.localIterator(ctx) else elseE.localIterator(ctx)
}

/** `{ "k": v, ... }` — dynamic object construction. A value expression
  * yielding the empty sequence binds null; a multi-item sequence binds an
  * array (lenient construction, matching Rumble's behaviour). */
final class ObjectConstructorIterator(pairs: List[(String, RuntimeIterator)])
    extends RuntimeIterator {
  protected def compute(ctx: DynamicContext): Iterator[Item] = {
    val fields = pairs.map { case (k, e) =>
      val v = e.materialize(ctx) match {
        case Nil         => NullItem
        case List(item)  => item
        case many        => ArrayItem(many.toVector)
      }
      (k, v)
    }
    Iterator.single(ObjectItem(fields.toVector))
  }
}

/** `[ e ]` — array construction from the materialized member sequence. */
final class ArrayConstructorIterator(expr: Option[RuntimeIterator]) extends RuntimeIterator {
  protected def compute(ctx: DynamicContext): Iterator[Item] =
    Iterator.single(ArrayItem(expr.map(_.materialize(ctx).toVector).getOrElse(Vector.empty)))
}

/** `e.key` — object lookup: objects yield their member (if present),
  * non-objects yield nothing. flatMap on the RDD path (paper §4.1.2). */
final class ObjectLookupIterator(target: RuntimeIterator, key: String) extends RuntimeIterator {
  protected def compute(ctx: DynamicContext): Iterator[Item] =
    target.localIterator(ctx).flatMap(_.lookup(key))
  override def isRDD(ctx: DynamicContext): Boolean = target.isRDD(ctx)
  override def getRDD(ctx: DynamicContext): RDD[Item] = {
    val k = key
    target.getRDD(ctx).flatMap(_.lookup(k))
  }
}

/** `e[]` — array unboxing: arrays yield their members, others nothing. */
final class ArrayUnboxIterator(target: RuntimeIterator) extends RuntimeIterator {
  protected def compute(ctx: DynamicContext): Iterator[Item] =
    target.localIterator(ctx).flatMap(_.arrayValues)
  override def isRDD(ctx: DynamicContext): Boolean = target.isRDD(ctx)
  override def getRDD(ctx: DynamicContext): RDD[Item] =
    target.getRDD(ctx).flatMap(_.arrayValues)
}

/** `e[[i]]` — array member lookup, 1-based; out of range yields nothing. */
final class ArrayLookupIterator(target: RuntimeIterator, index: RuntimeIterator)
    extends RuntimeIterator {
  private def idx(ctx: DynamicContext): Option[Long] =
    index.materializeAtMostOne(ctx).map {
      case i if i.isNumeric => i.numericDouble.toLong
      case other => throw new RumbleException("XPTY0004", s"array index must be numeric: $other")
    }
  protected def compute(ctx: DynamicContext): Iterator[Item] = idx(ctx) match {
    case None    => Iterator.empty
    case Some(n) =>
      target.localIterator(ctx).flatMap { it =>
        val vs = it.arrayValues
        if (it.isArray && n >= 1 && n <= vs.size) Some(vs((n - 1).toInt)) else None
      }
  }
  override def isRDD(ctx: DynamicContext): Boolean = target.isRDD(ctx)
  override def getRDD(ctx: DynamicContext): RDD[Item] = idx(ctx) match {
    case None    => target.getRDD(ctx).context.emptyRDD[Item]
    case Some(n) =>
      target.getRDD(ctx).flatMap { it =>
        val vs = it.arrayValues
        if (it.isArray && n >= 1 && n <= vs.size) Some(vs((n - 1).toInt)) else None
      }
  }
}

/** `e[p]` — predicate. For each input item, `$$` is bound to the item; a
  * singleton numeric predicate value selects by 1-based position, any other
  * value filters by effective boolean value. The RDD path (paper §5.6)
  * carries the predicate's runtime iterator in the closure and evaluates it
  * through the local API on the executors; positional predicates require
  * local execution. */
final class PredicateIterator(target: RuntimeIterator, predicate: RuntimeIterator)
    extends RuntimeIterator {
  protected def compute(ctx: DynamicContext): Iterator[Item] =
    target.localIterator(ctx).zipWithIndex.flatMap { case (item, i) =>
      predicate.materialize(ctx.withContextItem(item)) match {
        case List(n) if n.isNumeric => if (n.numericDouble == i + 1) Some(item) else None
        case result => if (Item.effectiveBooleanValue(result)) Some(item) else None
      }
    }
  override def isRDD(ctx: DynamicContext): Boolean = target.isRDD(ctx)
  override def getRDD(ctx: DynamicContext): RDD[Item] = {
    val pred       = predicate
    val closureCtx = ctx.enterClosure
    target.getRDD(ctx).filter { item =>
      pred.materialize(closureCtx.withContextItem(item)) match {
        case List(n) if n.isNumeric =>
          throw new RumbleException(
            "RBML0002", "positional predicates are not supported on the RDD path")
        case result => Item.effectiveBooleanValue(result)
      }
    }
  }
}
