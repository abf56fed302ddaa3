package repro.core.semantics

import repro.core.model._
import repro.core.parser._
import repro.core.runtime._
import repro.core.runtime.flwor._

/** Static context (paper §5.3): chained scopes of in-scope variables.
  * Each scope holds only its own variables and a parent reference, so no
  * bindings are duplicated. `allowContextItem` tracks whether `$$` is legal
  * (inside predicates). */
final class StaticContext(
    parent: Option[StaticContext],
    vars: Set[String],
    val allowContextItem: Boolean,
) {
  def hasVar(name: String): Boolean =
    vars.contains(name) || parent.exists(_.hasVar(name))

  def withVar(name: String): StaticContext =
    new StaticContext(Some(this), Set(name), allowContextItem)

  def withContextItem: StaticContext =
    new StaticContext(Some(this), Set.empty, allowContextItem = true)
}

object StaticContext {
  val root: StaticContext = new StaticContext(None, Set.empty, allowContextItem = false)
}

/** Translates the expression/clause tree into runtime iterators (paper
  * §5.4), checking variable references against the static context and
  * raising static errors before execution. */
object Translator {

  def translate(ast: ExprAst): RuntimeIterator = translateExpr(ast, StaticContext.root)

  def translateExpr(ast: ExprAst, sc: StaticContext): RuntimeIterator = ast match {
    case LiteralExpr(item) => new LiteralIterator(item)

    case VarRefExpr(name) =>
      if (!sc.hasVar(name))
        throw new StaticException("XPST0008", s"undeclared variable $$$name")
      new VarRefIterator(name)

    case ContextItemExpr =>
      if (!sc.allowContextItem)
        throw new StaticException("XPST0008", "$$ used outside of a predicate")
      new ContextItemIterator

    case CommaExpr(Nil)   => new EmptySequenceIterator
    case CommaExpr(parts) => new CommaIterator(parts.map(translateExpr(_, sc)))

    case ToRangeExpr(a, b) =>
      new RangeIterator(translateExpr(a, sc), translateExpr(b, sc))

    case ArithmeticExpr(op, a, b) =>
      new ArithmeticIterator(op, translateExpr(a, sc), translateExpr(b, sc))

    case UnaryMinusExpr(e) => new UnaryMinusIterator(translateExpr(e, sc))

    case ComparisonExpr(op, a, b) =>
      new ComparisonIterator(op, translateExpr(a, sc), translateExpr(b, sc))

    case AndExpr(a, b) => new AndIterator(translateExpr(a, sc), translateExpr(b, sc))
    case OrExpr(a, b)  => new OrIterator(translateExpr(a, sc), translateExpr(b, sc))

    case StringConcatExpr(a, b) =>
      new StringConcatIterator(translateExpr(a, sc), translateExpr(b, sc))

    case IfExpr(c, t, e) =>
      new IfIterator(translateExpr(c, sc), translateExpr(t, sc), translateExpr(e, sc))

    case ObjectConstructorExpr(pairs) =>
      new ObjectConstructorIterator(pairs.map { case (k, v) => (k, translateExpr(v, sc)) })

    case ArrayConstructorExpr(e) =>
      new ArrayConstructorIterator(e.map(translateExpr(_, sc)))

    case ObjectLookupExpr(t, k) => new ObjectLookupIterator(translateExpr(t, sc), k)
    case ArrayUnboxExpr(t)      => new ArrayUnboxIterator(translateExpr(t, sc))
    case ArrayLookupExpr(t, i) =>
      new ArrayLookupIterator(translateExpr(t, sc), translateExpr(i, sc))

    case PredicateExpr(t, p) =>
      new PredicateIterator(translateExpr(t, sc), translateExpr(p, sc.withContextItem))

    case FunctionCallExpr(name, args) =>
      val compiled = args.map(translateExpr(_, sc))
      name match {
        case "json-file"   => new JsonFileIterator(compiled.head, compiled.drop(1).headOption)
        case "parallelize" => new ParallelizeIterator(compiled.head, compiled.drop(1).headOption)
        case _             => new FunctionIterator(name, compiled)
      }

    case FlworExpr(clauses, ret) => translateFlwor(clauses, ret, sc)
  }

  /** Builds the clause chain, desugaring multi-variable for/let clauses
    * into one clause iterator per binding, and group-by binding forms
    * (`group by $k := e`) into a let followed by a group.
    *
    * At each group-by, the remaining clauses + return expression are
    * analyzed per non-grouping variable (paper §4.7): a variable used only
    * as `count($v)` is aggregated with COUNT() (downstream calls are
    * rewritten to a hidden `$v#count` variable); an unused variable is
    * dropped entirely. */
  private def translateFlwor(clauses: List[ClauseAst], ret0: ExprAst,
                             sc0: StaticContext): RuntimeIterator = {
    // Fast path (paper Fig. 9 / §5.7): `for $v in e (where ...)* return r`
    // maps directly to filter/flatMap on the source RDD of items, with no
    // tuple DataFrame and no intermediate materialization.
    clauses match {
      case ForClauseAst(List((v, srcAst))) :: rest
          if rest.forall(_.isInstanceOf[WhereClauseAst]) =>
        val src  = translateExpr(srcAst, sc0)
        val scV  = sc0.withVar(v)
        val ws   = rest.collect { case WhereClauseAst(e) => translateExpr(e, scV) }
        return new SimpleFlworRddIterator(
          v, src, ws, translateExpr(ret0, scV), singletonReturn(ret0, clauses))
      case _ =>
    }
    var chain: Option[ClauseIterator] = None
    var schema                        = TupleSchema.empty
    var sc                            = sc0
    var remaining                     = clauses
    var ret                           = ret0

    def addFor(name: String, expr: ExprAst): Unit = {
      val e                   = translateExpr(expr, sc)
      val (newSchema, newCol) = schema.withVar(name)
      chain = Some(new ForClauseIterator(chain, name, e, newSchema, newCol))
      schema = newSchema
      sc = sc.withVar(name)
    }

    def addLet(name: String, expr: ExprAst): Unit = {
      val e                   = translateExpr(expr, sc)
      val (newSchema, newCol) = schema.withVar(name)
      chain = Some(new LetClauseIterator(chain, name, e, newSchema, newCol))
      schema = newSchema
      sc = sc.withVar(name)
    }

    while (remaining.nonEmpty) {
      val clause = remaining.head
      remaining = remaining.tail
      clause match {
        case ForClauseAst(bindings) => bindings.foreach { case (v, e) => addFor(v, e) }
        case LetClauseAst(bindings) => bindings.foreach { case (v, e) => addLet(v, e) }

        case WhereClauseAst(e) =>
          chain = Some(new WhereClauseIterator(chain.get, translateExpr(e, sc)))

        case GroupByClauseAst(keys) =>
          // binding form first: group by $k := e  ≡  let $k := e then group by $k
          keys.foreach {
            case (v, Some(e)) => addLet(v, e)
            case (v, None) =>
              if (!schema.hasVar(v))
                throw new StaticException("XPST0008", s"grouping variable $$$v not in scope")
          }
          val keyNames   = keys.map(_._1)
          val downstream = remaining.flatMap(clauseExprs) :+ ret
          val reboundBelow = remaining.flatMap(clauseBoundVars).toSet
          val modes = schema.vars.filterNot(keyNames.contains).map { v =>
            val mode =
              if (reboundBelow.contains(v)) GroupAggMode.Materialize
              else {
                val uses = downstream.map(usage(_, v))
                if (uses.forall(u => !u._1)) GroupAggMode.Drop
                else if (uses.forall(_._2)) GroupAggMode.CountOnly
                else GroupAggMode.Materialize
              }
            v -> mode
          }.toMap
          // rewrite downstream count($v) → $v#count for CountOnly vars
          modes.collect { case (v, GroupAggMode.CountOnly) => v }.foreach { v =>
            remaining = remaining.map(rewriteClauseCount(_, v))
            ret = rewriteCount(ret, v)
            sc = sc.withVar(v + "#count")
          }
          val newEntries = schema.entries.flatMap { case (v, c) =>
            if (keyNames.contains(v)) Some((v, c))
            else modes(v) match {
              case GroupAggMode.Materialize => Some((v, c))
              case GroupAggMode.Drop        => None
              case GroupAggMode.CountOnly   => Some((v + "#count", c + "_cnt"))
            }
          }
          val outSchema = TupleSchema(newEntries, schema.nextId)
          chain = Some(new GroupByClauseIterator(chain.get, keyNames, modes, outSchema))
          schema = outSchema

        case OrderByClauseAst(specs) =>
          val compiled = specs.map(s =>
            OrderSpec(translateExpr(s.expr, sc), s.descending, s.emptyGreatest))
          chain = Some(new OrderByClauseIterator(chain.get, compiled))

        case CountClauseAst(v) =>
          val (newSchema, newCol) = schema.withVar(v)
          chain = Some(new CountClauseIterator(chain.get, v, newSchema, newCol))
          schema = newSchema
          sc = sc.withVar(v)
      }
    }

    new FlworIterator(chain.get, translateExpr(ret, sc), singletonReturn(ret, clauses))
  }

  /** True when the return expression provably yields exactly one item per
    * tuple, enabling the count-action pushdown (see FlworIterator). */
  private def singletonReturn(ret: ExprAst, clauses: List[ClauseAst]): Boolean = {
    // variables whose binding is always a singleton: for-bound (one item
    // per tuple) and count-bound — unless later rebound by a let
    val singletonVars = clauses.foldLeft(Set.empty[String]) { (acc, c) =>
      c match {
        case ForClauseAst(bs)  => acc ++ bs.map(_._1)
        case CountClauseAst(v) => acc + v
        case LetClauseAst(bs)  => acc -- bs.map(_._1)
        case GroupByClauseAst(_) =>
          // after grouping, non-key variables hold whole groups and key
          // variables may be bound to the empty sequence — none is a
          // guaranteed singleton
          Set.empty
        case _ => acc
      }
    }
    ret match {
      case LiteralExpr(_)            => true
      case ObjectConstructorExpr(_)  => true
      case ArrayConstructorExpr(_)   => true
      case VarRefExpr(v)             => singletonVars.contains(v)
      case _                         => false
    }
  }

  // ------------------------------------------------ group-by usage analysis

  /** All expression ASTs directly contained in a clause. */
  private def clauseExprs(c: ClauseAst): List[ExprAst] = c match {
    case ForClauseAst(bs)     => bs.map(_._2)
    case LetClauseAst(bs)     => bs.map(_._2)
    case WhereClauseAst(e)    => List(e)
    case GroupByClauseAst(ks) => ks.flatMap(_._2)
    case OrderByClauseAst(ss) => ss.map(_.expr)
    case CountClauseAst(_)    => Nil
  }

  private def clauseBoundVars(c: ClauseAst): List[String] = c match {
    case ForClauseAst(bs)     => bs.map(_._1)
    case LetClauseAst(bs)     => bs.map(_._1)
    case GroupByClauseAst(ks) => ks.collect { case (v, Some(_)) => v }
    case CountClauseAst(v)    => List(v)
    case _                    => Nil
  }

  /** (used, usedOnlyAsCountArgument) for variable `v` in `ast`. A nested
    * FLWOR that rebinds `v` is conservatively reported as a non-count use,
    * so the group-by falls back to materializing. */
  private def usage(ast: ExprAst, v: String): (Boolean, Boolean) = ast match {
    case VarRefExpr(`v`) => (true, false)
    case FunctionCallExpr("count", List(VarRefExpr(`v`))) => (true, true)
    case FlworExpr(cs, _) if cs.flatMap(clauseBoundVars).contains(v) => (true, false)
    case other =>
      val subs      = childrenOf(other).map(usage(_, v))
      val used      = subs.exists(_._1)
      val onlyCount = subs.filter(_._1).forall(_._2)
      (used, used && onlyCount)
  }

  /** Replace `count($v)` with `$v#count` everywhere in `ast`. */
  private def rewriteCount(ast: ExprAst, v: String): ExprAst = ast match {
    case FunctionCallExpr("count", List(VarRefExpr(`v`))) => VarRefExpr(v + "#count")
    case other => mapChildren(other, rewriteCount(_, v))
  }

  private def rewriteClauseCount(c: ClauseAst, v: String): ClauseAst = c match {
    case ForClauseAst(bs)     => ForClauseAst(bs.map { case (n, e) => (n, rewriteCount(e, v)) })
    case LetClauseAst(bs)     => LetClauseAst(bs.map { case (n, e) => (n, rewriteCount(e, v)) })
    case WhereClauseAst(e)    => WhereClauseAst(rewriteCount(e, v))
    case GroupByClauseAst(ks) =>
      GroupByClauseAst(ks.map { case (n, e) => (n, e.map(rewriteCount(_, v))) })
    case OrderByClauseAst(ss) =>
      OrderByClauseAst(ss.map(s => s.copy(expr = rewriteCount(s.expr, v))))
    case cc: CountClauseAst   => cc
  }

  private def childrenOf(ast: ExprAst): List[ExprAst] = ast match {
    case CommaExpr(parts)             => parts
    case ToRangeExpr(a, b)            => List(a, b)
    case ArithmeticExpr(_, a, b)      => List(a, b)
    case UnaryMinusExpr(e)            => List(e)
    case ComparisonExpr(_, a, b)      => List(a, b)
    case AndExpr(a, b)                => List(a, b)
    case OrExpr(a, b)                 => List(a, b)
    case StringConcatExpr(a, b)       => List(a, b)
    case IfExpr(c, t, e)              => List(c, t, e)
    case ObjectConstructorExpr(pairs) => pairs.map(_._2)
    case ArrayConstructorExpr(e)      => e.toList
    case ObjectLookupExpr(t, _)       => List(t)
    case ArrayUnboxExpr(t)            => List(t)
    case ArrayLookupExpr(t, i)        => List(t, i)
    case PredicateExpr(t, p)          => List(t, p)
    case FunctionCallExpr(_, args)    => args
    case FlworExpr(cs, r)             => cs.flatMap(clauseExprs) :+ r
    case _                            => Nil
  }

  private def mapChildren(ast: ExprAst, f: ExprAst => ExprAst): ExprAst = ast match {
    case CommaExpr(parts)             => CommaExpr(parts.map(f))
    case ToRangeExpr(a, b)            => ToRangeExpr(f(a), f(b))
    case ArithmeticExpr(op, a, b)     => ArithmeticExpr(op, f(a), f(b))
    case UnaryMinusExpr(e)            => UnaryMinusExpr(f(e))
    case ComparisonExpr(op, a, b)     => ComparisonExpr(op, f(a), f(b))
    case AndExpr(a, b)                => AndExpr(f(a), f(b))
    case OrExpr(a, b)                 => OrExpr(f(a), f(b))
    case StringConcatExpr(a, b)       => StringConcatExpr(f(a), f(b))
    case IfExpr(c, t, e)              => IfExpr(f(c), f(t), f(e))
    case ObjectConstructorExpr(pairs) =>
      ObjectConstructorExpr(pairs.map { case (k, e) => (k, f(e)) })
    case ArrayConstructorExpr(e)      => ArrayConstructorExpr(e.map(f))
    case ObjectLookupExpr(t, k)       => ObjectLookupExpr(f(t), k)
    case ArrayUnboxExpr(t)            => ArrayUnboxExpr(f(t))
    case ArrayLookupExpr(t, i)        => ArrayLookupExpr(f(t), f(i))
    case PredicateExpr(t, p)          => PredicateExpr(f(t), f(p))
    case FunctionCallExpr(n, args)    => FunctionCallExpr(n, args.map(f))
    case FlworExpr(cs, r) =>
      val cs2 = cs.map {
        case ForClauseAst(bs)     => ForClauseAst(bs.map { case (n, e) => (n, f(e)) })
        case LetClauseAst(bs)     => LetClauseAst(bs.map { case (n, e) => (n, f(e)) })
        case WhereClauseAst(e)    => WhereClauseAst(f(e))
        case GroupByClauseAst(ks) => GroupByClauseAst(ks.map { case (n, e) => (n, e.map(f)) })
        case OrderByClauseAst(ss) => OrderByClauseAst(ss.map(s => s.copy(expr = f(s.expr))))
        case cc: CountClauseAst   => cc
      }
      FlworExpr(cs2, f(r))
    case leaf                         => leaf
  }
}
