package repro.core.parser

import repro.core.model._

/** Hand-written recursive-descent parser for the JSONiq subset (§5.2).
  *
  * Operator precedence, lowest to highest:
  * comma < or < and < comparison < string-concat < range (`to`)
  * < additive < multiplicative < unary < postfix (lookup/unbox/predicate).
  *
  * FLWOR expressions must start with `for` or `let` and end with `return`;
  * clauses may be combined and ordered at will in between (paper §2.3).
  */
final class Parser(tokens: Vector[Token]) {
  // mutable so the lexer's greedy `[[`/`]]` tokens can be split back into
  // two brackets when the grammar needs single ones (nested array
  // constructors) — the classic JSONiq bracket ambiguity
  private val toks = scala.collection.mutable.ArrayBuffer.from(tokens)
  private var pos  = 0

  private def peek: Token      = toks(pos)
  private def peekAt(k: Int)   = toks(math.min(pos + k, toks.length - 1))
  private def advance(): Token = { val t = toks(pos); pos += 1; t }

  private def fail(msg: String): Nothing =
    throw new StaticException("XPST0003", s"$msg but found ${peek.describe}")

  private def expectPunct(p: String): Unit = peek match {
    case TPunct(`p`) => pos += 1
    // "]]" where a single "]" is expected: consume one bracket, keep one
    case TPunct("]]") if p == "]" => toks(pos) = TPunct("]")
    case _           => fail(s"expected '$p'")
  }

  private def peekName(n: String): Boolean = peek match {
    case TName(`n`) => true
    case _          => false
  }

  private def eatName(n: String): Unit =
    if (peekName(n)) pos += 1 else fail(s"expected keyword '$n'")

  private def expectVar(): String = peek match {
    case TVar(v) => pos += 1; v
    case _       => fail("expected a variable")
  }

  def parseQuery(): ExprAst = {
    val e = parseExpr()
    peek match {
      case TEOF => e
      case _    => fail("expected end of query")
    }
  }

  /** Expr := ExprSingle ("," ExprSingle)* */
  private def parseExpr(): ExprAst = {
    val first = parseExprSingle()
    if (peek == TPunct(",")) {
      val parts = scala.collection.mutable.ListBuffer(first)
      while (peek == TPunct(",")) { advance(); parts += parseExprSingle() }
      CommaExpr(parts.toList)
    } else first
  }

  private def parseExprSingle(): ExprAst = peek match {
    case TName("for") | TName("let") if peekAt(1).isInstanceOf[TVar] => parseFlwor()
    case TName("if") if peekAt(1) == TPunct("(")                    => parseIf()
    case _                                                          => parseOr()
  }

  private def parseIf(): ExprAst = {
    eatName("if"); expectPunct("(")
    val cond = parseExpr()
    expectPunct(")")
    eatName("then")
    val t = parseExprSingle()
    eatName("else")
    val e = parseExprSingle()
    IfExpr(cond, t, e)
  }

  // ---------------------------------------------------------------- FLWOR

  private def parseFlwor(): ExprAst = {
    val clauses = scala.collection.mutable.ListBuffer.empty[ClauseAst]
    // initial clause
    if (peekName("for")) clauses += parseForClause()
    else clauses += parseLetClause()
    var ret: Option[ExprAst] = None
    while (ret.isEmpty) {
      peek match {
        case TName("for")    => clauses += parseForClause()
        case TName("let")    => clauses += parseLetClause()
        case TName("where")  => advance(); clauses += WhereClauseAst(parseExprSingle())
        case TName("group")  => advance(); eatName("by"); clauses += parseGroupBy()
        case TName("order")  => advance(); eatName("by"); clauses += parseOrderBy()
        case TName("stable") => advance(); eatName("order"); eatName("by"); clauses += parseOrderBy()
        case TName("count")  => advance(); clauses += CountClauseAst(expectVar())
        case TName("return") => advance(); ret = Some(parseExprSingle())
        case _               => fail("expected a FLWOR clause or 'return'")
      }
    }
    FlworExpr(clauses.toList, ret.get)
  }

  private def parseForClause(): ClauseAst = {
    eatName("for")
    val bindings = scala.collection.mutable.ListBuffer.empty[(String, ExprAst)]
    var more = true
    while (more) {
      val v = expectVar()
      eatName("in")
      bindings += ((v, parseExprSingle()))
      if (peek == TPunct(",")) advance() else more = false
    }
    ForClauseAst(bindings.toList)
  }

  private def parseLetClause(): ClauseAst = {
    eatName("let")
    val bindings = scala.collection.mutable.ListBuffer.empty[(String, ExprAst)]
    var more = true
    while (more) {
      val v = expectVar()
      expectPunct(":=")
      bindings += ((v, parseExprSingle()))
      if (peek == TPunct(",")) advance() else more = false
    }
    LetClauseAst(bindings.toList)
  }

  private def parseGroupBy(): ClauseAst = {
    val keys = scala.collection.mutable.ListBuffer.empty[(String, Option[ExprAst])]
    var more = true
    while (more) {
      val v = expectVar()
      val binding = if (peek == TPunct(":=")) { advance(); Some(parseExprSingle()) } else None
      keys += ((v, binding))
      if (peek == TPunct(",")) advance() else more = false
    }
    GroupByClauseAst(keys.toList)
  }

  private def parseOrderBy(): ClauseAst = {
    val specs = scala.collection.mutable.ListBuffer.empty[OrderSpecAst]
    var more = true
    while (more) {
      val e    = parseExprSingle()
      var desc = false
      if (peekName("ascending")) advance()
      else if (peekName("descending")) { advance(); desc = true }
      var emptyGreatest = false
      if (peekName("empty")) {
        advance()
        if (peekName("greatest")) { advance(); emptyGreatest = true }
        else eatName("least")
      }
      specs += OrderSpecAst(e, desc, emptyGreatest)
      if (peek == TPunct(",")) advance() else more = false
    }
    OrderByClauseAst(specs.toList)
  }

  // ----------------------------------------------------------- operators

  private def parseOr(): ExprAst = {
    var lhs = parseAnd()
    while (peekName("or")) { advance(); lhs = OrExpr(lhs, parseAnd()) }
    lhs
  }

  private def parseAnd(): ExprAst = {
    var lhs = parseComparison()
    while (peekName("and")) { advance(); lhs = AndExpr(lhs, parseComparison()) }
    lhs
  }

  private val namedCmp  = Set("eq", "ne", "lt", "le", "gt", "ge")
  private val symbolCmp = Map("=" -> "eq", "!=" -> "ne", "<" -> "lt",
                              "<=" -> "le", ">" -> "gt", ">=" -> "ge")

  private def parseComparison(): ExprAst = {
    val lhs = parseStringConcat()
    peek match {
      case TName(op) if namedCmp(op) =>
        advance(); ComparisonExpr(op, lhs, parseStringConcat())
      case TPunct(p) if symbolCmp.contains(p) =>
        advance(); ComparisonExpr(symbolCmp(p), lhs, parseStringConcat())
      case _ => lhs
    }
  }

  private def parseStringConcat(): ExprAst = {
    var lhs = parseRange()
    while (peek == TPunct("||")) { advance(); lhs = StringConcatExpr(lhs, parseRange()) }
    lhs
  }

  private def parseRange(): ExprAst = {
    val lhs = parseAdditive()
    if (peekName("to")) { advance(); ToRangeExpr(lhs, parseAdditive()) } else lhs
  }

  private def parseAdditive(): ExprAst = {
    var lhs = parseMultiplicative()
    var more = true
    while (more) peek match {
      case TPunct("+") => advance(); lhs = ArithmeticExpr("+", lhs, parseMultiplicative())
      case TPunct("-") => advance(); lhs = ArithmeticExpr("-", lhs, parseMultiplicative())
      case _           => more = false
    }
    lhs
  }

  private def parseMultiplicative(): ExprAst = {
    var lhs = parseUnary()
    var more = true
    while (more) peek match {
      case TPunct("*")    => advance(); lhs = ArithmeticExpr("*", lhs, parseUnary())
      case TName("div")   => advance(); lhs = ArithmeticExpr("div", lhs, parseUnary())
      case TName("idiv")  => advance(); lhs = ArithmeticExpr("idiv", lhs, parseUnary())
      case TName("mod")   => advance(); lhs = ArithmeticExpr("mod", lhs, parseUnary())
      case _              => more = false
    }
    lhs
  }

  private def parseUnary(): ExprAst = peek match {
    case TPunct("-") => advance(); UnaryMinusExpr(parseUnary())
    case TPunct("+") => advance(); parseUnary()
    case _           => parsePostfix()
  }

  // ------------------------------------------------------------- postfix

  private def parsePostfix(): ExprAst = {
    var e    = parsePrimary()
    var more = true
    while (more) peek match {
      case TPunct(".") =>
        advance()
        peek match {
          case TName(k)   => advance(); e = ObjectLookupExpr(e, k)
          case TString(k) => advance(); e = ObjectLookupExpr(e, k)
          case _          => fail("expected a key after '.'")
        }
      case TPunct("[[") =>
        advance()
        val idx = parseExpr()
        expectPunct("]]")
        e = ArrayLookupExpr(e, idx)
      case TPunct("[") =>
        advance()
        if (peek == TPunct("]")) { advance(); e = ArrayUnboxExpr(e) }
        else {
          val p = parseExpr()
          expectPunct("]")
          e = PredicateExpr(e, p)
        }
      case _ => more = false
    }
    e
  }

  private def parsePrimary(): ExprAst = peek match {
    case TNumber(i)   => advance(); LiteralExpr(i)
    case TString(s)   => advance(); LiteralExpr(StringItem(s))
    case TVar(v)      => advance(); VarRefExpr(v)
    case TContextItem => advance(); ContextItemExpr
    case TName("true") if peekAt(1) != TPunct("(")  => advance(); LiteralExpr(BooleanItem(true))
    case TName("false") if peekAt(1) != TPunct("(") => advance(); LiteralExpr(BooleanItem(false))
    case TName("null") if peekAt(1) != TPunct("(")  => advance(); LiteralExpr(NullItem)
    case TName("if") if peekAt(1) == TPunct("(")    => parseIf()
    case TName(fn) if peekAt(1) == TPunct("(") =>
      advance(); advance() // name (
      val args = scala.collection.mutable.ListBuffer.empty[ExprAst]
      if (peek != TPunct(")")) {
        args += parseExprSingle()
        while (peek == TPunct(",")) { advance(); args += parseExprSingle() }
      }
      expectPunct(")")
      FunctionCallExpr(fn, args.toList)
    case TPunct("(") =>
      advance()
      if (peek == TPunct(")")) { advance(); CommaExpr(Nil) } // empty sequence ()
      else {
        val e = parseExpr()
        expectPunct(")")
        e
      }
    case TPunct("{") =>
      advance()
      val pairs = scala.collection.mutable.ListBuffer.empty[(String, ExprAst)]
      if (peek != TPunct("}")) {
        var more = true
        while (more) {
          val key = peek match {
            case TString(s) => advance(); s
            case TName(s)   => advance(); s
            case _          => fail("expected an object key")
          }
          expectPunct(":")
          pairs += ((key, parseExprSingle()))
          if (peek == TPunct(",")) advance() else more = false
        }
      }
      expectPunct("}")
      ObjectConstructorExpr(pairs.toList)
    case TPunct("[") =>
      advance()
      if (peek == TPunct("]")) { advance(); ArrayConstructorExpr(None) }
      else if (peek == TPunct("]]")) { // "[]]": empty array then a "]"
        toks(pos) = TPunct("]")
        ArrayConstructorExpr(None)
      } else {
        val e = parseExpr()
        expectPunct("]")
        ArrayConstructorExpr(Some(e))
      }
    case TPunct("[[") =>
      // "[[" in expression position: two array-constructor brackets
      toks(pos) = TPunct("[")
      toks.insert(pos, TPunct("["))
      parsePrimary()
    case _ => fail("expected an expression")
  }
}

object Parser {
  /** Parse a JSONiq query string into an AST. */
  def parse(query: String): ExprAst = new Parser(Lexer.tokenize(query)).parseQuery()
}
