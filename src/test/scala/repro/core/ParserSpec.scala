package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Ast._
import repro.core.Parser.{parse, parseExpr, ParseError}

/** Parser unit tests for the Figure-1 loop language. */
class ParserSpec extends AnyFunSuite {

  // ---------------------------------------------------------- expressions

  test("integer literal")  { assert(parseExpr("42") == IntLit(42)) }
  test("double literal")   { assert(parseExpr("3.5") == DoubleLit(3.5)) }
  test("sci notation")     { assert(parseExpr("1.0e30") == DoubleLit(1.0e30)) }
  test("string literal")   { assert(parseExpr("\"abc\"") == StringLit("abc")) }
  test("booleans")         { assert(parseExpr("true") == BoolLit(true))
                             assert(parseExpr("false") == BoolLit(false)) }
  test("variable")         { assert(parseExpr("x") == Ref("x")) }

  test("vector indexing")  { assert(parseExpr("V[i]") == Index("V", List(Ref("i")))) }
  test("matrix indexing")  {
    assert(parseExpr("M[i,j]") == Index("M", List(Ref("i"), Ref("j"))))
  }
  test("index expressions") {
    assert(parseExpr("V[i-1]") == Index("V", List(BinOp("-", Ref("i"), IntLit(1)))))
  }
  test("field access")     { assert(parseExpr("p.x") == FieldAcc(Ref("p"), "x")) }
  test("tuple field via underscore") {
    assert(parseExpr("t._2") == FieldAcc(Ref("t"), "_2"))
  }
  test("field of array element") {
    assert(parseExpr("V[i].K") == FieldAcc(Index("V", List(Ref("i"))), "K"))
  }

  test("precedence: * over +") {
    assert(parseExpr("a + b * c") ==
      BinOp("+", Ref("a"), BinOp("*", Ref("b"), Ref("c"))))
  }
  test("precedence: comparison over &&") {
    assert(parseExpr("a < b && c > d") ==
      BinOp("&&", BinOp("<", Ref("a"), Ref("b")), BinOp(">", Ref("c"), Ref("d"))))
  }
  test("precedence: && over ||") {
    assert(parseExpr("a || b && c") ==
      BinOp("||", Ref("a"), BinOp("&&", Ref("b"), Ref("c"))))
  }
  test("left associativity of -") {
    assert(parseExpr("a - b - c") ==
      BinOp("-", BinOp("-", Ref("a"), Ref("b")), Ref("c")))
  }
  test("parentheses override") {
    assert(parseExpr("(a + b) * c") ==
      BinOp("*", BinOp("+", Ref("a"), Ref("b")), Ref("c")))
  }
  test("unary minus and not") {
    assert(parseExpr("-x") == UnOp("-", Ref("x")))
    assert(parseExpr("!b") == UnOp("!", Ref("b")))
  }
  test("tuple construction") {
    assert(parseExpr("(a, 1)") == TupleE(List(Ref("a"), IntLit(1))))
  }
  test("function call") {
    assert(parseExpr("sqrt(x)") == CallE("sqrt", List(Ref("x"))))
  }
  test("empty-collection constructors") {
    assert(parseExpr("vector()") == CallE("vector", Nil))
    assert(parseExpr("map()") == CallE("map", Nil))
  }

  // ----------------------------------------------------------- statements

  test("scalar declaration") {
    assert(parse("var x: double = 0.0;") ==
      List(Decl("x", DoubleT, DoubleLit(0.0))))
  }
  test("vector declaration") {
    assert(parse("var V: vector[double] = vector();") ==
      List(Decl("V", VectorT(DoubleT), CallE("vector", Nil))))
  }
  test("matrix declaration") {
    assert(parse("var M: matrix[double] = matrix();") ==
      List(Decl("M", MatrixT(DoubleT), CallE("matrix", Nil))))
  }
  test("map declaration") {
    assert(parse("var C: map[string,long] = map();") ==
      List(Decl("C", MapT(StringT, LongT), CallE("map", Nil))))
  }
  test("tuple-typed vector declaration") {
    assert(parse("var t: vector[(double,long)] = vector();") ==
      List(Decl("t", VectorT(TupleT(List(DoubleT, LongT))), CallE("vector", Nil))))
  }

  test("assignment") {
    assert(parse("V[i] := 0;") ==
      List(Assign(LIndex("V", List(Ref("i"))), IntLit(0))))
  }
  test("incremental updates") {
    assert(parse("x += 1;") == List(IncrAssign(LVar("x"), "+", IntLit(1))))
    assert(parse("x *= 2;") == List(IncrAssign(LVar("x"), "*", IntLit(2))))
    assert(parse("b &&= p;") == List(IncrAssign(LVar("b"), "&&", Ref("p"))))
    assert(parse("b ||= p;") == List(IncrAssign(LVar("b"), "||", Ref("p"))))
    assert(parse("m min= v;") == List(IncrAssign(LVar("m"), "min", Ref("v"))))
    assert(parse("m max= v;") == List(IncrAssign(LVar("m"), "max", Ref("v"))))
  }
  test("min= does not swallow comparisons") {
    // `min == v` must not lex as `min=` `= v`
    assert(parseExpr("mn == v") == BinOp("==", Ref("mn"), Ref("v")))
  }

  test("for-range loop") {
    assert(parse("for i = 0, 9 do V[i] := 0;") ==
      List(ForRange("i", IntLit(0), IntLit(9),
        Assign(LIndex("V", List(Ref("i"))), IntLit(0)))))
  }
  test("for-in loop") {
    assert(parse("for v in V do s += v;") ==
      List(ForIn("v", "V", IncrAssign(LVar("s"), "+", Ref("v")))))
  }
  test("nested loops") {
    val p = parse("for i = 0, n-1 do for j = 0, n-1 do R[i,j] := 0;")
    assert(p.head.isInstanceOf[ForRange])
    val ForRange(_, _, _, inner) = p.head: @unchecked
    assert(inner.isInstanceOf[ForRange])
  }
  test("while loop") {
    val p = parse("while (k < 10) k += 1;")
    assert(p == List(While(BinOp("<", Ref("k"), IntLit(10)),
      IncrAssign(LVar("k"), "+", IntLit(1)))))
  }
  test("if without else") {
    assert(parse("if (v < 100) s += v;") ==
      List(If(BinOp("<", Ref("v"), IntLit(100)),
        IncrAssign(LVar("s"), "+", Ref("v")), None)))
  }
  test("if with else") {
    val p = parse("if (b) x := 1; else x := 2;")
    assert(p.head.asInstanceOf[If].elseS.isDefined)
  }
  test("statement block with trailing semicolon") {
    val p = parse("for v in V do { a += v; b += 1; };")
    assert(p.head.asInstanceOf[ForIn].body.asInstanceOf[Block].stmts.length == 2)
  }
  test("line comments are skipped") {
    assert(parse("// a comment\nx += 1; // trailing\n") ==
      List(IncrAssign(LVar("x"), "+", IntLit(1))))
  }

  // --------------------------------------------------------------- errors

  test("missing semicolon is an error") {
    assertThrows[ParseError](parse("x := 1"))
  }
  test("unterminated string is an error") {
    assertThrows[ParseError](parse("x := \"abc;"))
  }
  test("unknown type is an error") {
    assertThrows[ParseError](parse("var x: widget = 0;"))
  }
  test("indexing a non-name is an error") {
    assertThrows[ParseError](parseExpr("(a+b)[i]"))
  }
  test("keywords cannot be identifiers") {
    assertThrows[ParseError](parse("for := 1;"))
  }

  test("all benchmark programs parse") {
    for (p <- repro.programs.Benchmarks.all)
      assert(parse(p.source).nonEmpty, p.name)
  }
}
