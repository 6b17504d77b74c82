package repro.gvdl

import org.scalatest.funsuite.AnyFunSuite
import Lexer._

class LexerSpec extends AnyFunSuite {

  test("keywords and identifiers tokenize") {
    assert(tokenize("create view foo") ==
      Vector(Ident("create"), Ident("view"), Ident("foo"), EOF))
  }

  test("identifiers may contain dashes (view names)") {
    assert(tokenize("CA-Long-Calls") == Vector(Ident("CA-Long-Calls"), EOF))
  }

  test("numbers tokenize, including decimals") {
    assert(tokenize("10 3.5") == Vector(Num(10.0), Num(3.5), EOF))
  }

  test("negative number after comparison operator") {
    assert(tokenize("x > -4") == Vector(Ident("x"), Sym(">"), Num(-4.0), EOF))
  }

  test("single-quoted string literals") {
    assert(tokenize("src.state = 'CA'") ==
      Vector(Ident("src"), Sym("."), Ident("state"), Sym("="), Str("CA"), EOF))
  }

  test("double-quoted string literals") {
    assert(tokenize("\"NY\"") == Vector(Str("NY"), EOF))
  }

  test("two-char comparison operators") {
    assert(tokenize("a <= b >= c != d") ==
      Vector(Ident("a"), Sym("<="), Ident("b"), Sym(">="), Ident("c"),
             Sym("!="), Ident("d"), EOF))
  }

  test("unicode ≤ and ≥ are accepted (Listing 3 style)") {
    assert(tokenize("duration≤1") == Vector(Ident("duration"), Sym("<="), Num(1.0), EOF))
    assert(tokenize("x≥2") == Vector(Ident("x"), Sym(">="), Num(2.0), EOF))
  }

  test("brackets, colons and commas") {
    assert(tokenize("[a: 1], [b: 2]") ==
      Vector(Sym("["), Ident("a"), Sym(":"), Num(1.0), Sym("]"), Sym(","),
             Sym("["), Ident("b"), Sym(":"), Num(2.0), Sym("]"), EOF))
  }

  test("<> is normalized to !=") {
    assert(tokenize("a <> b") == Vector(Ident("a"), Sym("!="), Ident("b"), EOF))
  }

  test("unterminated string throws") {
    assertThrows[IllegalArgumentException](tokenize("'oops"))
  }

  test("unexpected character throws") {
    assertThrows[IllegalArgumentException](tokenize("a ; b"))
  }

  test("count(*) tokenizes with star symbol") {
    assert(tokenize("count(*)") ==
      Vector(Ident("count"), Sym("("), Sym("*"), Sym(")"), EOF))
  }
}
