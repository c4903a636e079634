package repro.prolog

import org.scalatest.funsuite.AnyFunSuite

class ParserSpec extends AnyFunSuite {

  private def term(s: String): Term = Parser.parseTermOnly(s)

  test("parses plain atoms") {
    assert(term("foo") == Atom("foo"))
    assert(term("fooBar_1") == Atom("fooBar_1"))
  }

  test("parses quoted atoms") {
    assert(term("'Job'") == Atom("Job"))
    assert(term("'WRITES_TO'") == Atom("WRITES_TO"))
    assert(term("'has space'") == Atom("has space"))
  }

  test("quoted atom with escaped quote") {
    assert(term("'it''s'") == Atom("it's"))
    assert(term("'a\\'b'") == Atom("a'b"))
  }

  test("parses variables") {
    assert(term("X") == Var("X"))
    assert(term("XTYPE") == Var("XTYPE"))
    assert(term("_").isInstanceOf[Var]) // anonymous: fresh variable per occurrence
    assert(term("_Trail") == Var("_Trail"))
  }

  test("parses integers") {
    assert(term("0") == Num(0))
    assert(term("42") == Num(42))
    assert(term("-7") == Num(-7))
  }

  test("parses compound terms") {
    assert(term("f(a)") == Struct("f", Vector(Atom("a"))))
    assert(term("schemaEdge('Job','File','WRITES_TO')") ==
      Struct("schemaEdge", Vector(Atom("Job"), Atom("File"), Atom("WRITES_TO"))))
  }

  test("parses nested compound terms") {
    assert(term("f(g(X), h(Y, 1))") ==
      Struct("f", Vector(Struct("g", Vector(Var("X"))), Struct("h", Vector(Var("Y"), Num(1))))))
  }

  test("parses empty list") {
    assert(term("[]") == Term.EmptyList)
  }

  test("parses proper lists") {
    assert(term("[1,2,3]") == Term.mkList(Seq(Num(1), Num(2), Num(3))))
  }

  test("parses head-tail lists") {
    assert(term("[X|T]") == Struct(".", Vector(Var("X"), Var("T"))))
    assert(term("[a,b|T]") ==
      Struct(".", Vector(Atom("a"), Struct(".", Vector(Atom("b"), Var("T"))))))
  }

  test("parses infix arithmetic with precedence") {
    assert(term("1 + 2 * 3") ==
      Struct("+", Vector(Num(1), Struct("*", Vector(Num(2), Num(3))))))
  }

  test("arithmetic is left-associative") {
    assert(term("1 - 2 - 3") ==
      Struct("-", Vector(Struct("-", Vector(Num(1), Num(2))), Num(3))))
  }

  test("parenthesized expressions override precedence") {
    assert(term("(1 + 2) * 3") ==
      Struct("*", Vector(Struct("+", Vector(Num(1), Num(2))), Num(3))))
  }

  test("parses is/2") {
    assert(term("K is K1 + 1") ==
      Struct("is", Vector(Var("K"), Struct("+", Vector(Var("K1"), Num(1))))))
  }

  test("parses comparison operators") {
    assert(term("X < Y") == Struct("<", Vector(Var("X"), Var("Y"))))
    assert(term("X =< Y") == Struct("=<", Vector(Var("X"), Var("Y"))))
    assert(term("X >= Y") == Struct(">=", Vector(Var("X"), Var("Y"))))
    assert(term("X =:= Y") == Struct("=:=", Vector(Var("X"), Var("Y"))))
    assert(term("X =\\= Y") == Struct("=\\=", Vector(Var("X"), Var("Y"))))
  }

  test("parses conjunction right-associatively") {
    assert(term("a, b, c") ==
      Struct(",", Vector(Atom("a"), Struct(",", Vector(Atom("b"), Atom("c"))))))
  }

  test("parses disjunction and if-then-else") {
    assert(term("a ; b") == Struct(";", Vector(Atom("a"), Atom("b"))))
    assert(term("(c -> t ; e)") ==
      Struct(";", Vector(Struct("->", Vector(Atom("c"), Atom("t"))), Atom("e"))))
  }

  test("anonymous variables are distinct per occurrence") {
    val t = term("f(_, _)").asInstanceOf[Struct]
    assert(t.args(0) != t.args(1))
  }

  test("parses negation forms") {
    assert(term("not(p(X))") == Struct("not", Vector(Struct("p", Vector(Var("X"))))))
    assert(term("\\+ p(X)") == Struct("\\+", Vector(Struct("p", Vector(Var("X"))))))
  }

  test("comma inside argument list is a separator, not conjunction") {
    assert(term("f(a, b)") == Struct("f", Vector(Atom("a"), Atom("b"))))
  }

  test("operator term as argument") {
    assert(term("f(X + 1)") == Struct("f", Vector(Struct("+", Vector(Var("X"), Num(1))))))
  }

  test("parses a fact clause") {
    val cs = Parser.parseProgram("schemaVertex('Job').")
    assert(cs == List(Clause(Struct("schemaVertex", Vector(Atom("Job"))), Nil)))
  }

  test("parses a rule clause with conjunctive body") {
    val cs = Parser.parseProgram("p(X) :- q(X), r(X).")
    assert(cs == List(Clause(
      Struct("p", Vector(Var("X"))),
      List(Struct("q", Vector(Var("X"))), Struct("r", Vector(Var("X")))))))
  }

  test("parses multiple clauses with comments") {
    val cs = Parser.parseProgram(
      """% line comment
        |p(1). /* block
        |comment */ p(2).
        |q(X) :- p(X).
        |""".stripMargin)
    assert(cs.size == 3)
    assert(cs(1) == Clause(Struct("p", Vector(Num(2))), Nil))
  }

  test("parses the paper's Lst. 2 schemaKHopPath rule") {
    val cs = Parser.parseProgram(
      """schemaKHopPath(X,Y,K) :- schemaKHopPath(X,Y,K,[]).
        |schemaKHopPath(X,Y,K,Trail) :-
        |  schemaEdge(X,Z,_), not(member(Z,Trail)),
        |  schemaKHopPath(Z,Y,K1,[X|Trail]), K is K1 + 1.
        |""".stripMargin)
    assert(cs.size == 2)
    assert(cs(1).body.size == 4)
  }

  test("parses findall/3 with compound template") {
    assert(term("findall(SRC, queryEdge(SRC, X), INLIST)") ==
      Struct("findall", Vector(Var("SRC"),
        Struct("queryEdge", Vector(Var("SRC"), Var("X"))), Var("INLIST"))))
  }

  test("clause-final dot requires layout (list dots untouched)") {
    val cs = Parser.parseProgram("p([1,2]).\nq(x).")
    assert(cs.size == 2)
  }

  test("rejects unterminated clause") {
    assertThrows[Parser.ParseError](Parser.parseProgram("p(a)"))
  }

  test("rejects garbage input") {
    assertThrows[Parser.ParseError](Parser.parseProgram("p(a) &&& q."))
  }

  test("show round-trips representative terms") {
    val samples = Seq("f(a,'B type',[1,2|T])", "k is K1 + 1", "[a,b,c]")
    for (src <- samples) {
      val t = term(src)
      assert(term(t.show) == t, s"round-trip failed for $src -> ${t.show}")
    }
  }

  test("parseGoals flattens conjunctions") {
    val goals = Parser.parseGoals("a, b(X), c")
    assert(goals == List(Atom("a"), Struct("b", Vector(Var("X"))), Atom("c")))
  }
}
