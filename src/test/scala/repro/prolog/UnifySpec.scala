package repro.prolog

import org.scalatest.funsuite.AnyFunSuite
import repro.PropSampling

class UnifySpec extends AnyFunSuite {

  private def u(a: Term, b: Term): Option[Subst] = Unify.unify(a, b, Subst.empty)

  test("atom unifies with itself") {
    assert(u(Atom("a"), Atom("a")).isDefined)
  }

  test("distinct atoms do not unify") {
    assert(u(Atom("a"), Atom("b")).isEmpty)
  }

  test("numbers unify by value") {
    assert(u(Num(3), Num(3)).isDefined)
    assert(u(Num(3), Num(4)).isEmpty)
  }

  test("atom and number do not unify") {
    assert(u(Atom("3"), Num(3)).isEmpty)
  }

  test("variable binds to atom") {
    val s = u(Var("X"), Atom("a")).get
    assert(s.resolve(Var("X")) == Atom("a"))
  }

  test("binding is symmetric") {
    val s = u(Atom("a"), Var("X")).get
    assert(s.resolve(Var("X")) == Atom("a"))
  }

  test("same variable unifies trivially without binding") {
    val s = u(Var("X"), Var("X")).get
    assert(s.bindings.isEmpty)
  }

  test("two variables alias") {
    val s = u(Var("X"), Var("Y")).get
    val s2 = Unify.unify(Var("X"), Num(7), s).get
    assert(s2.resolve(Var("Y")) == Num(7))
  }

  test("structs unify componentwise") {
    val s = u(Struct("f", Vector(Var("X"), Num(2))), Struct("f", Vector(Num(1), Var("Y")))).get
    assert(s.resolve(Var("X")) == Num(1))
    assert(s.resolve(Var("Y")) == Num(2))
  }

  test("different functors fail") {
    assert(u(Struct("f", Vector(Num(1))), Struct("g", Vector(Num(1)))).isEmpty)
  }

  test("different arities fail") {
    assert(u(Struct("f", Vector(Num(1))), Struct("f", Vector(Num(1), Num(2)))).isEmpty)
  }

  test("conflicting bindings fail") {
    assert(u(Struct("f", Vector(Var("X"), Var("X"))), Struct("f", Vector(Num(1), Num(2)))).isEmpty)
  }

  test("consistent repeated variable succeeds") {
    assert(u(Struct("f", Vector(Var("X"), Var("X"))), Struct("f", Vector(Num(1), Num(1)))).isDefined)
  }

  test("nested structure unification") {
    val a = Parser.parseTermOnly("kHopConnector(X, Y, 'Job', 'Job', K)")
    val b = Parser.parseTermOnly("kHopConnector(q_j1, q_j2, T, T, 2)")
    val s = u(a, b).get
    assert(s.resolve(Var("X")) == Atom("q_j1"))
    assert(s.resolve(Var("K")) == Num(2))
    assert(s.resolve(Var("T")) == Atom("Job"))
  }

  test("list unification binds tail") {
    val s = u(Parser.parseTermOnly("[1,2|T]"), Parser.parseTermOnly("[1,2,3,4]")).get
    assert(s.resolve(Var("T")) == Term.mkList(Seq(Num(3), Num(4))))
  }

  test("resolve is idempotent after full binding") {
    val s = u(Parser.parseTermOnly("f(X, g(Y))"), Parser.parseTermOnly("f(1, g(h(2)))")).get
    val r = s.resolve(Parser.parseTermOnly("f(X, g(Y))"))
    assert(r == Parser.parseTermOnly("f(1, g(h(2)))"))
    assert(s.resolve(r) == r)
  }
}

/** Property tests: unification laws over randomly generated terms. */
class UnifyPropSpec extends AnyFunSuite with PropSampling {
  import org.scalacheck.Gen

  private val genTerm: Gen[Term] = {
    val leaf = Gen.oneOf(
      Gen.oneOf("a", "b", "c").map(Atom(_)),
      Gen.choose(0L, 5L).map(Num(_)),
      Gen.oneOf("X", "Y", "Z").map(Var(_)))
    def sized(depth: Int): Gen[Term] =
      if (depth <= 0) leaf
      else Gen.frequency(
        3 -> leaf,
        1 -> (for {
          f <- Gen.oneOf("f", "g")
          n <- Gen.choose(1, 3)
          as <- Gen.listOfN(n, sized(depth - 1))
        } yield Struct(f, as.toVector)))
    sized(3)
  }

  test("unification is symmetric in success") {
    forAll(genTerm, genTerm) { (a, b) =>
      assert(Unify.unify(a, b, Subst.empty).isDefined ==
             Unify.unify(b, a, Subst.empty).isDefined)
    }
  }

  test("every term unifies with itself") {
    forAll(genTerm) { t =>
      assert(Unify.unify(t, t, Subst.empty).isDefined)
    }
  }

  test("ground terms unify iff equal") {
    val ground = genTerm.map { t =>
      def g(x: Term): Term = x match {
        case Var(_)        => Atom("v")
        case Struct(f, as) => Struct(f, as.map(g))
        case other         => other
      }
      g(t)
    }
    forAll(ground, ground) { (a, b) =>
      assert(Unify.unify(a, b, Subst.empty).isDefined == (a == b))
    }
  }

  test("a fresh variable unifies with any term, resolving to it") {
    forAll(genTerm) { t =>
      val s = Unify.unify(Var("Fresh"), t, Subst.empty)
      assert(s.isDefined)
      assert(s.get.resolve(Var("Fresh")) == s.get.resolve(t))
    }
  }
}
