package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.PropSampling
import repro.core.Knapsack.Item

class KnapsackSpec extends AnyFunSuite {

  test("empty instance") {
    assert(Knapsack.solve(IndexedSeq.empty, 10) == (0.0, Nil))
  }

  test("single item fits") {
    val (v, picks) = Knapsack.solve(IndexedSeq(Item(5, 3.0)), 10)
    assert(v == 3.0 && picks == Seq(0))
  }

  test("single item does not fit") {
    val (v, picks) = Knapsack.solve(IndexedSeq(Item(15, 3.0)), 10)
    assert(v == 0.0 && picks.isEmpty)
  }

  test("optimal beats pure greedy-by-density") {
    // Greedy by density takes item0 (w6, density 1.67) and then only item2
    // fits -> 13; the optimum is items 1+2 = 14.
    val items = IndexedSeq(Item(6, 10.0), Item(5, 8.0), Item(4, 6.0))
    val (v, picks) = Knapsack.solve(items, 9)
    assert(v == Knapsack.bruteForce(items, 9))
    assert(v == 14.0)
    assert(picks == Seq(1, 2))
  }

  test("zero-weight items are always taken") {
    val items = IndexedSeq(Item(0, 1.0), Item(0, 2.0), Item(5, 3.0))
    val (v, _) = Knapsack.solve(items, 5)
    assert(v == 6.0)
  }

  test("zero capacity admits only zero-weight items") {
    val items = IndexedSeq(Item(0, 1.5), Item(1, 100.0))
    val (v, picks) = Knapsack.solve(items, 0)
    assert(v == 1.5 && picks == Seq(0))
  }

  test("picked indices refer to the input order") {
    val items = IndexedSeq(Item(9, 1.0), Item(1, 10.0), Item(9, 1.0))
    val (v, picks) = Knapsack.solve(items, 10)
    assert(picks.contains(1))
    assert(v == 11.0)
  }

  test("all items fit") {
    val items = IndexedSeq(Item(1, 1.0), Item(2, 2.0), Item(3, 3.0))
    val (v, picks) = Knapsack.solve(items, 100)
    assert(v == 6.0 && picks == Seq(0, 1, 2))
  }

  test("reported picks attain the reported value within capacity") {
    val items = IndexedSeq(Item(3, 4.0), Item(4, 5.0), Item(5, 6.0), Item(2, 3.0))
    val (v, picks) = Knapsack.solve(items, 9)
    assert(picks.map(items(_).value).sum == v)
    assert(picks.map(items(_).weight).sum <= 9)
  }
}

class KnapsackPropSpec extends AnyFunSuite with PropSampling {
  import org.scalacheck.Gen

  override def samples: Int = 120

  private val genInstance: Gen[(IndexedSeq[Item], Long)] = for {
    n <- Gen.choose(0, 12)
    ws <- Gen.listOfN(n, Gen.choose(0L, 20L))
    vs <- Gen.listOfN(n, Gen.choose(0, 100).map(_ / 10.0))
    cap <- Gen.choose(0L, 60L)
  } yield (ws.zip(vs).map { case (w, v) => Item(w, v) }.toIndexedSeq, cap)

  test("branch-and-bound matches brute force on random instances") {
    forAll(genInstance) { case (items, cap) =>
      val (v, picks) = Knapsack.solve(items, cap)
      val expected = Knapsack.bruteForce(items, cap)
      assert(math.abs(v - expected) < 1e-9,
        s"items=$items cap=$cap got=$v expected=$expected")
      assert(picks.map(items(_).weight).sum <= cap)
      assert(math.abs(picks.map(items(_).value).sum - v) < 1e-9)
    }
  }
}
