package repro.core

/** 0-1 knapsack solved by branch-and-bound with a fractional-relaxation
  * upper bound — the same algorithm class as the Google OR-tools solver the
  * paper uses for view selection (§ V-B, § VII-A).
  */
object Knapsack {

  /** An item to pack: weight (view size), value (improvement / creation). */
  final case class Item(weight: Long, value: Double) {
    require(weight >= 0, "negative weight")
    require(value >= 0, "negative value")
  }

  /** @return (best total value, indices of chosen items in input order). */
  def solve(items: IndexedSeq[Item], capacity: Long): (Double, Seq[Int]) = {
    require(capacity >= 0, "negative capacity")
    if (items.isEmpty) return (0.0, Nil)

    // Order by value density for the greedy fractional bound.
    val order = items.indices.sortBy(i =>
      if (items(i).weight == 0) Double.NegativeInfinity // free items first
      else -items(i).value / items(i).weight)
    val sorted = order.map(items)

    var bestValue = 0.0
    var bestPick: List[Int] = Nil

    /** Greedy fractional upper bound from position `pos` with `room` left. */
    def bound(pos: Int, acc: Double, room: Long): Double = {
      var b = acc
      var r = room
      var i = pos
      while (i < sorted.length) {
        val it = sorted(i)
        if (it.weight <= r) { b += it.value; r -= it.weight } // covers weight 0 at r == 0
        else if (it.weight > 0) { b += it.value * (r.toDouble / it.weight); r = 0 }
        i += 1
      }
      b
    }

    def branch(pos: Int, acc: Double, room: Long, picked: List[Int]): Unit = {
      if (acc > bestValue) { bestValue = acc; bestPick = picked }
      if (pos >= sorted.length) return
      if (bound(pos, acc, room) <= bestValue) return // prune
      val it = sorted(pos)
      if (it.weight <= room) // take
        branch(pos + 1, acc + it.value, room - it.weight, order(pos) :: picked)
      branch(pos + 1, acc, room, picked) // skip
    }

    branch(0, 0.0, capacity, Nil)
    (bestValue, bestPick.sorted)
  }

  /** Exhaustive reference solver for tests (n ≤ ~20). */
  def bruteForce(items: IndexedSeq[Item], capacity: Long): Double = {
    require(items.size <= 24, "brute force limited to small instances")
    var best = 0.0
    for (mask <- 0 until (1 << items.size)) {
      var w = 0L; var v = 0.0
      for (i <- items.indices if (mask & (1 << i)) != 0) { w += items(i).weight; v += items(i).value }
      if (w <= capacity && v > best) best = v
    }
    best
  }
}
