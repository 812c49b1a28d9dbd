package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import TestGen._

class CpsSpec extends AnyFunSuite {

  test("chains partition the domain") {
    val r = tableIvU2
    val cps = Cps(r)
    assert(cps.chains.flatten.sorted == (0 until r.domainSize).toVector)
  }

  test("each chain is totally ordered in the poset") {
    val r = tableIvU1
    val cps = Cps(r)
    cps.chains.foreach { chain =>
      for (i <- chain.indices; j <- i + 1 until chain.size)
        assert(r.prefers(chain(i), chain(j)),
          s"chain ${chain.mkString("→")} not descending at ($i,$j)")
    }
  }

  test("a full chain poset embeds into a single chain") {
    val chain = PrefRelation.fromEdges(5, (0 until 4).map(i => (i, i + 1)))
    assert(Cps(chain).numChains == 1)
  }

  test("an antichain embeds into one chain per value") {
    assert(Cps(PrefRelation.empty(4)).numChains == 4)
  }

  for (seed <- 0 until 20)
    test(s"CPS embedding is exact: coordinate dominance == poset dominance (seed=$seed)") {
      val rng = new Random(seed)
      val m = 4 + rng.nextInt(10)
      val r = randomRelation(rng, m, p = 0.25 + rng.nextDouble() * 0.5)
      val cps = Cps(r)
      for (x <- 0 until m; y <- 0 until m if x != y)
        assert(cps.prefersByCoords(x, y) == r.prefers(x, y),
          s"mismatch at ($x,$y) in $r with chains ${cps.chains}")
    }

  test("paper fixtures embed exactly") {
    Seq(tableIvU1, tableIvU2, tableIvU3, cpuC1, cpuC2).foreach { r =>
      val cps = Cps(r)
      for (x <- 0 until r.domainSize; y <- 0 until r.domainSize if x != y)
        assert(cps.prefersByCoords(x, y) == r.prefers(x, y))
    }
  }
}
