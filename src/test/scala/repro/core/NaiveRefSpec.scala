package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.graph.LocalGraph
import repro.synth.GraphGen

/** Validate the naive reference itself against full subset enumeration. */
class NaiveRefSpec extends AnyFunSuite {

  /** Absolute ground truth: scan all vertex subsets (tiny graphs only). */
  private def bruteForce(g: LocalGraph, k: Int, delta: Int): Int =
    (0 until g.n).toSet.subsets()
      .filter(s => FairClique.isFairClique(g, s, k, delta))
      .map(_.size).maxOption.getOrElse(0)

  for (seed <- 1 to 15) {
    test(s"NaiveRef equals full subset enumeration (seed $seed)") {
      val g = GraphGen.randomLocal(11, 0.45, seed)
      for (k <- 1 to 3; delta <- 1 to 2) {
        assert(NaiveRef.maxFairCliqueSize(g, k, delta) == bruteForce(g, k, delta),
          s"k=$k delta=$delta")
      }
    }
  }

  for (seed <- 1 to 10) {
    test(s"NaiveRef witness clique is fair and of the reported size (seed $seed)") {
      val g = GraphGen.randomLocal(14, 0.4, seed + 20)
      for (k <- 1 to 2; delta <- 1 to 2) {
        val size = NaiveRef.maxFairCliqueSize(g, k, delta)
        val witness = NaiveRef.maxFairClique(g, k, delta)
        if (size == 0) assert(witness.isEmpty)
        else {
          assert(witness.get.length == size)
          assert(FairClique.isFairClique(g, witness.get.toSeq, k, delta))
        }
      }
    }
  }

  test("bestFairSubSize arithmetic") {
    assert(FairClique.bestFairSubSize(5, 5, 3, 1) == 10)
    assert(FairClique.bestFairSubSize(8, 3, 3, 1) == 7) // 2*3+1
    assert(FairClique.bestFairSubSize(2, 9, 3, 1) == 0) // a side below k
    assert(FairClique.bestFairSubSize(3, 3, 3, 0) == 6)
  }

  test("bestFairSubCounts returns a feasible witness") {
    for (a <- 0 to 8; b <- 0 to 8; k <- 1 to 3; d <- 0 to 3) {
      val (x, y) = FairClique.bestFairSubCounts(a, b, k, d)
      if (x + y > 0) {
        assert(x <= a && y <= b)
        assert(x >= k && y >= k && math.abs(x - y) <= d)
        assert(x + y == FairClique.bestFairSubSize(a, b, k, d))
      } else assert(FairClique.bestFairSubSize(a, b, k, d) == 0)
    }
  }

  test("isFair boundary conditions") {
    assert(FairClique.isFair(3, 3, 3, 0))
    assert(!FairClique.isFair(2, 3, 3, 5))
    assert(FairClique.isFair(5, 3, 3, 2))
    assert(!FairClique.isFair(6, 3, 3, 2))
  }
}
