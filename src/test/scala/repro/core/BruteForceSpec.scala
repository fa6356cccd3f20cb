package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestSpaces
import scala.util.Random

/** The ground-truth helpers themselves, checked against naive re-derivations. */
class BruteForceSpec extends AnyFunSuite {

  private lazy val space = TestSpaces.clustered(300, 5, VectorMetric.L2, seed = 71)

  test("countNeighbors without cap equals a naive filter-count") {
    val rng = new Random(72)
    for (_ <- 0 until 50) {
      val p = rng.nextInt(space.n)
      val r = 2.0 + rng.nextDouble() * 20
      val naive = (0 until space.n).count(i => i != p && space.dist(p, i) <= r)
      assert(BruteForce.exactCount(space, p, r) == naive)
    }
  }

  test("countNeighbors respects the cap") {
    val rng = new Random(73)
    for (_ <- 0 until 50) {
      val p = rng.nextInt(space.n)
      val cap = 1 + rng.nextInt(20)
      val got = BruteForce.countNeighbors(space, p, 15.0, cap)
      assert(got == math.min(cap, BruteForce.exactCount(space, p, 15.0)))
    }
  }

  test("outliers = objects whose exact count is below k") {
    for ((r, k) <- Seq((8.0, 5), (12.0, 20))) {
      val expected = (0 until space.n).filter(p => BruteForce.exactCount(space, p, r) < k)
      assert(BruteForce.outliers(space, r, k).toSeq == expected)
    }
  }

  test("knn returns the k nearest in ascending order, excluding self") {
    val rng = new Random(74)
    for (_ <- 0 until 30) {
      val p = rng.nextInt(space.n)
      val k = 1 + rng.nextInt(15)
      val got = BruteForce.knn(space, p, k)
      assert(got.length == k)
      assert(!got.contains(p))
      val ds = got.map(space.dist(p, _))
      assert(ds.sameElements(ds.sorted))
      // the k-th distance is a lower bound for everything not selected
      val maxSel = ds.max
      val others = (0 until space.n).filterNot(i => i == p || got.contains(i))
      assert(others.forall(i => space.dist(p, i) >= maxSel - 1e-9))
    }
  }

  test("knn with k >= n-1 returns everything") {
    val s = TestSpaces.uniform(20, 3, VectorMetric.L2, seed = 75)
    val got = BruteForce.knn(s, 0, 30)
    assert(got.sorted.toSeq == (1 until 20))
  }
}
