package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class HungarianSpec extends AnyFunSuite {

  private def brute(cost: Array[Array[Double]]): Double = {
    val n = cost.length
    val m = cost(0).length
    (0 until m).toVector.combinations(n).flatMap(_.permutations).map { perm =>
      perm.zipWithIndex.map { case (j, i) => cost(i)(j) }.sum
    }.min
  }

  test("1x1") {
    assert(Hungarian.solve(Array(Array(3.0))).get.toSeq == Seq(0))
  }

  test("known 3x3 instance") {
    val c = Array(
      Array(4.0, 1.0, 3.0),
      Array(2.0, 0.0, 5.0),
      Array(3.0, 2.0, 2.0))
    val sol = Hungarian.solve(c).get
    assert(math.abs(Hungarian.costOf(c, sol) - 5.0) < 1e-9) // 1 + 2 + 2
  }

  test("assignment is a valid matching (no column reused)") {
    val rng = new Random(4)
    val c = Array.fill(5, 8)(rng.nextDouble() * 100)
    val sol = Hungarian.solve(c).get
    assert(sol.toSet.size == sol.length)
    assert(sol.forall(j => j >= 0 && j < 8))
  }

  test("matches brute force on 80 random square matrices up to 6x6") {
    val rng = new Random(5)
    for (_ <- 1 to 80) {
      val n = 2 + rng.nextInt(5)
      val c = Array.fill(n, n)(rng.nextDouble() * 50)
      val sol = Hungarian.solve(c).get
      assert(math.abs(Hungarian.costOf(c, sol) - brute(c)) < 1e-9)
    }
  }

  test("matches brute force on 60 random rectangular matrices") {
    val rng = new Random(6)
    for (_ <- 1 to 60) {
      val n = 2 + rng.nextInt(4)
      val m = n + rng.nextInt(4)
      val c = Array.fill(n, m)(rng.nextDouble() * 50)
      val sol = Hungarian.solve(c).get
      assert(math.abs(Hungarian.costOf(c, sol) - brute(c)) < 1e-9)
    }
  }

  test("forbidden edges are avoided when possible") {
    val F = Hungarian.Forbidden
    val c = Array(
      Array(F, 1.0),
      Array(1.0, F))
    val sol = Hungarian.solve(c).get
    assert(sol.toSeq == Seq(1, 0))
  }

  test("infeasible when a row has only forbidden edges") {
    val F = Hungarian.Forbidden
    val c = Array(
      Array(F, F),
      Array(1.0, 2.0))
    assert(Hungarian.solve(c).isEmpty)
  }

  test("rows > cols is rejected") {
    assertThrows[IllegalArgumentException] {
      Hungarian.solve(Array(Array(1.0), Array(2.0)))
    }
  }

  test("handles ties deterministically and optimally") {
    val c = Array(
      Array(1.0, 1.0),
      Array(1.0, 1.0))
    val sol = Hungarian.solve(c).get
    assert(math.abs(Hungarian.costOf(c, sol) - 2.0) < 1e-9)
  }

  test("empty matrix") {
    assert(Hungarian.solve(Array.empty[Array[Double]]).get.isEmpty)
  }
}
