package repro.partition

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class MergeIlpExactSpec extends AnyFunSuite {

  private val cat = FileCatalog(Vector.fill(8)(10L), Vector.fill(8)(100L))

  test("tight threshold forces all singletons") {
    val parts = (0 until 3).map(i => Part.initial(i, Seq(i, i + 1), 1)).toVector
    val singles = Part.totalCost(parts, cat)
    val sol = MergeIlpExact.solve(parts, cat, singles).get
    assert(sol.merges.length == 3)
    assert(sol.spaceRows == Part.totalSpaceRows(parts, cat))
  }

  test("overlapping partitions merge when budget allows, minimizing space") {
    val a = Part.initial(0, Seq(0, 1, 2), 1)
    val b = Part.initial(1, Seq(1, 2, 3), 1)
    val sol = MergeIlpExact.solve(Vector(a, b), cat, costThresh = 1e9).get
    assert(sol.merges.length == 1 && sol.spaceRows == 40L)
  }

  test("infeasible when even singletons break the budget") {
    val p = Part.initial(0, Seq(0), 100)
    assert(MergeIlpExact.solve(Vector(p), cat, costThresh = 1.0).isEmpty)
  }

  test("pairwise feasibility predicate is enforced") {
    val a = Part.initial(0, Seq(0, 1), 1)
    val b = Part.initial(1, Seq(1, 2), 100)
    val sol = MergeIlpExact.solve(Vector(a, b), cat, 1e9,
      feasiblePair = (x, y) => Part.accessCompatible(x, y, 2.0, 1.0)).get
    assert(sol.merges.length == 2)
  }

  test("exact space is a lower bound for G-PART on 25 random instances") {
    val rng = new Random(40)
    for (_ <- 1 to 25) {
      val parts = (0 until 5).map { i =>
        Part.initial(i, (0 to 1 + rng.nextInt(2)).map(_ => rng.nextInt(8)).toSet, 1 + rng.nextInt(4))
      }.toVector
      val gp = GPart.merge(parts, cat, GPartConfig(rhoC = 1e9, rhoCAbs = 1e9))
      val gpCost = Part.totalCost(gp, cat)
      // exact solve with G-PART's achieved cost as the budget
      val ex = MergeIlpExact.solve(parts, cat, gpCost).get
      assert(ex.spaceRows <= Part.totalSpaceRows(gp, cat),
        "the exact cover can never need more space than the heuristic at the same budget")
    }
  }

  test("size guard rejects large instances") {
    val parts = (0 until 11).map(i => Part.initial(i, Seq(0), 1)).toVector
    assertThrows[IllegalArgumentException] { MergeIlpExact.solve(parts, cat, 1e9) }
  }
}
