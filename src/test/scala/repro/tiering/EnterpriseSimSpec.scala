package repro.tiering

import org.scalatest.funsuite.AnyFunSuite
import repro.tiering.EnterpriseSim._

class EnterpriseSimSpec extends AnyFunSuite {

  private lazy val acc = EnterpriseSim.account("t", nDatasets = 200, totalPB = 0.5,
    nMonths = 18, seed = 90)

  test("account volume matches the requested PB total") {
    assert(math.abs(acc.totalPB - 0.5) < 1e-9)
  }

  test("generation is deterministic in the seed") {
    val a = EnterpriseSim.account("a", 50, 0.1, 12, seed = 91)
    val b = EnterpriseSim.account("a", 50, 0.1, 12, seed = 91)
    assert(a == b)
    val c = EnterpriseSim.account("a", 50, 0.1, 12, seed = 92)
    assert(a != c)
  }

  test("read/write series span the full timeline") {
    acc.datasets.foreach { ds =>
      assert(ds.reads.length == 18 && ds.writes.length == 18)
    }
  }

  test("no reads or writes before creation") {
    acc.datasets.foreach { ds =>
      (0 until ds.createdMonth).foreach { m =>
        assert(ds.reads(m) == 0.0 && ds.writes(m) == 0.0)
      }
    }
  }

  test("cold datasets are never read") {
    val cold = acc.datasets.filter(_.pattern == Cold)
    assert(cold.nonEmpty)
    cold.foreach(ds => assert(ds.reads.sum == 0.0))
  }

  test("spike datasets are only read in their creation month") {
    val spikes = acc.datasets.filter(_.pattern == Spike)
    assert(spikes.nonEmpty)
    spikes.foreach { ds =>
      ds.reads.zipWithIndex.foreach { case (r, m) => if (m != ds.createdMonth) assert(r == 0.0) }
    }
  }

  test("decay datasets fade: expected reads at age 5 are a fraction of age 0") {
    assert(expectedReads(Decay, 100, 0, 5) < expectedReads(Decay, 100, 0, 0) * 0.1)
  }

  test("periodic datasets peak every 6 months") {
    assert(expectedReads(Periodic, 100, 0, 6) > 10 * expectedReads(Periodic, 100, 0, 5))
    assert(expectedReads(Periodic, 100, 0, 12) > 10 * expectedReads(Periodic, 100, 0, 7))
  }

  test("Fig 1(a): access skew — top 10% of datasets carry over half the reads") {
    val totals = acc.datasets.map(_.reads.sum).sorted.reverse
    val top = totals.take(totals.length / 10).sum
    assert(top > totals.sum * 0.5)
  }

  test("most datasets are quiet in any given late month (the tiering opportunity)") {
    val m = 14
    val quiet = acc.datasets.count(_.reads(m) == 0.0)
    assert(quiet > acc.datasets.length / 2)
  }

  test("sizes are heavy-tailed: max dataset is far above the median") {
    val sizes = acc.datasets.map(_.sizeGB).sorted
    assert(sizes.last > sizes(sizes.length / 2) * 10)
  }

  test("Table II accounts have the paper's PB volumes and counts") {
    val accs = EnterpriseSim.tableIIAccounts()
    assert(accs.map(_.name) == Vector("Customer A", "Customer B", "Customer C", "Customer D"))
    assert(accs.map(a => math.rint(a.totalPB * 1000) / 1000) == Vector(0.56, 0.45, 0.053, 0.085))
    assert(accs(1).datasets.length == 463) // paper: 463 datasets for customer B
  }

  test("Table III account: 760 datasets, ~0.7 PB") {
    val a = EnterpriseSim.tableIIIAccount()
    assert(a.datasets.length == 760)
    assert(math.abs(a.totalPB - 0.7) < 1e-9)
  }
}
