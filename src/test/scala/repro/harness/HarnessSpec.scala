package repro.harness

import repro.ReproSpec
import repro.baselines.HashToMin
import repro.core.RandomisedContraction
import repro.datasets.{BenchDataset, Generators}

class HarnessSpec extends ReproSpec {

  private def tinyRmat = BenchDataset("tiny-rmat",
    sp => Generators.rmat(sp, scale = 8, nEdges = 600),
    "-", "-", "-", "-", "-", "-", "-")

  private def tinyPath = BenchDataset("tiny-path",
    sp => Generators.path(sp, 2500),
    "-", "-", "-", "-", "-", "-", "-")

  test("prepare computes exact dataset statistics") {
    val stats = BenchHarness.prepare(spark, tinyPath.build)
    assert(stats.rows == 2499L)
    assert(stats.vertices == 2500L)
    assert(stats.components == 1L)
    assert(stats.componentSizes.values.sum == 2500L)
  }

  test("runOne returns ok with positive time, rounds and space for RC") {
    val stats = BenchHarness.prepare(spark, tinyRmat.build)
    val r     = BenchHarness.runOne(stats, "tiny-rmat", RandomisedContraction())
    assert(r.status == "ok")
    assert(r.seconds > 0)
    assert(r.rounds >= 1)
    assert(r.maxLiveRows >= r.inputRows) // at least the doubled setup table
    assert(r.totalWrittenRows >= r.maxLiveRows)
  }

  test("runOne reports '—' when the algorithm hits the space cap (HM on a path)") {
    val stats = BenchHarness.prepare(spark, tinyPath.build)
    val r     = BenchHarness.runOne(stats, "tiny-path", HashToMin)
    assert(r.status == "—", s"expected blow-up, got ${r.status} with max=${r.maxLiveRows}")
  }

  test("sweep covers all dataset × algorithm cells") {
    val res = BenchHarness.sweep(spark, Seq(tinyRmat),
      Seq(RandomisedContraction(), repro.baselines.TwoPhase))
    assert(res.map(r => (r.dataset, r.algo)).toSet ==
      Set(("tiny-rmat", "RC"), ("tiny-rmat", "TP")))
    assert(res.forall(_.status == "ok"))
  }

  test("capRows scales with input but has a floor") {
    assert(BenchHarness.capRows(10L) == 2_000_000L)
    assert(BenchHarness.capRows(1_000_000L) == 40_000_000L)
  }

  test("table renderers produce one row per dataset and a '—' cell for DNFs") {
    val rs = Seq(
      BenchResult("d1", "RC", 1.5, 4, 100, 400, 900, "ok"),
      BenchResult("d1", "HM", 2.0, 3, 100, 4000, 9000, "—"),
      BenchResult("d2", "RC", 0.5, 2, 50, 200, 450, "ok"),
      BenchResult("d2", "HM", 0.7, 2, 50, 210, 500, "ok"))
    val t3 = TableFormat.tableIII(rs, Seq("RC", "HM"))
    assert(t3.linesIterator.size == 4) // header + separator + 2 rows
    assert(t3.contains("—"))
    assert(t3.contains("1.5"))
    val t4 = TableFormat.tableIV(rs, Seq("RC", "HM"))
    assert(t4.contains("input MB"))
    val t5 = TableFormat.tableV(rs, Seq("RC", "HM"))
    assert(t5.contains("0.0")) // 450 rows * 16B = 0.0072 MB
    val tsv = TableFormat.tsv(rs)
    assert(tsv.linesIterator.size == 5)
  }

  test("MB conversions use 16 bytes per row") {
    val r = BenchResult("d", "RC", 1.0, 1, 1_000_000L, 2_000_000L, 3_000_000L, "ok")
    assert(math.abs(r.inputMb - 16.0) < 1e-9)
    assert(math.abs(r.maxMb - 32.0) < 1e-9)
    assert(math.abs(r.writtenMb - 48.0) < 1e-9)
  }
}
