package repro.datasets

import org.apache.spark.sql.functions._
import repro.ReproSpec
import repro.graph.{GraphOps, LocalUnionFind}

class GeneratorsSpec extends ReproSpec {

  private def collectEdges(df: org.apache.spark.sql.DataFrame): Seq[(Long, Long)] =
    df.collect().map(r => (r.getLong(0), r.getLong(1))).toSeq

  test("path(n) has n-1 sequential edges and one component") {
    val e = collectEdges(Generators.path(spark, 100))
    assert(e.size == 99)
    assert(e == (0L until 99L).map(i => (i, i + 1)))
    assert(LocalUnionFind.fromEdges(e).componentCount == 1)
  }

  test("path honours the offset") {
    val e = collectEdges(Generators.path(spark, 5, offset = 1000))
    assert(e == Seq((1000L, 1001L), (1001L, 1002L), (1002L, 1003L), (1003L, 1004L)))
  }

  test("path rejects n < 2") {
    assertThrows[IllegalArgumentException](Generators.path(spark, 1))
  }

  test("pathUnion(k) has exactly k components with doubling lengths") {
    val e  = collectEdges(Generators.pathUnion(spark, k = 4, baseLen = 4))
    val uf = LocalUnionFind.fromEdges(e)
    assert(uf.componentCount == 4)
    assert(uf.componentSizes.values.toSeq.sorted == Seq(4L, 8L, 16L, 32L))
    // Disjoint vertex ranges: edge count = total vertices - k.
    assert(e.size == (4 + 8 + 16 + 32) - 4)
  }

  test("rmat is deterministic in the seed") {
    val a = collectEdges(Generators.rmat(spark, scale = 8, nEdges = 500, seed = 42))
    val b = collectEdges(Generators.rmat(spark, scale = 8, nEdges = 500, seed = 42))
    assert(a.sorted == b.sorted)
    val c = collectEdges(Generators.rmat(spark, scale = 8, nEdges = 500, seed = 43))
    assert(a.sorted != c.sorted)
  }

  test("rmat produces no loops and at most nEdges edges") {
    val e = collectEdges(Generators.rmat(spark, scale = 10, nEdges = 2000))
    assert(e.size <= 2000)
    assert(e.size > 1000) // duplicates exist but must not dominate at this density
    assert(e.forall { case (v, w) => v != w })
  }

  test("rmat skew: top-degree vertex well above the mean (power-law-ish)") {
    val e   = collectEdges(Generators.rmat(spark, scale = 10, nEdges = 4000))
    val deg = e.flatMap { case (v, w) => Seq(v, w) }.groupBy(identity).map(_._2.size)
    val mean = deg.sum.toDouble / deg.size
    assert(deg.max > mean * 5, s"max degree ${deg.max} vs mean $mean — not skewed")
  }

  test("rmat rejects invalid quadrant probabilities") {
    assertThrows[IllegalArgumentException](
      Generators.rmat(spark, scale = 4, nEdges = 10, a = 0.9, b = 0.2, c = 0.2))
  }

  test("streets is low-degree (max 4) with |E| ≈ |V|") {
    val df  = Generators.streets(spark, 40, 30)
    val e   = collectEdges(df)
    val deg = e.flatMap { case (v, w) => Seq(v, w) }.groupBy(identity).map(_._2.size)
    assert(deg.max <= 4)
    val nV = e.flatMap { case (v, w) => Seq(v, w) }.distinct.size
    assert(e.size.toDouble / nV > 0.7 && e.size.toDouble / nV < 1.6)
  }

  test("streets is deterministic") {
    val a = collectEdges(Generators.streets(spark, 20, 20))
    val b = collectEdges(Generators.streets(spark, 20, 20))
    assert(a.sorted == b.sorted)
  }

  test("social graph has a giant component (Friendster analogue)") {
    val e  = collectEdges(Generators.social(spark, scale = 10, nEdges = 4000))
    val uf = LocalUnionFind.fromEdges(e)
    val maxComp = uf.componentSizes.values.max
    assert(maxComp.toDouble / uf.verticesSeen.size > 0.5, "no giant component")
  }

  test("DatasetCatalog datasets build and are non-trivial at tiny scale") {
    for (d <- DatasetCatalog.all.take(2)) { // Andromeda + Bitcoin addresses
      val e = GraphOps.asEdges(d.build(spark))
      assert(e.limit(1).count() == 1L, s"${d.name} generated no edges")
    }
  }
}
