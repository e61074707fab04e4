package repro.core

import repro.ReproSpec
import repro.graph.GraphOps
import repro.testutil.Graphs

/** Correctness of Randomised Contraction across the full configuration
  * matrix: {Fig. 3 deterministic, Fig. 4 fast} × {GF(2^64), GF(p),
  * encryption, random reals}, on every zoo graph (loops, duplicates,
  * adversarial numbering, multi-component, extreme IDs) and on random
  * G(n,p) graphs — always compared against union-find as a partition.
  */
class RandomisedContractionSpec extends ReproSpec {

  private val variants: Seq[(String, Variant)] =
    Seq("fast (Fig. 4)" -> Variant.Fast, "deterministic (Fig. 3)" -> Variant.Deterministic)

  // Fast requires an affine method (the (A,B) accumulator); GF(p) needs small IDs.
  private val configs: Seq[(String, Randomisation, Variant, Boolean)] = Seq(
    ("gf64/fast",     FiniteField64,    Variant.Fast,          false),
    ("gf64/det",      FiniteField64,    Variant.Deterministic, false),
    ("modp/fast",     FinitePrimeField, Variant.Fast,          true),
    ("modp/det",      FinitePrimeField, Variant.Deterministic, true),
    ("xtea/det",      Encryption,       Variant.Deterministic, false),
    ("randreals/det", RandomReals,      Variant.Deterministic, false),
  )

  for ((cfgName, method, variant, needsSmallIds) <- configs;
       g <- Graphs.zoo if !needsSmallIds || g.smallIds) {
    test(s"$cfgName labels ${g.name} correctly") {
      val run = RandomisedContraction(method, variant).run(Graphs.toDf(spark, g.edges), seed = 5L)
      Graphs.assertPartition(run.labels, g.edges)
    }
  }

  for ((vName, variant) <- variants) {
    test(s"$vName handles the empty graph") {
      val run = RandomisedContraction(FiniteField64, variant)
        .run(Graphs.toDf(spark, Seq.empty), seed = 1L)
      assert(run.labels.count() == 0L)
      assert(run.rounds == 0)
    }

    test(s"$vName on random G(60, 0.05) graphs across seeds") {
      for (seed <- 1 to 3) {
        val edges = Graphs.randomGnp(60, 0.05, seed)
        val run   = RandomisedContraction(FiniteField64, variant)
          .run(Graphs.toDf(spark, edges), seed = seed * 31L)
        Graphs.assertPartition(run.labels, edges)
      }
    }
  }

  test("fast variant rejects non-affine methods") {
    assertThrows[IllegalArgumentException] {
      RandomisedContraction(Encryption, Variant.Fast)
        .run(Graphs.toDf(spark, Seq((1L, 2L))), seed = 1L)
    }
    assertThrows[IllegalArgumentException] {
      RandomisedContraction(RandomReals, Variant.Fast)
        .run(Graphs.toDf(spark, Seq((1L, 2L))), seed = 1L)
    }
  }

  test("runs are deterministic given the seed") {
    val edges = Graphs.randomGnp(40, 0.08, 9)
    val df    = Graphs.toDf(spark, edges)
    val a     = RandomisedContraction().run(df, seed = 123L)
    val b     = RandomisedContraction().run(df, seed = 123L)
    assert(a.rounds == b.rounds)
    val la = a.labels.collect().map(r => r.getLong(0) -> r.getLong(1)).toMap
    val lb = b.labels.collect().map(r => r.getLong(0) -> r.getLong(1)).toMap
    assert(la == lb)
  }

  test("different seeds generally produce different (but equivalent) labels") {
    val edges = Graphs.randomGnp(40, 0.08, 10)
    val df    = Graphs.toDf(spark, edges)
    val a     = RandomisedContraction().run(df, seed = 1L)
    val b     = RandomisedContraction().run(df, seed = 2L)
    Graphs.assertPartition(a.labels, edges)
    Graphs.assertPartition(b.labels, edges)
  }

  test("labels are unique per component (bijective relabelling, §V-D)") {
    val edges = Graphs.zoo.find(_.name == "mixed").get.edges
    val run   = RandomisedContraction().run(Graphs.toDf(spark, edges), seed = 3L)
    val comps = Graphs.referenceLabels(edges).values.toSet.size
    assert(GraphOps.componentCount(run.labels) == comps)
  }

  test("edge table shrinks monotonically to zero across rounds") {
    val edges = Graphs.randomGnp(80, 0.05, 11)
    val run   = RandomisedContraction().run(Graphs.toDf(spark, edges), seed = 4L)
    val sizes = run.tracker.roundEdgeRows
    assert(sizes.nonEmpty)
    assert(sizes.last == 0L)
    assert(run.rounds == sizes.length)
  }

  test("isolated vertices leave the computation after round 1 (loop-edge input)") {
    // 20/21 form an edge; 99 is isolated via a loop edge.
    val edges = Seq((20L, 21L), (99L, 99L))
    val run   = RandomisedContraction().run(Graphs.toDf(spark, edges), seed = 6L)
    Graphs.assertPartition(run.labels, edges)
    assert(run.labels.count() == 3L) // all three vertices labelled
  }

  test("sequentially numbered path contracts in O(log n) rounds, not n (§V-B)") {
    import spark.implicits._
    val n     = 512L
    val edges = (0L until n - 1).map(i => (i, i + 1))
    val run   = RandomisedContraction().run(edges.toDF("v", "w"), seed = 8L)
    Graphs.assertPartition(run.labels, edges)
    // BFS/deterministic contraction would need n-1 = 511 rounds; randomised
    // contraction is expected ~log_{4/3}(512) ≈ 22, allow generous slack.
    assert(run.rounds < 60, s"took ${run.rounds} rounds on a 512-path")
  }
}
