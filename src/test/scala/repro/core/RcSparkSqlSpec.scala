package repro.core

import repro.ReproSpec
import repro.testutil.Graphs

/** The SQL-string incarnation (Appendix A / §VII-C) must compute the same
  * partitions as the DataFrame implementation.
  */
class RcSparkSqlSpec extends ReproSpec {

  for (g <- Graphs.zoo.filter(x => Seq("mixed", "path10-sequential", "two-loops",
      "complete6", "huge-ids", "dup-and-both-orientations").contains(x.name))) {
    test(s"RC-sql labels ${g.name} correctly") {
      val run = RcSparkSql.run(Graphs.toDf(spark, g.edges), seed = 7L)
      Graphs.assertPartition(run.labels, g.edges)
    }
  }

  test("RC-sql handles the empty graph") {
    val run = RcSparkSql.run(Graphs.toDf(spark, Seq.empty), seed = 1L)
    assert(run.labels.count() == 0L)
  }

  test("RC-sql on random graphs matches union-find") {
    for (seed <- 1 to 2) {
      val edges = Graphs.randomGnp(50, 0.06, seed + 300)
      val run   = RcSparkSql.run(Graphs.toDf(spark, edges), seed = seed)
      Graphs.assertPartition(run.labels, edges)
    }
  }

  test("RC-sql and RC (DataFrame) compute the same partition") {
    val edges = Graphs.randomGnp(60, 0.05, 400)
    val df    = Graphs.toDf(spark, edges)
    val a     = repro.graph.GraphOps.normalizeLabels(RcSparkSql.run(df, seed = 2L).labels)
      .collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    val b     = repro.graph.GraphOps.normalizeLabels(RandomisedContraction().run(df, seed = 9L).labels)
      .collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(a == b)
  }
}
