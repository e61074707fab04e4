package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions.col
import repro.gf.GfFunctions
import repro.graph.{GraphOps, SpaceTracker}
import scala.util.Random

/** Randomised Contraction executed as literal SQL text (Appendix A, Fig. 8).
  *
  * The paper's experiment driver is a Python script that issues SQL strings
  * against the database; §VII-C then runs the *same SQL* in Spark SQL to
  * compare engines. This class is that Spark-SQL incarnation: the fast
  * variant's queries are submitted verbatim via `spark.sql` over temp views,
  * with `gf64_axb` playing the paper's `axplusb` UDF. Semantically identical
  * to [[RandomisedContraction]] (Fast / FiniteField64); it exists so the
  * §VII-C engine comparison has a same-SQL-different-API pair.
  */
case object RcSparkSql extends CcAlgorithm {
  override val name = "RC-sql"

  private val MaxRounds = 10000

  override def run(edges: DataFrame, tracker: SpaceTracker, seed: Long): CcRun = {
    val spark = edges.sparkSession
    GfFunctions.ensureRegistered(spark)
    val rng = new Random(seed)
    val tag = s"rc_${math.abs(rng.nextLong()).toString.take(8)}" // unique view namespace

    def mat(view: String, sql: String): Long = {
      val (df, rows) = tracker.materialize(view, spark.sql(sql))
      df.createOrReplaceTempView(view)
      rows
    }

    GraphOps.asEdges(edges).createOrReplaceTempView(s"${tag}_in")
    val e0Rows = mat(s"${tag}_ccgraph",
      s"select v, w from ${tag}_in union all select w as v, v as w from ${tag}_in")
    if (e0Rows == 0L)
      return CcRun(spark.range(0).select(col("id").as("v"), col("id").as("r")), 0, tracker)

    var round = 0
    val stack = scala.collection.mutable.Stack.empty[(Long, Long)]
    var done  = false
    while (!done) {
      round += 1
      require(round <= MaxRounds, s"$name did not converge in $MaxRounds rounds")
      var a = 0L
      while (a == 0L) a = rng.nextLong()
      val b = rng.nextLong()
      stack.push((a, b))
      mat(s"${tag}_ccreps$round",
        s"""select v, least(gf64_axb($a, v, $b), min(gf64_axb($a, w, $b))) as rep
           |from ${tag}_ccgraph group by v""".stripMargin)
      val rows = mat(s"${tag}_ccgraph2",
        s"""select distinct r1.rep as v, r2.rep as w
           |from ${tag}_ccgraph g, ${tag}_ccreps$round r1, ${tag}_ccreps$round r2
           |where g.v = r1.v and g.w = r2.v and r1.rep != r2.rep""".stripMargin)
      tracker.drop(s"${tag}_ccgraph")
      tracker.recordRound(rows)
      spark.sql(s"select * from ${tag}_ccgraph2").createOrReplaceTempView(s"${tag}_ccgraph")
      tracker.rename(s"${tag}_ccgraph2", s"${tag}_ccgraph")
      if (rows == 0L) done = true
    }

    // Back-to-front composition with the (A,B) accumulator (Fig. 8, 2nd loop).
    var (accA, accB) = (repro.gf.Gf64.One, 0L)
    var i = round
    while (i > 1) {
      val (alpha, beta) = stack.pop()
      val (na, nb) = (repro.gf.Gf64.axb(accA, alpha, 0L), repro.gf.Gf64.axb(accA, beta, accB))
      accA = na; accB = nb
      i -= 1
      mat(s"${tag}_tmp",
        s"""select r1.v as v, coalesce(r2.rep, gf64_axb($accA, r1.rep, $accB)) as rep
           |from ${tag}_ccreps$i r1 left outer join ${tag}_ccreps${i + 1} r2 on r1.rep = r2.v""".stripMargin)
      tracker.drop(s"${tag}_ccreps$i"); tracker.drop(s"${tag}_ccreps${i + 1}")
      spark.sql(s"select * from ${tag}_tmp").createOrReplaceTempView(s"${tag}_ccreps$i")
      tracker.rename(s"${tag}_tmp", s"${tag}_ccreps$i")
    }
    val labels = spark.sql(s"select v, rep as r from ${tag}_ccreps1")
    CcRun(labels.localCheckpoint(true), round, tracker)
  }
}
