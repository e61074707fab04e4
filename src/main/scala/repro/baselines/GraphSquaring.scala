package repro.baselines

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core.{CcAlgorithm, CcRun}
import repro.graph.{GraphOps, SpaceTracker}

/** The second simple attempt of §IV: repeated graph squaring (G², G⁴, …).
  *
  * Squaring reaches radius-2ⁿ neighbourhoods in n self-joins, so only
  * O(log diameter) rounds are needed — but a single-component graph
  * ultimately becomes complete, a Θ(|V|²) blow-up the section rejects.
  * Kept (tests/demonstrations only) to reproduce that argument: once the
  * edge set is stable, each vertex's component minimum is one aggregate away.
  */
case object GraphSquaring extends CcAlgorithm {
  override val name = "SQ"

  private val MaxRounds = 100

  /** G ∪ G²: add (x, z) for every path x–y–z, canonicalised. */
  private def square(e: DataFrame): DataFrame = {
    val b   = GraphOps.undirect(e)
    val two = b.select(col("v").as("x"), col("w").as("y"))
      .join(b.select(col("v").as("y2"), col("w").as("z")), col("y") === col("y2"))
      .select(col("x").as("v"), col("z").as("w"))
    GraphOps.canonical(e.union(two))
  }

  override def run(edges: DataFrame, tracker: SpaceTracker, seed: Long): CcRun = {
    val raw   = GraphOps.asEdges(edges)
    val verts = GraphOps.vertices(raw).localCheckpoint(true)
    var (e, eRows) = tracker.materialize("E0", GraphOps.canonical(raw))
    var round = 0
    var done  = eRows == 0L
    while (!done) {
      round += 1
      require(round <= MaxRounds, s"$name did not converge in $MaxRounds rounds")
      val (ne, neRows) = tracker.materialize(s"E$round", square(e))
      tracker.drop(s"E${round - 1}")
      tracker.recordRound(neRows)
      // The edge set only grows under ∪ G²; equal counts ⇒ fixpoint.
      if (neRows == eRows) done = true
      e = ne; eRows = neRows
    }
    // In the transitive closure, min over the closed neighbourhood is the
    // component minimum.
    val m = GraphOps.undirect(e).groupBy(col("v")).agg(least(col("v"), min(col("w"))).as("r"))
    val labels = verts.join(m, Seq("v"), "left_outer")
      .select(col("v"), coalesce(col("r"), col("v")).as("r"))
    CcRun(labels, round, tracker)
  }
}
