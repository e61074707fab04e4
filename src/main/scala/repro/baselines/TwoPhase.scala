package repro.baselines

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core.{CcAlgorithm, CcRun}
import repro.graph.{GraphOps, SpaceTracker}

/** Two-Phase / alternating star algorithm [Kiveris et al., SoCC 2014] —
  * the linear-space comparator in the paper (best space, O(log² |V|) rounds).
  *
  * Alternates two local "hooking" operations until fixpoint:
  *
  *  - Large-Star: every node u connects its *larger* neighbours to
  *    m = min(N[u]);
  *  - Small-Star: every node u connects its *smaller-or-equal* neighbours
  *    (and itself) to m = min(N[u]).
  *
  * At the fixpoint the edge set is a union of stars whose centres are the
  * component minima. Each star operation is one aggregate + one join — the
  * same direct MapReduce→SQL translation the paper used (§VII).
  */
case object TwoPhase extends CcAlgorithm {
  override val name = "TP"

  private val MaxRounds = 10000

  private def largeStar(e: DataFrame): DataFrame = {
    val b = GraphOps.undirect(e)
    val m = b.groupBy(col("v")).agg(least(col("v"), min(col("w"))).as("m"))
    b.join(m, "v").where(col("w") > col("v"))
      .select(col("w").as("v"), col("m").as("w"))
      .distinct()
  }

  private def smallStar(e: DataFrame): DataFrame = {
    // Orient every edge large→small so each node aggregates its smaller neighbours.
    val d = e.select(greatest(col("v"), col("w")).as("v"), least(col("v"), col("w")).as("w"))
    val m = d.groupBy(col("v")).agg(min(col("w")).as("m"))
    val leaves = d.join(m, "v").where(col("w") =!= col("m"))
      .select(col("w").as("v"), col("m").as("w"))
    val self = m.select(col("v"), col("m").as("w"))
    leaves.union(self).distinct()
  }

  override def run(edges: DataFrame, tracker: SpaceTracker, seed: Long): CcRun = {
    val raw   = GraphOps.asEdges(edges)
    val verts = GraphOps.vertices(raw).localCheckpoint(true)
    var (e, eRows) = tracker.materialize("E0", GraphOps.canonical(raw))
    var eName = "E0"
    var round = 0
    var done  = eRows == 0L
    while (!done) {
      require(round <= MaxRounds, s"$name did not converge in $MaxRounds rounds")
      val (ls, _)        = tracker.materialize(s"L$round", largeStar(e))
      val (ss, ssRows)   = tracker.materialize(s"S$round", smallStar(ls))
      tracker.drop(s"L$round")
      tracker.recordRound(ssRows)
      val unchanged = ssRows == eRows && ss.except(e).isEmpty
      tracker.drop(eName)
      e = ss; eRows = ssRows; eName = s"S$round"
      round += 2 // one large-star step + one small-star step
      if (unchanged) done = true
    }
    // Fixpoint edges are (leaf, centre) stars; every non-centre has one parent.
    val parents = e.groupBy(col("v")).agg(min(col("w")).as("p"))
    val labels = verts.join(parents, Seq("v"), "left_outer")
      .select(col("v"), coalesce(col("p"), col("v")).as("r"))
    CcRun(labels, round, tracker)
  }
}
