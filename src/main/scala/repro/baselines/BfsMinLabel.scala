package repro.baselines

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core.{CcAlgorithm, CcRun}
import repro.graph.{GraphOps, SpaceTracker}

/** The "Breadth First Search" strategy of §IV — iterative minimum-label
  * propagation (what Apache MADlib's in-database CC does). Each round every
  * vertex takes the minimum representative over its closed neighbourhood;
  * after n rounds a vertex knows the minimum ID within distance n, so the
  * round count equals the graph diameter: n − 1 on a sequentially numbered
  * path, which is why §IV rules it out for Big Data. Included as the naive
  * comparator and for the worst-case demonstration tests.
  */
case object BfsMinLabel extends CcAlgorithm {
  override val name = "BFS"

  private val MaxRounds = 2000000

  override def run(edges: DataFrame, tracker: SpaceTracker, seed: Long): CcRun = {
    val raw    = GraphOps.asEdges(edges)
    val (b, _) = tracker.materialize("B", GraphOps.undirect(GraphOps.canonical(raw)))
    var (l, lRows) = tracker.materialize("L0", GraphOps.vertices(raw).select(col("v"), col("v").as("r")))
    var round  = 0
    var done   = lRows == 0L
    while (!done) {
      round += 1
      require(round <= MaxRounds, s"$name did not converge in $MaxRounds rounds")
      // Min of neighbours' current representatives.
      val nbrMin = b.join(l.select(col("v").as("lw"), col("r")), col("w") === col("lw"))
        .groupBy(col("v")).agg(min(col("r")).as("nr"))
      val improved = l.join(nbrMin, Seq("v"), "left_outer")
        .select(col("v"), least(col("r"), coalesce(col("nr"), col("r"))).as("r"),
                (col("nr").isNotNull && col("nr") < col("r")).cast("int").as("changed"))
      val (nl, _) = tracker.materialize(s"L$round", improved)
      val changed = nl.agg(sum(col("changed"))).head().getLong(0)
      tracker.drop(s"L${round - 1}")
      l = nl.select(col("v"), col("r"))
      if (changed == 0L) done = true
    }
    CcRun(l, round, tracker)
  }
}
