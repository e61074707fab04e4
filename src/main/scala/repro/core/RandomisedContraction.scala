package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.gf.GfFunctions
import repro.graph.{GraphOps, SpaceTracker}
import scala.collection.mutable.ArrayBuffer
import scala.util.Random

/** Implementation variants of Randomised Contraction (§V-D). */
sealed trait Variant
object Variant {
  /** Fig. 3: one running composition table L — deterministic linear space. */
  case object Deterministic extends Variant
  /** Fig. 4: stack of R_i tables joined back-to-front small-to-large —
    * faster, linear space in expectation. Requires an affine method.
    */
  case object Fast extends Variant
}

/** The paper's contribution: Randomised Contraction (§V).
  *
  * Per round i: draw a fresh random bijection h_i, map every vertex to the
  * representative `r_i(v) = min_{w ∈ N[v]} h_i(w)` (one aggregate query),
  * contract the edge table by replacing endpoints with representatives and
  * dropping duplicates and loops (one self-join query), and fold r_i into the
  * running composition. Terminates when the edge table is empty; expected
  * O(log |V|) rounds for any input (Theorem 1: shrink factor γ ≤ 3/4).
  *
  * Each materialised DataFrame corresponds 1:1 to a `CREATE TABLE` in the
  * paper's SQL scripts (Figs. 3, 4, 8) and is registered with the
  * [[SpaceTracker]] so Tables IV/V space metrics can be reproduced.
  */
final case class RandomisedContraction(method: Randomisation = FiniteField64,
                                       variant: Variant = Variant.Fast) extends CcAlgorithm {

  /** Safety valve only — the expected round count is logarithmic. */
  private val MaxRounds = 10000

  override def name: String = {
    val base = variant match {
      case Variant.Fast          => "RC"
      case Variant.Deterministic => "RC-det"
    }
    if (method == FiniteField64) base else s"$base-${method.name}"
  }

  override def run(edges: DataFrame, tracker: SpaceTracker, seed: Long): CcRun = {
    val spark = edges.sparkSession
    GfFunctions.ensureRegistered(spark)
    val rng = new Random(seed)

    val (e0, e0Rows) = tracker.materialize("E0", GraphOps.undirect(GraphOps.asEdges(edges)))
    if (e0Rows == 0L) return CcRun(emptyLabels(spark), 0, tracker)

    variant match {
      case Variant.Deterministic => runDeterministic(e0, tracker, rng)
      case Variant.Fast          => runFast(e0, tracker, rng)
    }
  }

  private def emptyLabels(spark: SparkSession): DataFrame =
    spark.range(0).select(col("id").as("v"), col("id").as("r"))

  /** Representative table R: `select v, least(h(v), min(h(w))) from E group by v`.
    *
    * For the min-based methods the representative IS the h-value — the paper's
    * performance optimisation that relabels vertices each round (valid because
    * h_i is a bijection). The random-reals method instead materialises the
    * per-vertex random table and takes an argmin, keeping original IDs.
    */
  private def representatives(e: DataFrame, h: RoundHash, round: Int,
                              tracker: SpaceTracker, rng: Random): (DataFrame, Long) =
    method match {
      case RandomReals =>
        val verts       = e.select(col("v")).distinct()
        val (hTab, _)   = tracker.materialize(s"H$round", verts.select(col("v"), rand(rng.nextLong()).as("h")))
        val nbrs = e.join(hTab.select(col("v").as("hv"), col("h")), col("w") === col("hv"))
          .select(col("v"), col("w"), col("h"))
        val self = hTab.select(col("v"), col("v").as("w"), col("h"))
        val r    = nbrs.union(self).groupBy(col("v")).agg(min_by(col("w"), col("h")).as("r"))
        val out  = tracker.materialize(s"R$round", r)
        tracker.drop(s"H$round")
        out
      case _ =>
        val r = e.groupBy(col("v"))
          .agg(least(h.hash(col("v")), min(h.hash(col("w")))).as("r"))
        tracker.materialize(s"R$round", r)
    }

  /** Contraction: map both endpoints through R, drop loops and duplicates.
    * E stays bidirectional because the input was (both orientations map).
    */
  private def contract(e: DataFrame, r: DataFrame): DataFrame = {
    val rv = r.select(col("v").as("rv_v"), col("r").as("rv_r"))
    val rw = r.select(col("v").as("rw_v"), col("r").as("rw_r"))
    e.join(rv, col("v") === col("rv_v"))
      .join(rw, col("w") === col("rw_v"))
      .where(col("rv_r") =!= col("rw_r"))
      .select(col("rv_r").as("v"), col("rw_r").as("w"))
      .distinct()
  }

  /** Compose the running table L with this round's R (Fig. 3's inner join):
    * matched rows take the new representative; unmatched rows (vertices that
    * went isolated in an earlier round) only get relabelled by h_i.
    */
  private def composeL(l: DataFrame, r: DataFrame, h: RoundHash): DataFrame = {
    val rr = r.select(col("v").as("c_v"), col("r").as("c_r"))
    val relabelled = method match {
      case RandomReals => col("r") // argmin keeps original IDs: no relabelling
      case _           => h.hash(col("r"))
    }
    l.join(rr, col("r") === col("c_v"), "left_outer")
      .select(col("v"), coalesce(col("c_r"), relabelled).as("r"))
  }

  /** Fig. 3: deterministic-space variant. */
  private def runDeterministic(e0: DataFrame, tracker: SpaceTracker, rng: Random): CcRun = {
    var e      = e0
    var eName  = "E0"
    var l: DataFrame = null
    var lName  = ""
    var round  = 0
    var done   = false
    while (!done) {
      round += 1
      require(round <= MaxRounds, s"$name did not converge in $MaxRounds rounds")
      val h            = method.nextRound(rng)
      val (r, _)       = representatives(e, h, round, tracker, rng)
      val (t, tRows)   = tracker.materialize(s"E$round", contract(e, r))
      tracker.drop(eName)
      tracker.recordRound(tRows)
      e = t; eName = s"E$round"
      if (l == null) {
        l = r; lName = s"R$round" // first round: L := R (rename, no rewrite)
      } else {
        val (nl, _) = tracker.materialize(s"L$round", composeL(l, r, h))
        tracker.drop(lName)
        tracker.drop(s"R$round")
        l = nl; lName = s"L$round"
      }
      if (tRows == 0L) done = true
    }
    CcRun(l.select(col("v"), col("r")), round, tracker)
  }

  /** Fig. 4: fast variant — keep every R_i, compose back-to-front with the
    * affine accumulator so each join is small-to-large.
    */
  private def runFast(e0: DataFrame, tracker: SpaceTracker, rng: Random): CcRun = {
    val rs     = ArrayBuffer.empty[(DataFrame, AffineRoundHash)]
    var e      = e0
    var eName  = "E0"
    var round  = 0
    var done   = false
    while (!done) {
      round += 1
      require(round <= MaxRounds, s"$name did not converge in $MaxRounds rounds")
      val h = method.nextRound(rng) match {
        case a: AffineRoundHash => a
        case other => throw new IllegalArgumentException(
          s"Fast variant (Fig. 4) needs an affine method for the (A,B) accumulator; ${method.name} is not")
      }
      val (r, _)     = representatives(e, h, round, tracker, rng)
      rs += ((r, h))
      val (t, tRows) = tracker.materialize(s"E$round", contract(e, r))
      tracker.drop(eName)
      tracker.recordRound(tRows)
      e = t; eName = s"E$round"
      if (tRows == 0L) done = true
    }

    // Back-to-front composition: R_i := R_i ⟕ R_{i+1}, unmatched rows get the
    // accumulated relabelling h_k ∘ … ∘ h_{i+1}.
    val k = rs.length
    var acc: AffineRoundHash = method match {
      case FiniteField64    => FiniteField64.identity
      case FinitePrimeField => FinitePrimeField.identity
      case other            => throw new IllegalStateException(s"unreachable: ${other.name}")
    }
    var cur     = rs(k - 1)._1
    var curName = s"R$k"
    var i       = k - 1
    while (i >= 1) {
      acc = acc.compose(rs(i)._2) // h_{i+1} in 1-indexed terms
      val prev     = rs(i - 1)._1
      val prevName = s"R$i"
      val next     = cur.select(col("v").as("c_v"), col("r").as("c_r"))
      val joined = prev.join(next, col("r") === col("c_v"), "left_outer")
        .select(col("v"), coalesce(col("c_r"), acc.hash(col("r"))).as("r"))
      val (nr, _) = tracker.materialize(s"C$i", joined)
      tracker.drop(prevName)
      tracker.drop(curName)
      cur = nr; curName = s"C$i"
      i -= 1
    }
    CcRun(cur.select(col("v"), col("r")), k, tracker)
  }
}
