package repro.core

import org.apache.spark.sql.Column
import org.apache.spark.sql.functions._
import repro.gf.{Gf64, ModP}
import scala.util.Random

/** Per-round random bijection h_i used to order vertices (§V-C).
  *
  * The paper's three randomisation methods:
  *
  *  - finite fields (GF(2^64) or GF(p)): h(x) = A·x + B, affine — these also
  *    support the Fast variant's back-to-front (A,B) accumulation (Fig. 4);
  *  - encryption: h(x) = E_k(x) for a fresh key per round (bijective, not
  *    affine, so only the Fig. 3 variant applies);
  *  - random reals: a per-vertex uniform random table with argmin selection
  *    (no relabelling; representatives stay original vertex IDs).
  */
sealed trait Randomisation {
  def name: String
  /** Draw the per-round randomness. */
  def nextRound(rng: Random): RoundHash
}

/** The drawn randomness of one round, exposing h as a Column transform. */
trait RoundHash {
  /** h_i applied to a vertex-ID column (used both for picking representatives
    * and for relabelling unmatched rows during composition).
    */
  def hash(x: Column): Column
  /** h_i applied driver-side (Fast variant's (A,B) accumulator arithmetic). */
  def hashLong(x: Long): Long
}

/** Affine rounds compose in closed form: needed by the Fast variant's
  * back-to-front accumulator (Fig. 4: `(A,B) ← (A·α, A·β + B)`).
  */
trait AffineRoundHash extends RoundHash {
  def a: Long
  def b: Long
  /** `this ∘ inner` (apply inner first, then this). */
  def compose(inner: AffineRoundHash): AffineRoundHash
}

/** Finite fields method over GF(2^64) — the method used in all the paper's
  * experiments, via the `gf64_axb` engine function (paper's C UDF `axplusb`).
  */
case object FiniteField64 extends Randomisation {
  val name = "gf64"
  final case class Round(a: Long, b: Long) extends AffineRoundHash {
    def hash(x: Column): Column = call_function("gf64_axb", lit(a), x.cast("long"), lit(b))
    def hashLong(x: Long): Long = Gf64.axb(a, x, b)
    /** Fig. 4 accumulator step: (A,B) ← (A·α, A·β + B) over GF(2^64). */
    def compose(inner: AffineRoundHash): AffineRoundHash =
      Round(Gf64.axb(a, inner.a, 0L), Gf64.axb(a, inner.b, b))
  }
  def nextRound(rng: Random): Round = {
    var a = 0L
    while (a == 0L) a = rng.nextLong()
    Round(a, rng.nextLong())
  }
  val identity: Round = Round(Gf64.One, 0L)
}

/** Finite fields method over GF(p), p = 2^31 − 1 — the paper's "SQL-only"
  * alternative (plain modular arithmetic, no UDF). Vertex IDs must be < p.
  */
case object FinitePrimeField extends Randomisation {
  val name = "modp"
  final case class Round(a: Long, b: Long) extends AffineRoundHash {
    def hash(x: Column): Column = pmod(lit(a) * x.cast("long") + lit(b), lit(ModP.P))
    def hashLong(x: Long): Long = ModP.axb(a, x, b)
    def compose(inner: AffineRoundHash): AffineRoundHash =
      Round(a * inner.a % ModP.P, (a * inner.b + b) % ModP.P)
  }
  def nextRound(rng: Random): Round = {
    val a = 1L + math.floorMod(rng.nextLong(), ModP.P - 1) // in [1, p)
    val b = math.floorMod(rng.nextLong(), ModP.P)          // in [0, p)
    Round(a, b)
  }
  val identity: Round = Round(1L, 0L)
}

/** Encryption method (§V-C): pseudo-random bijection via a 64-bit block
  * cipher with a fresh random key each round. XTEA substitutes for the
  * paper's Blowfish (DESIGN.md §4). Not affine → Deterministic variant only.
  */
case object Encryption extends Randomisation {
  val name = "xtea"
  final case class Round(k0: Int, k1: Int, k2: Int, k3: Int) extends RoundHash {
    def hash(x: Column): Column =
      call_function("xtea_enc", x.cast("long"),
        lit(k0.toLong), lit(k1.toLong), lit(k2.toLong), lit(k3.toLong))
    def hashLong(x: Long): Long = repro.gf.Xtea.encrypt(x, k0, k1, k2, k3)
  }
  def nextRound(rng: Random): Round = Round(rng.nextInt(), rng.nextInt(), rng.nextInt(), rng.nextInt())
}

/** Random reals method (§V-C): a fresh uniform random number per vertex per
  * round, representatives chosen by argmin so vertex IDs are never relabelled.
  * The random table must be joined to the edges — the communication cost the
  * finite-fields method exists to avoid.
  */
case object RandomReals extends Randomisation {
  val name = "randreal"
  final case class Round(seed: Long) extends RoundHash {
    // Not used as a column transform: RC builds an explicit H table instead.
    def hash(x: Column): Column =
      throw new UnsupportedOperationException("random reals uses an explicit per-vertex table")
    def hashLong(x: Long): Long =
      throw new UnsupportedOperationException("random reals has no driver-side closed form")
  }
  def nextRound(rng: Random): Round = Round(rng.nextLong())
}
