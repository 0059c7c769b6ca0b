package repro.erdata

import scala.util.Random

/** Deterministic string-noise primitives used by the dataset generators.
  *
  * All functions take the caller's `Random` so a record's noise is a pure
  * function of (dataset seed, record id) — regeneration is bit-identical,
  * which the DuckDB oracle and the benchmarks rely on.
  */
object Perturb {
  private val alphabet = "abcdefghijklmnopqrstuvwxyz"

  /** Per-character typo channel: substitute / delete / insert / swap. */
  def typos(r: Random, s: String, rate: Double): String = {
    if (rate <= 0 || s.isEmpty) return s
    val sb = new StringBuilder
    var i  = 0
    while (i < s.length) {
      val c = s.charAt(i)
      if (c.isLetter && r.nextDouble() < rate) {
        r.nextInt(4) match {
          case 0 => sb += alphabet.charAt(r.nextInt(26))          // substitute
          case 1 => ()                                            // delete
          case 2 => sb += c; sb += alphabet.charAt(r.nextInt(26)) // insert
          case 3 =>                                               // swap with next
            if (i + 1 < s.length) { sb += s.charAt(i + 1); sb += c; i += 1 }
            else sb += c
        }
      } else sb += c
      i += 1
    }
    sb.toString
  }

  /** Drop each whitespace token with probability `rate`, keeping >= keepMin. */
  def dropTokens(r: Random, s: String, rate: Double, keepMin: Int = 1): String = {
    val toks = s.split(" ").filter(_.nonEmpty)
    if (toks.length <= keepMin) return s
    val kept = toks.filter(_ => r.nextDouble() >= rate)
    val out  = if (kept.length >= keepMin) kept else toks.take(keepMin)
    out.mkString(" ")
  }

  /** Abbreviate each token to its initial + '.' with probability `rate`. */
  def abbrevTokens(r: Random, s: String, rate: Double): String =
    s.split(" ").filter(_.nonEmpty)
      .map(t => if (t.length > 2 && r.nextDouble() < rate) t.charAt(0) + "." else t)
      .mkString(" ")

  /** Shuffle token order with probability `prob` (all-or-nothing). */
  def maybeShuffleTokens(r: Random, s: String, prob: Double): String = {
    val toks = s.split(" ").filter(_.nonEmpty)
    if (toks.length > 1 && r.nextDouble() < prob) r.shuffle(toks.toSeq).mkString(" ")
    else s
  }

  /** Truncate to the first `n` tokens. */
  def truncateTokens(s: String, n: Int): String =
    s.split(" ").filter(_.nonEmpty).take(n).mkString(" ")

  /** Return null with probability `prob`, else the value. */
  def maybeNull(r: Random, s: String, prob: Double): String =
    if (r.nextDouble() < prob) null else s

  /** Multiplicative jitter on a numeric string, `pct` relative half-width. */
  def jitterNumber(r: Random, s: String, pct: Double): String =
    s.toDoubleOption match {
      case Some(v) => f"${v * (1.0 + (r.nextDouble() * 2 - 1) * pct)}%.2f"
      case None    => s
    }

  def pick[A](r: Random, xs: IndexedSeq[A]): A = xs(r.nextInt(xs.length))

  /** `n` distinct picks (or as many as available). */
  def pickN[A](r: Random, xs: IndexedSeq[A], n: Int): Seq[A] =
    r.shuffle(xs.indices.toVector).take(n).map(xs)
}
