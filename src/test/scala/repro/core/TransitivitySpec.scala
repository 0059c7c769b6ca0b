package repro.core

import org.scalatest.funsuite.AnyFunSuite

import Transitivity._
import ZeroerEM.GammaRow

class TransitivitySpec extends AnyFunSuite {

  // logA > logB ~ the model prefers match; equal logs are neutral
  private def row(id: Long, l: Long, r: Long, g: Double,
                  la: Double = 0.0, lb: Double = 0.0) = GammaRow(id, l, r, g, la, lb)

  test("no constraints -> no overrides") {
    val ov = resolve(Seq(row(1, 10, 20, 0.9)), Nil, Nil)
    assert(ov.size == 0)
  }

  test("satisfied constraint is untouched") {
    // (l=10,r=20) and (l=10,r=21) matched, right pair (20,21) has high gamma
    val cross = Seq(row(1, 10, 20, 0.9), row(2, 10, 21, 0.9))
    val wr    = Seq(row(3, 20, 21, 0.95))
    assert(resolve(cross, Nil, wr).size == 0)
  }

  test("violated constraint with absent conclusion kills the weaker premise (Example 1.3)") {
    // two cross matches share right tuple zg2; left pair (fd1, fd3) was
    // blocked out -> gamma 0 -> the weaker cross match must drop to 0
    val strong = row(1, 10, 20, 0.95, la = 2.0, lb = -2.0)
    val weak   = row(2, 11, 20, 0.60, la = 0.1, lb = -0.1)
    val ov     = resolve(Seq(strong, weak), Nil, Nil)
    assert(ov.cross.contains(2L), "weaker premise should be adjusted")
    assert(math.abs(ov.cross(2L)) <= 1e-6)
    assert(!ov.cross.contains(1L), "stronger premise should survive")
  }

  test("violated constraint with present conclusion can raise the conclusion") {
    // conclusion pair exists with la >> lb: raising its gamma increases F
    val cross = Seq(row(1, 10, 20, 0.9, la = 1.0, lb = -1.0),
                    row(2, 10, 21, 0.9, la = 1.0, lb = -1.0))
    val wr    = Seq(row(3, 20, 21, 0.4, la = 3.0, lb = -3.0))
    val ov    = resolve(cross, Nil, wr)
    assert(ov.right.contains(3L))
    assert(math.abs(ov.right(3L) - 0.81) <= 1e-9) // gamma1 * gamma2
  }

  test("conclusion with strongly-unmatch evidence pushes a premise down instead") {
    val cross = Seq(row(1, 10, 20, 0.9, la = 0.5, lb = 0.5),
                    row(2, 10, 21, 0.6, la = -2.0, lb = 2.0))
    val wr    = Seq(row(3, 20, 21, 0.01, la = -8.0, lb = 8.0))
    val ov    = resolve(cross, Nil, wr)
    // raising the conclusion to 0.54 would cost much free energy (lb >> la);
    // lowering the weak premise (whose evidence also favors U) is cheaper
    assert(ov.cross.contains(2L))
    assert(ov.cross(2L) < 0.6)
  }

  test("direction locks prevent later constraints from undoing adjustments") {
    // star: left 10 matches rights 20, 21, 22; all right pairs absent
    val cross = Seq(
      row(1, 10, 20, 0.95, la = 3.0, lb = -3.0),
      row(2, 10, 21, 0.80, la = 1.0, lb = -1.0),
      row(3, 10, 22, 0.70, la = 0.5, lb = -0.5))
    val ov = resolve(cross, Nil, Nil)
    // the strongest survives; others get zeroed by their constraint with it
    assert(!ov.cross.contains(1L))
    assert(ov.cross.get(2L).forall(_ < 0.5))
    assert(ov.cross.get(3L).forall(_ < 0.5))
  }

  test("within-table matches are NOT premises (no sibling cascade)") {
    // left near-duplicates (10,11) + cross match (10, 20): the cross pair
    // (11, 20) must NOT be raised — mixed-premise trios are pruned so that
    // spurious within-table "matches" (duplicate-free tables have no true
    // match cluster) cannot cascade cross-table false positives.
    val cross = Seq(row(1, 10, 20, 0.9, la = 1.0, lb = -1.0),
                    row(2, 11, 20, 0.1, la = 2.0, lb = -2.0))
    val wl    = Seq(row(3, 10, 11, 0.9, la = 1.0, lb = -1.0))
    val ov    = resolve(cross, wl, Nil)
    assert(!ov.cross.contains(2L))
    assert(ov.size == 0)
  }

  test("transitivity on DS-style right duplicates does not zero both matches") {
    // one left record genuinely matches two right duplicates; the right
    // pair exists with high gamma -> constraint satisfied, nothing killed
    val cross = Seq(row(1, 10, 20, 0.92), row(2, 10, 21, 0.88))
    val wr    = Seq(row(3, 20, 21, 0.9))
    val ov    = resolve(cross, Nil, wr)
    assert(!ov.cross.contains(1L) && !ov.cross.contains(2L))
  }

  test("postProcess keeps only the best partner per tuple (greedy 1-1)") {
    val kept = postProcess(Seq(
      row(1, 10, 20, 0.95), row(2, 10, 21, 0.80), row(3, 11, 21, 0.70),
      row(4, 12, 22, 0.60)))
    assert(kept.map(_.pairId).toSet == Set(1L, 3L, 4L))
  }

  test("postProcess on a clean 1-1 set keeps everything") {
    val ms = Seq(row(1, 10, 20, 0.9), row(2, 11, 21, 0.8), row(3, 12, 22, 0.7))
    assert(postProcess(ms).size == 3)
  }

  test("overrides never leave [0,1]") {
    val cross = Seq(row(1, 10, 20, 0.99, la = 5.0, lb = -5.0),
                    row(2, 10, 21, 0.99, la = 5.0, lb = -5.0))
    val wr = Seq(row(3, 20, 21, 0.5, la = 0.0, lb = 0.0))
    val ov = resolve(cross, Nil, wr)
    (ov.cross.values ++ ov.left.values ++ ov.right.values).foreach { g =>
      assert(g >= 0.0 && g <= 1.0)
    }
  }
}
