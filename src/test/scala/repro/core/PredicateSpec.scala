package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.store.CatalogRow

/** Tests for the CP-expression AST, interval arithmetic, and the filter-stage
  * classification (§3.2.1 step 2, §3.3).
  */
class PredicateSpec extends AnyFunSuite {
  import Fixtures._

  private def row(id: Long, w: Int = 6, h: Int = 6): CatalogRow =
    CatalogRow(id, id, 1, 1, w, h, s"/tmp/$id.bin", 2, 2, 4, 5, 0)

  test("RoiSpec resolution") {
    val r = row(1)
    assert(ConstRoi(Roi(1, 1, 3, 3)).resolve(r) == Roi(1, 1, 3, 3))
    assert(ObjectRoi.resolve(r) == Roi(2, 2, 4, 5))
    assert(FullRoi.resolve(r) == Roi(1, 1, 6, 6))
  }

  test("CpExpr.terms flattens the tree") {
    val e = CpSub(CpExpr.term(FullRoi, 0.1, 0.5), CpScale(2.0, CpExpr.term(ObjectRoi, 0.5, 0.9)))
    assert(e.terms.size == 2)
  }

  test("CpExpr.eval: arithmetic over CP terms") {
    val t1 = CpExpr.term(FullRoi, 0, 0.5)
    val t2 = CpExpr.term(FullRoi, 0.5, 1.0)
    val cp: CpTerm => Long = t => if (t.range.lv == 0) 10L else 4L
    assert(CpAdd(t1, t2).eval(cp) == 14.0)
    assert(CpSub(t1, t2).eval(cp) == 6.0)
    assert(CpScale(0.5, t1).eval(cp) == 5.0)
    assert(CpScale(-1.0, t2).eval(cp) == -4.0)
  }

  test("CpExpr.bounds: interval arithmetic for Add/Sub/Scale") {
    val t1 = CpExpr.term(FullRoi, 0, 0.5)
    val t2 = CpExpr.term(FullRoi, 0.5, 1.0)
    val b: CpTerm => CpBounds = t => if (t.range.lv == 0) CpBounds(2, 5) else CpBounds(1, 3)
    assert(CpAdd(t1, t2).bounds(b) == ((3.0, 8.0)))
    assert(CpSub(t1, t2).bounds(b) == ((-1.0, 4.0)))
    assert(CpScale(2.0, t1).bounds(b) == ((4.0, 10.0)))
    assert(CpScale(-1.0, t1).bounds(b) == ((-5.0, -2.0)))
  }

  test("classification for cp > T (paper cases 1–3)") {
    val p = Predicate(CpExpr.term(FullRoi, 0.5, 1.0), Gt, 10)
    assert(p.classify(11, 20) == FilterOutcome.Pass)      // lower > T
    assert(p.classify(0, 10) == FilterOutcome.Fail)       // upper ≤ T
    assert(p.classify(5, 15) == FilterOutcome.Uncertain)  // lower ≤ T < upper
    assert(p.classify(10, 11) == FilterOutcome.Uncertain) // boundary: lower = T
  }

  test("classification for cp < T (§3.3 mirror)") {
    val p = Predicate(CpExpr.term(FullRoi, 0.5, 1.0), Lt, 10)
    assert(p.classify(0, 9) == FilterOutcome.Pass)        // upper < T
    assert(p.classify(10, 20) == FilterOutcome.Fail)      // lower ≥ T
    assert(p.classify(5, 15) == FilterOutcome.Uncertain)
  }

  test("classifyRow with an index uses CHI bounds; without, trivial bounds") {
    val m = fig4Mask
    val idx = ChiIndex.build(m, fig4Cfg)
    val r = row(0)
    // Exact CP on full mask ≥0.5 is 9 (aligned ⇒ bounds exact): fail at T=20.
    val pFail = Predicate(CpExpr.term(FullRoi, 0.5, 1.0), Gt, 20)
    assert(pFail.classifyRow(r, Some(idx)) == FilterOutcome.Fail)
    // Without an index the same predicate is classified from [0, 36]: uncertain.
    assert(pFail.classifyRow(r, None) == FilterOutcome.Uncertain)
    // Guaranteed pass: full range over full mask > 10.
    val pPass = Predicate(CpExpr.term(FullRoi, 0.0, 1.0), Gt, 10)
    assert(pPass.classifyRow(r, Some(idx)) == FilterOutcome.Pass)
  }

  test("evalExact matches direct CP computation") {
    val m = fig4Mask
    val r = row(0)
    val p = Predicate(CpExpr.term(ConstRoi(Roi(3, 3, 5, 5)), 0.5, 1.0), Gt, 5)
    assert(p.evalExact(r, m)) // exact = 6 > 5
    val p2 = p.copy(threshold = 6)
    assert(!p2.evalExact(r, m))
  }

  test("generic predicate: ratio-style difference of two CP terms is sound") {
    // CP(obj, hi) − 0.5·CP(full, hi) > T : monotone combination (§3.3).
    val m = randomMask(1, 16, 16, seed = 12)
    val idx = ChiIndex.build(m, ChiConfig(4, 4, 8))
    val r = row(1, 16, 16).copy(ox1 = 3, oy1 = 3, ox2 = 10, oy2 = 12)
    val e = CpSub(CpExpr.term(ObjectRoi, 0.5, 1.0), CpScale(0.5, CpExpr.term(FullRoi, 0.5, 1.0)))
    val exact = e.eval(t => m.cp(t.roi.resolve(r), t.range))
    val (lo, hi) = Predicate.rowBounds(e, r, Some(idx))
    assert(lo <= exact && exact <= hi)
  }

  test("rowBounds without index is [0, |roi|] per term") {
    val r = row(1)
    val (lo, hi) = Predicate.rowBounds(CpExpr.term(FullRoi, 0.2, 0.8), r, None)
    assert(lo == 0.0 && hi == 36.0)
  }
}
