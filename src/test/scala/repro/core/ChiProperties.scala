package repro.core

import org.scalacheck.{Gen, Prop, Properties}
import org.scalacheck.Prop.propBoolean

/** ScalaCheck property suite for the CHI bound math — generator-driven
  * counterpart of the hand-rolled randomized loops in [[ChiBoundsSpec]].
  */
object ChiProperties extends Properties("CHI") {

  private val genMaskAndCfg: Gen[(Mask, ChiConfig)] = for {
    w <- Gen.choose(4, 28)
    h <- Gen.choose(4, 28)
    cw <- Gen.choose(2, 10)
    ch <- Gen.choose(2, 10)
    bins <- Gen.choose(2, 16)
    seed <- Gen.choose(0L, 1_000_000L)
  } yield (Fixtures.randomMask(seed, w, h, seed), ChiConfig(cw, ch, bins))

  private def genRoi(w: Int, h: Int): Gen[Roi] = for {
    x1 <- Gen.choose(1, w); x2 <- Gen.choose(x1, w)
    y1 <- Gen.choose(1, h); y2 <- Gen.choose(y1, h)
  } yield Roi(x1, y1, x2, y2)

  private val genRange: Gen[ValueRange] = for {
    a <- Gen.choose(0.0, 1.0); b <- Gen.choose(0.0, 1.0)
  } yield ValueRange(math.min(a, b), math.max(a, b))

  property("bounds contain the exact CP value") = Prop.forAll(genMaskAndCfg) {
    case (mask, cfg) =>
      val idx = ChiIndex.build(mask, cfg)
      Prop.forAll(genRoi(mask.w, mask.h), genRange) { (roi, range) =>
        val exact = mask.cp(roi, range)
        val b = idx.bounds(roi, range)
        b.lower <= exact && exact <= b.upper
      }
  }

  property("CP is additive over horizontal splits") = Prop.forAll(genMaskAndCfg) {
    case (mask, _) =>
      Prop.forAll(genRoi(mask.w, mask.h), genRange) { (roi, range) =>
        (roi.x2 > roi.x1) ==> {
          val mid = (roi.x1 + roi.x2) / 2
          mask.cp(roi, range) ==
            mask.cp(roi.copy(x2 = mid), range) + mask.cp(roi.copy(x1 = mid + 1), range)
        }
      }
  }

  property("cHist of the full mask counts all pixels at bin 0") = Prop.forAll(genMaskAndCfg) {
    case (mask, cfg) =>
      val idx = ChiIndex.build(mask, cfg)
      idx.cHist(Roi.full(mask.w, mask.h))(0) == mask.w * mask.h
  }

  property("outer region covers roi; inner region is covered by roi") =
    Prop.forAll(genMaskAndCfg) { case (mask, cfg) =>
      val idx = ChiIndex.build(mask, cfg)
      Prop.forAll(genRoi(mask.w, mask.h)) { roi =>
        val o = idx.outerRegion(roi)
        val coverOk = o.x1 <= roi.x1 && o.y1 <= roi.y1 && o.x2 >= roi.x2 && o.y2 >= roi.y2
        val innerOk = idx.innerRegion(roi).forall(i =>
          i.x1 >= roi.x1 && i.y1 >= roi.y1 && i.x2 <= roi.x2 && i.y2 <= roi.y2 && idx.isAvailable(i))
        coverOk && idx.isAvailable(o) && innerOk
      }
    }

  property("interval arithmetic is sound for two-term expressions") =
    Prop.forAll(genMaskAndCfg) { case (mask, cfg) =>
      val idx = ChiIndex.build(mask, cfg)
      Prop.forAll(genRoi(mask.w, mask.h), genRange, genRange) { (roi, r1, r2) =>
        val expr = CpSub(
          CpTermExpr(CpTerm(ConstRoi(roi), r1)),
          CpScale(0.5, CpTermExpr(CpTerm(ConstRoi(roi), r2))),
        )
        val exact = expr.eval(t => mask.cp(t.roi.asInstanceOf[ConstRoi].roi, t.range))
        val (lo, hi) = expr.bounds(t => idx.bounds(t.roi.asInstanceOf[ConstRoi].roi, t.range))
        lo <= exact && exact <= hi
      }
    }
}
