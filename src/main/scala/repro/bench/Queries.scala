package repro.bench

import repro.core._

/** The five evaluation queries of the paper's Table 1, with ROI coordinates
  * and count thresholds scaled from the paper's mask sizes (448² WILDS /
  * 224² ImageNet) to the lite datasets by side ratio (ROIs) and area ratio
  * (thresholds). See EXPERIMENTS.md for the exact scaling arithmetic.
  */
object Queries {

  sealed trait Query { def id: String; def description: String }

  /** Q1/Q2: mask selection, `CP(mask, roi, (lv,uv)) > T`, model_id = 1. */
  final case class FilterQuery(id: String, description: String, pred: Predicate) extends Query

  /** Q3: top-k masks by CP, model_id = 1. */
  final case class TopKQuery(id: String, description: String, expr: CpExpr, k: Int, descending: Boolean)
      extends Query

  /** Q4/Q5: top-k images by a group value over both models' masks. */
  final case class GroupTopKQuery(id: String, description: String, value: GroupValue, k: Int, descending: Boolean)
      extends Query

  /** Scale the paper's ((50,50),(200,200)) ROI from a `paperSide`-pixel mask
    * to a `side`-pixel mask.
    */
  private def scaledRoi(side: Int, paperSide: Int): Roi = {
    def s(v: Int): Int = math.max(1, math.round(v.toDouble * side / paperSide).toInt)
    Roi(s(50), s(50), math.min(side, s(200)), math.min(side, s(200)))
  }

  /** Table 1 for one lite dataset. `paperSide` is the paper's mask side for
    * the dataset this stands in for (448 for WILDS, 224 for ImageNet).
    */
  def forDataset(bd: BenchDataset, paperSide: Int): Seq[Query] = {
    val side = bd.ds.w
    val roi1 = scaledRoi(side, paperSide)
    // The paper's absolute thresholds (Q1: 5000, Q2: 15,000) don't transfer
    // to the lite datasets' synthetic CP distributions, so T is calibrated
    // once against the measured exact-CP quantiles (see EXPERIMENTS.md):
    // T1 ≈ p95 and T2 ≈ p90 — selective queries with non-trivial answers,
    // matching the paper's retrieve-the-unusual-masks intent.
    val (t1, t2) = if (bd.name.startsWith("wilds")) (340L, 270L) else (280L, 75L)
    Seq(
      FilterQuery("Q1", s"CP(mask, $roi1, (0.6,1.0)) > $t1, model 1",
        Predicate(CpExpr.term(ConstRoi(roi1), 0.6, 1.0), Gt, t1.toDouble)),
      FilterQuery("Q2", s"CP(mask, object, (0.8,1.0)) > $t2, model 1",
        Predicate(CpExpr.term(ObjectRoi, 0.8, 1.0), Gt, t2.toDouble)),
      TopKQuery("Q3", s"top-25 masks by CP(mask, $roi1, (0.8,1.0)), model 1",
        CpExpr.term(ConstRoi(roi1), 0.8, 1.0), k = 25, descending = true),
      GroupTopKQuery("Q4", "top-25 images by mean CP(mask, object, (0.8,1.0)) over 2 models",
        ScalarAggValue(AvgAgg, CpExpr.term(ObjectRoi, 0.8, 1.0)), k = 25, descending = true),
      GroupTopKQuery("Q5", "top-25 images by CP(intersect(masks), object, (0.8,1.0))",
        IntersectCpValue(ObjectRoi, ValueRange(0.8, 1.0)), k = 25, descending = true),
    )
  }

  def paperSideFor(bd: BenchDataset): Int = if (bd.name.startsWith("wilds")) 448 else 224
}
