package repro.core

import repro.{SparkSpec, TestData}
import repro.baseline.ScanBaseline

/** Integration tests for scalar aggregation and mask aggregation (§3.4):
  * group filters and group top-k against the exhaustive baseline.
  */
class AggregationSpec extends SparkSpec {
  import TestData._

  private val meanCp = ScalarAggValue(AvgAgg, CpExpr.term(ObjectRoi, 0.8, 1.0))
  private val intersectCp = IntersectCpValue(ObjectRoi, ValueRange(0.8, 1.0))

  private def checkFilter(value: GroupValue, op: CmpOp, t: Double): GroupFilterResult = {
    val ms = Aggregation.filterGroups(catalog, value, op, t, store, chiBc)
    val base = ScanBaseline.filterGroups(catalog, value, op, t, store)
    assert(ms.groups.toSeq == base.groups.toSeq, s"group filter mismatch ($value $op $t)")
    assert(ms.stats.masksLoaded <= base.stats.masksLoaded)
    ms
  }

  private def checkTopK(value: GroupValue, k: Int, desc: Boolean): GroupTopKResult = {
    val ms = Aggregation.topKGroups(catalog, value, k, desc, store, chiBc)
    val base = ScanBaseline.topKGroups(catalog, value, k, desc, store)
    assert(ms.groupIds.toSeq == base.groupIds.toSeq, s"group top-$k mismatch ($value)")
    assert(ms.groups.map(_._2).toSeq == base.groups.map(_._2).toSeq)
    assert(ms.stats.masksLoaded <= base.stats.masksLoaded)
    ms
  }

  test("scalar aggregate bounds: interval sums per agg function") {
    val bs = Seq((1.0, 3.0), (2.0, 5.0))
    assert(SumAgg.bounds(bs) == ((3.0, 8.0)))
    assert(AvgAgg.bounds(bs) == ((1.5, 4.0)))
    assert(MinAgg.bounds(bs) == ((1.0, 3.0)))
    assert(MaxAgg.bounds(bs) == ((2.0, 5.0)))
    assert(SumAgg.exact(Seq(1, 2)) == 3.0)
    assert(AvgAgg.exact(Seq(1, 2)) == 1.5)
    assert(MinAgg.exact(Seq(1, 2)) == 1.0)
    assert(MaxAgg.exact(Seq(1, 2)) == 2.0)
  }

  test("mean-CP group filter (HAVING mean > T) matches the baseline") {
    checkFilter(meanCp, Gt, 30)
  }

  test("mean-CP group filter with < matches the baseline") {
    checkFilter(meanCp, Lt, 50)
  }

  test("sum-CP group filter matches the baseline") {
    checkFilter(ScalarAggValue(SumAgg, CpExpr.term(ObjectRoi, 0.6, 1.0)), Gt, 120)
  }

  test("min/max-CP group filters match the baseline") {
    checkFilter(ScalarAggValue(MinAgg, CpExpr.term(FullRoi, 0.7, 1.0)), Gt, 60)
    checkFilter(ScalarAggValue(MaxAgg, CpExpr.term(FullRoi, 0.7, 1.0)), Lt, 90)
  }

  test("top-25 images by mean CP (paper Q4 shape) matches the baseline") {
    val ms = checkTopK(meanCp, 25, desc = true)
    assert(ms.groups.length == 25)
    assert(ms.stats.masksLoaded < 2L * ds.nImages, "must not load every mask")
  }

  test("top-25 images by mean CP ascending matches the baseline") {
    checkTopK(meanCp, 25, desc = false)
  }

  test("intersect-CP group bounds are sound (aggregate index and fallback)") {
    val noAgg = new ChiRegistry(cfg, registry.indexes.filter(_._1 < ChiRegistry.AggIdBase))
    val rows = repro.store.MaskStore.asRows(catalog).collect().groupBy(_.image_id)
    rows.take(15).foreach { case (_, group) =>
      val rs = group.toSeq.sortBy(_.mask_id)
      val exact = intersectCp.exact(rs, r => store.loadPath(r.path))
      val (lo, hi) = intersectCp.bounds(rs, registry)
      assert(lo <= exact && exact <= hi, s"agg path, group ${rs.head.image_id}: [$lo,$hi] vs $exact")
      val (lo2, hi2) = intersectCp.bounds(rs, noAgg)
      assert(lo2 <= exact && exact <= hi2, s"fallback, group ${rs.head.image_id}: [$lo2,$hi2] vs $exact")
    }
  }

  test("intersect-CP group filter is correct with the per-model fallback bounds") {
    val noAggBc = ChiRegistry.broadcast(spark, new ChiRegistry(cfg, registry.indexes.filter(_._1 < ChiRegistry.AggIdBase)))
    val ms = Aggregation.filterGroups(catalog, intersectCp, Gt, 20, store, noAggBc)
    val base = ScanBaseline.filterGroups(catalog, intersectCp, Gt, 20, store)
    assert(ms.groups.toSeq == base.groups.toSeq)
  }

  test("intersect-CP group filter (paper Q5 shape) matches the baseline") {
    checkFilter(intersectCp, Gt, 20)
  }

  test("top-25 images by intersect-CP (paper Q5 as top-k) matches the baseline") {
    val ms = checkTopK(intersectCp, 25, desc = true)
    assert(ms.stats.masksLoaded < 2L * ds.nImages)
  }

  test("group verification loads all masks of uncertain groups only") {
    val ms = Aggregation.filterGroups(catalog, meanCp, Gt, 30, store, chiBc)
    assert(ms.stats.masksLoaded == ms.stats.nUncertain * ds.nModels)
  }

  test("group stats bookkeeping: groups = pruned + direct + uncertain") {
    val st = Aggregation.filterGroups(catalog, meanCp, Gt, 40, store, chiBc).stats
    assert(st.nTargeted == ds.nImages)
    assert(st.nTargeted == st.nPruned + st.nDirect + st.nUncertain)
  }
}
