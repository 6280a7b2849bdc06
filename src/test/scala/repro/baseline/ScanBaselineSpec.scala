package repro.baseline

import repro.{SparkSpec, TestData}
import repro.core._

/** Explicit tests for the load-everything scan baseline (the NumPy /
  * PostgreSQL / TileDB stand-in): it must evaluate exactly and always load
  * every targeted mask — that behaviour is what Table 2's baseline rows
  * report.
  */
class ScanBaselineSpec extends SparkSpec {
  import TestData._

  test("filterMasks loads exactly the targeted masks") {
    val pred = Predicate(CpExpr.term(ObjectRoi, 0.7, 1.0), Gt, 40)
    val res = ScanBaseline.filterMasks(catalogM1, pred, store)
    assert(res.stats.masksLoaded == ds.nImages)
    assert(res.stats.nTargeted == ds.nImages)
  }

  test("filterMasks result matches a driver-side evaluation") {
    val pred = Predicate(CpExpr.term(FullRoi, 0.6, 1.0), Gt, 120)
    val res = ScanBaseline.filterMasks(catalogM1, pred, store)
    val expected = repro.store.MaskStore.asRows(catalogM1).collect()
      .filter(r => pred.evalExact(r, store.load(r.mask_id))).map(_.mask_id).sorted
    assert(res.maskIds.toSeq == expected.toSeq)
  }

  test("topKMasks orders by value with mask_id tie-break") {
    val res = ScanBaseline.topKMasks(catalogM1, CpExpr.term(FullRoi, 0.5, 1.0), 10, descending = true, store)
    val vals = res.rows.map(_._2)
    assert(vals.zip(vals.tail).forall { case (a, b) => a >= b })
    assert(res.rows.length == 10)
    assert(res.stats.masksLoaded == ds.nImages)
  }

  test("topKMasks ascending returns the smallest values") {
    val desc = ScanBaseline.topKMasks(catalogM1, CpExpr.term(FullRoi, 0.5, 1.0), ds.nImages, descending = true, store)
    val asc = ScanBaseline.topKMasks(catalogM1, CpExpr.term(FullRoi, 0.5, 1.0), 5, descending = false, store)
    assert(asc.rows.head._2 == desc.rows.last._2)
  }

  test("filterGroups loads every mask of the dataset") {
    val value = ScalarAggValue(AvgAgg, CpExpr.term(ObjectRoi, 0.7, 1.0))
    val res = ScanBaseline.filterGroups(catalog, value, Gt, 30, store)
    assert(res.stats.masksLoaded == ds.nMasks)
    assert(res.stats.nTargeted == ds.nImages)
  }

  test("topKGroups agrees with a driver-side group evaluation") {
    val value = ScalarAggValue(MaxAgg, CpExpr.term(FullRoi, 0.6, 1.0))
    val res = ScanBaseline.topKGroups(catalog, value, 7, descending = true, store)
    val groups = repro.store.MaskStore.asRows(catalog).collect().groupBy(_.image_id)
    val expected = groups.map { case (g, rows) =>
      (g, value.exact(rows.toSeq.sortBy(_.mask_id), r => store.load(r.mask_id)))
    }.toSeq.sortBy { case (g, v) => (-v, g) }.take(7)
    assert(res.groups.toSeq == expected)
  }

  test("stats mark every mask as verified (nothing pruned)") {
    val pred = Predicate(CpExpr.term(ObjectRoi, 0.5, 1.0), Lt, 100)
    val st = ScanBaseline.filterMasks(catalogM1, pred, store).stats
    assert(st.nPruned == 0 && st.nDirect == 0 && st.nUncertain == st.nTargeted)
  }
}
