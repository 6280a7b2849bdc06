package repro.core

import repro.{SparkSpec, TestData}

/** Tests for the dataset-wide CHI registry: distributed build, size
  * accounting (the paper's ~5% rule), persistence, broadcast.
  */
class ChiRegistrySpec extends SparkSpec {
  import TestData._

  test("buildWithAggregates indexes every mask plus one aggregate per image") {
    assert(registry.size == ds.nMasks + ds.nImages)
    assert((0 until ds.nMasks).forall(id => registry.contains(id)))
    assert((0 until ds.nImages).forall(i => registry.contains(ChiRegistry.AggIdBase + i)))
  }

  test("plain build indexes exactly the masks") {
    val r = ChiRegistry.build(spark, catalog, store, cfg)
    assert(r.size == ds.nMasks)
    assert((0 until ds.nMasks).forall(id => r.contains(id)))
  }

  test("aggregate index equals the CHI of the locally computed intersect mask") {
    val rows = repro.store.MaskStore.asRows(catalog).collect().filter(_.image_id == 4L).sortBy(_.mask_id)
    val inter = Mask.intersect(rows.toSeq.map(r => store.loadPath(r.path)))
    val local = ChiIndex.build(inter, cfg)
    assert(registry.get(ChiRegistry.AggIdBase + 4L).get.counts.toSeq == local.counts.toSeq)
  }

  test("per-mask indexes match a locally built index") {
    val id = 5L
    val local = ChiIndex.build(store.load(id), cfg)
    val fromRegistry = registry.get(id).get
    assert(fromRegistry.counts.toSeq == local.counts.toSeq)
    assert(fromRegistry.w == local.w && fromRegistry.h == local.h)
  }

  test("index size matches the closed form and is a small fraction of the data") {
    val expectedPerMask = cfg.sizeBytes(ds.w, ds.h)
    assert(registry.totalBytes == expectedPerMask * (ds.nMasks + ds.nImages))
    val rawBytes = 4L * ds.w * ds.h * ds.nMasks
    val ratio = expectedPerMask.toDouble * ds.nMasks / rawBytes
    assert(ratio < 0.15, f"index/data ratio $ratio%.3f")
  }

  test("buildWithAggregates loads each mask exactly once") {
    val s2 = repro.store.MaskStore(spark, "target/testdata/unit")
    val before = s2.loads.value
    ChiRegistry.buildWithAggregates(spark, catalog, s2, cfg)
    assert(s2.loads.value - before == ds.nMasks)
  }

  test("building loads each mask exactly once") {
    val s2 = repro.store.MaskStore(spark, "target/testdata/unit")
    val before = s2.loads.value
    ChiRegistry.build(spark, catalog, s2, cfg)
    assert(s2.loads.value - before == ds.nMasks)
  }

  test("save and load round-trip") {
    val path = "target/testdata/chi-roundtrip"
    ChiRegistry.save(spark, registry, path)
    val loaded = ChiRegistry.load(spark, path)
    assert(loaded.cfg == registry.cfg)
    assert(loaded.size == registry.size)
    assert(loaded.get(9L).get.counts.toSeq == registry.get(9L).get.counts.toSeq)
  }

  test("load of an empty registry path fails loudly") {
    intercept[Exception](ChiRegistry.load(spark, "target/testdata/nonexistent-chi"))
  }

  test("empty registry and incremental extension") {
    val e = ChiRegistry.empty(cfg)
    assert(e.size == 0 && e.totalBytes == 0L)
    val ext = e ++ Seq(registry.get(0L).get, registry.get(1L).get)
    assert(ext.size == 2 && ext.contains(0L) && ext.contains(1L) && !ext.contains(2L))
  }

  test("broadcast registry resolves indexes inside tasks") {
    val spark0 = spark
    import spark0.implicits._
    val bc = chiBc
    val ok = spark
      .createDataset((0L until 10L).toSeq)
      .map(id => bc.value.get(id).isDefined)
      .collect()
    assert(ok.forall(identity))
  }
}
