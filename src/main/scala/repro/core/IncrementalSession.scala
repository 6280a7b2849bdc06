package repro.core

import scala.collection.mutable

import org.apache.spark.sql.SparkSession

import repro.store.{CatalogRow, MaskStore}

/** A MaskSearch session with incremental indexing (§3.6) — the paper's MS-II.
  *
  * The session starts with an empty (or previously persisted) registry. Each
  * query splits its targeted masks into indexed and unindexed:
  *
  *  - indexed masks go through the normal filter–verification path (bounds on
  *    the driver-held registry, uncertain ones loaded and verified);
  *  - unindexed masks are answered the baseline way — loaded from disk and
  *    evaluated exactly — and their CHI is built as a side effect of the load
  *    and merged into the registry for future queries.
  *
  * So the cost of indexing a mask is paid at most once, and only if some
  * query actually touches the mask. `persist` saves the registry for future
  * sessions.
  */
final class IncrementalSession(
    spark: SparkSession,
    store: MaskStore,
    val cfg: ChiConfig,
) {

  private val registry = mutable.Map.empty[Long, ChiIndex]

  def indexedCount: Int = registry.size

  def preload(r: ChiRegistry): Unit = registry ++= r.indexes

  /** A snapshot of the current registry. */
  def snapshot: ChiRegistry = new ChiRegistry(cfg, registry.toMap)

  /** Execute a Filter query over the given targeted catalog rows. */
  def runFilter(target: Seq[CatalogRow], pred: Predicate): FilterVerifyResult = {
    import spark.implicits._
    val loadsBefore = store.loads.value
    val t0 = System.nanoTime()

    val (indexed, unindexed) = target.partition(r => registry.contains(r.mask_id))

    // Local copies so task closures don't capture `this` (holds SparkSession).
    val cfgLocal = cfg
    val storeLocal = store
    val predLocal = pred

    // Indexed masks: standard filter stage on the driver-held registry.
    val classified = indexed.map(r => (r, pred.classifyRow(r, registry.get(r.mask_id))))
    val direct = classified.collect { case (r, s) if s == FilterOutcome.Pass => r }
    val uncertain = classified.collect { case (r, s) if s == FilterOutcome.Uncertain => r }
    val nPruned = indexed.size - direct.size - uncertain.size

    val verified: Array[CatalogRow] =
      if (uncertain.isEmpty) Array.empty
      else
        spark
          .createDataset(uncertain.toIndexedSeq)
          .mapPartitions(rows => rows.filter(r => predLocal.evalExact(r, storeLocal.loadPath(r.path))))
          .collect()

    // Unindexed masks: load, evaluate exactly, and build their CHI en route.
    val fresh: Array[(CatalogRow, Boolean, Long, Int, Int, Array[Int])] =
      if (unindexed.isEmpty) Array.empty
      else
        spark
          .createDataset(unindexed.toIndexedSeq)
          .mapPartitions { rows =>
            rows.map { r =>
              val m = storeLocal.loadPath(r.path)
              val idx = ChiIndex.build(m, cfgLocal)
              (r, predLocal.evalExact(r, m), idx.maskId, idx.w, idx.h, idx.counts)
            }
          }
          .collect()

    fresh.foreach { case (_, _, id, w, h, counts) =>
      registry.update(id, new ChiIndex(id, w, h, cfg, counts))
    }
    val freshPass = fresh.collect { case (r, true, _, _, _, _) => r }

    FilterVerifyResult(
      (direct ++ verified ++ freshPass).sortBy(_.mask_id).toArray,
      QueryStats(
        nTargeted = target.size,
        nPruned = nPruned,
        nDirect = direct.size,
        nUncertain = uncertain.size + unindexed.size,
        masksLoaded = store.loads.value - loadsBefore,
        elapsedMs = (System.nanoTime() - t0) / 1_000_000,
      ),
    )
  }

  /** Persist the registry built so far (end-of-session step of §3.6). */
  def persist(path: String): Unit = ChiRegistry.save(spark, snapshot, path)
}
