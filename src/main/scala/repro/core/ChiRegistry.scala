package repro.core

import org.apache.spark.broadcast.Broadcast
import org.apache.spark.sql.{DataFrame, SparkSession}

import repro.store.{CatalogRow, MaskStore}

/** The CHI of a whole dataset: `mask_id → ChiIndex`, one shared [[ChiConfig]].
  *
  * When a MaskSearch session starts the registry is loaded (or built) once and
  * held in memory for the session (§3.2.1); engines broadcast it to executors
  * so the filter stage can run as a distributed DataFrame scan over the
  * catalog without touching mask files.
  */
final class ChiRegistry(val cfg: ChiConfig, val indexes: Map[Long, ChiIndex]) extends Serializable {
  def get(maskId: Long): Option[ChiIndex] = indexes.get(maskId)
  def contains(maskId: Long): Boolean = indexes.contains(maskId)
  def size: Int = indexes.size
  def totalBytes: Long = indexes.valuesIterator.map(_.sizeBytes).sum

  /** A copy extended with additional indexes (used by incremental indexing). */
  def ++(more: Iterable[ChiIndex]): ChiRegistry =
    new ChiRegistry(cfg, indexes ++ more.map(i => i.maskId -> i))
}

object ChiRegistry {

  /** Registry ids at or above this base index *aggregated* masks: the CHI of
    * `INTERSECT(masks of image i)` is stored under `AggIdBase + i` (§3.4:
    * "the index for the aggregated masks is ... built ahead of time").
    */
  val AggIdBase: Long = 1L << 40

  def empty(cfg: ChiConfig): ChiRegistry = new ChiRegistry(cfg, Map.empty)

  /** Build the CHI for every mask in `catalog` with a distributed DataFrame
    * scan: each partition loads its masks from the store and computes their
    * indexes (O(w·h) per mask, §3.1). Index-build loads go through the store
    * and are therefore counted by its accumulator — benchmarks reset the
    * counter after the build so per-query numbers match the paper's Table 2
    * semantics ("masks loaded during query execution").
    */
  def build(spark: SparkSession, catalog: DataFrame, store: MaskStore, cfg: ChiConfig): ChiRegistry = {
    import spark.implicits._
    val built = catalog
      .as[CatalogRow]
      .mapPartitions { rows =>
        rows.map { r =>
          val idx = ChiIndex.build(store.loadPath(r.path), cfg)
          (idx.maskId, idx.w, idx.h, idx.counts)
        }
      }
      .collect()
    new ChiRegistry(
      cfg,
      built.map { case (id, w, h, counts) => id -> new ChiIndex(id, w, h, cfg, counts) }.toMap,
    )
  }

  /** Like [[build]], but additionally indexes the per-image INTERSECT
    * (pixel-wise minimum) aggregated mask under `AggIdBase + image_id`,
    * loading each mask only once per group. Used by mask-aggregation queries
    * (the paper's Q5) so their filter stage has first-class bounds.
    */
  def buildWithAggregates(
      spark: SparkSession,
      catalog: DataFrame,
      store: MaskStore,
      cfg: ChiConfig,
  ): ChiRegistry = {
    import spark.implicits._
    val built = catalog
      .as[CatalogRow]
      .groupByKey(_.image_id)
      .flatMapGroups { (img, it) =>
        val rows = it.toSeq.sortBy(_.mask_id)
        val masks = rows.map(r => store.loadPath(r.path))
        val per = masks.map(m => ChiIndex.build(m, cfg))
        val agg = ChiIndex.build(Mask.intersect(masks).copy(id = AggIdBase + img), cfg)
        (per :+ agg).map(i => (i.maskId, i.w, i.h, i.counts))
      }
      .collect()
    new ChiRegistry(
      cfg,
      built.map { case (id, w, h, counts) => id -> new ChiIndex(id, w, h, cfg, counts) }.toMap,
    )
  }

  /** Persist a registry as Parquet (`mask_id, w, h, counts` + config columns)
    * — the paper's "persisted to disk for future sessions" (§3.6).
    */
  def save(spark: SparkSession, registry: ChiRegistry, path: String): Unit = {
    import spark.implicits._
    registry.indexes.values.toSeq
      .map(i => (i.maskId, i.w, i.h, registry.cfg.cellW, registry.cfg.cellH, registry.cfg.bins, i.counts))
      .toDF("mask_id", "w", "h", "cell_w", "cell_h", "bins", "counts")
      .write.mode("overwrite").parquet(path)
  }

  /** Load a previously persisted registry. */
  def load(spark: SparkSession, path: String): ChiRegistry = {
    import spark.implicits._
    val rows = spark.read.parquet(path)
      .select("mask_id", "w", "h", "cell_w", "cell_h", "bins", "counts")
      .as[(Long, Int, Int, Int, Int, Int, Array[Int])]
      .collect()
    require(rows.nonEmpty, s"empty CHI registry at $path")
    val cfg = ChiConfig(rows.head._4, rows.head._5, rows.head._6)
    new ChiRegistry(cfg, rows.map { case (id, w, h, _, _, _, c) => id -> new ChiIndex(id, w, h, cfg, c) }.toMap)
  }

  /** Broadcast helper. */
  def broadcast(spark: SparkSession, registry: ChiRegistry): Broadcast[ChiRegistry] =
    spark.sparkContext.broadcast(registry)
}
