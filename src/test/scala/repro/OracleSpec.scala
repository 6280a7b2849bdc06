package repro

import repro.baseline.ScanBaseline
import repro.core._

/** End-to-end relational correctness against DuckDB: MaskSearch query results
  * are compared with SQL over the exploded pixel table — exactly the
  * conceptual `MasksDatabaseView` semantics of §2.1. This catches wrong
  * bound math, a broken rewrite, or an off-by-one in ROI handling, not just
  * "the engines agree with each other".
  */
class OracleSpec extends SparkSpec {
  import TestData._

  private lazy val chi = ChiRegistry.broadcast(
    spark, ChiRegistry.buildWithAggregates(spark, oracleCatalog, oracleStore, cfg))

  test("Q1 shape: constant-ROI filter predicate matches DuckDB") {
    val pred = Predicate(CpExpr.term(ConstRoi(Roi(3, 3, 12, 12)), 0.6, 1.0), Gt, 20)
    val res = FilterVerify.execute(oracleCatalog, pred, oracleStore, chi)
    import spark.implicits._
    val sparkDf = res.rows.map(_.mask_id).toSeq.toDF("mask_id")
    Oracle.assertEquivalent(
      sparkDf,
      """SELECT CAST(mask_id AS BIGINT) AS mask_id
        |FROM pixels
        |WHERE CAST(x AS INT) BETWEEN 3 AND 12 AND CAST(y AS INT) BETWEEN 3 AND 12
        |  AND CAST(v AS DOUBLE) >= 0.6 AND CAST(v AS DOUBLE) < 1.0
        |GROUP BY mask_id HAVING COUNT(*) > 20""".stripMargin,
      "pixels" -> oraclePixels,
    )
  }

  test("Q1 with model filter: model_id = 1 restriction matches DuckDB") {
    val pred = Predicate(CpExpr.term(ConstRoi(Roi(2, 2, 14, 14)), 0.5, 1.0), Gt, 40)
    val res = FilterVerify.execute(oracleCatalog.filter("model_id = 1"), pred, oracleStore, chi)
    import spark.implicits._
    val sparkDf = res.rows.map(_.mask_id).toSeq.toDF("mask_id")
    Oracle.assertEquivalent(
      sparkDf,
      """SELECT CAST(p.mask_id AS BIGINT) AS mask_id
        |FROM pixels p JOIN cat c ON p.mask_id = c.mask_id
        |WHERE CAST(c.model_id AS INT) = 1
        |  AND CAST(p.x AS INT) BETWEEN 2 AND 14 AND CAST(p.y AS INT) BETWEEN 2 AND 14
        |  AND CAST(p.v AS DOUBLE) >= 0.5 AND CAST(p.v AS DOUBLE) < 1.0
        |GROUP BY p.mask_id HAVING COUNT(*) > 40""".stripMargin,
      "pixels" -> oraclePixels,
      "cat" -> oracleCatalog,
    )
  }

  test("per-mask CP values over the object ROI match DuckDB") {
    // All masks, exact values: run top-k with k = |masks| so everything is verified.
    val expr = CpExpr.term(ObjectRoi, 0.6, 1.0)
    val res = TopK.masks(oracleCatalog, expr, oracleDs.nMasks + 1, descending = true, oracleStore, chi)
    import spark.implicits._
    val sparkDf = res.rows.map { case (r, v) => (r.mask_id, v) }.toSeq.toDF("mask_id", "val")
    Oracle.assertEquivalent(
      sparkDf,
      """SELECT CAST(c.mask_id AS BIGINT) AS mask_id,
        |       CAST(COALESCE(q.cnt, 0) AS DOUBLE) AS val
        |FROM cat c LEFT JOIN (
        |  SELECT p.mask_id, COUNT(*) AS cnt
        |  FROM pixels p JOIN cat c2 ON p.mask_id = c2.mask_id
        |  WHERE CAST(p.x AS INT) BETWEEN CAST(c2.ox1 AS INT) AND CAST(c2.ox2 AS INT)
        |    AND CAST(p.y AS INT) BETWEEN CAST(c2.oy1 AS INT) AND CAST(c2.oy2 AS INT)
        |    AND CAST(p.v AS DOUBLE) >= 0.6 AND CAST(p.v AS DOUBLE) < 1.0
        |  GROUP BY p.mask_id) q ON c.mask_id = q.mask_id""".stripMargin,
      "pixels" -> oraclePixels,
      "cat" -> oracleCatalog,
    )
  }

  test("Q4 shape: per-image mean CP matches DuckDB (GROUP BY image_id)") {
    val value = ScalarAggValue(AvgAgg, CpExpr.term(ObjectRoi, 0.6, 1.0))
    val res = ScanBaseline.topKGroups(oracleCatalog, value, oracleDs.nImages + 1, descending = true, oracleStore)
    import spark.implicits._
    val sparkDf = res.groups.toSeq.toDF("image_id", "val")
    Oracle.assertEquivalent(
      sparkDf,
      """SELECT CAST(c.image_id AS BIGINT) AS image_id,
        |       CAST(AVG(COALESCE(q.cnt, 0)) AS DOUBLE) AS val
        |FROM cat c LEFT JOIN (
        |  SELECT p.mask_id, COUNT(*) AS cnt
        |  FROM pixels p JOIN cat c2 ON p.mask_id = c2.mask_id
        |  WHERE CAST(p.x AS INT) BETWEEN CAST(c2.ox1 AS INT) AND CAST(c2.ox2 AS INT)
        |    AND CAST(p.y AS INT) BETWEEN CAST(c2.oy1 AS INT) AND CAST(c2.oy2 AS INT)
        |    AND CAST(p.v AS DOUBLE) >= 0.6 AND CAST(p.v AS DOUBLE) < 1.0
        |  GROUP BY p.mask_id) q ON c.mask_id = q.mask_id
        |GROUP BY c.image_id""".stripMargin,
      "pixels" -> oraclePixels,
      "cat" -> oracleCatalog,
    )
  }

  test("Q5 shape: CP over the INTERSECT mask matches DuckDB (min over models)") {
    val value = IntersectCpValue(ObjectRoi, ValueRange(0.6, 1.0))
    val res = ScanBaseline.topKGroups(oracleCatalog, value, oracleDs.nImages + 1, descending = true, oracleStore)
    import spark.implicits._
    val sparkDf = res.groups.toSeq.toDF("image_id", "val")
    Oracle.assertEquivalent(
      sparkDf,
      """SELECT CAST(c0.image_id AS BIGINT) AS image_id,
        |       CAST(COALESCE(q.cnt, 0) AS DOUBLE) AS val
        |FROM (SELECT DISTINCT image_id, ox1, oy1, ox2, oy2 FROM cat) c0 LEFT JOIN (
        |  SELECT c.image_id, COUNT(*) AS cnt FROM (
        |    SELECT c2.image_id, p.x, p.y, MIN(CAST(p.v AS DOUBLE)) AS mv,
        |           CAST(c2.ox1 AS INT) ox1, CAST(c2.oy1 AS INT) oy1,
        |           CAST(c2.ox2 AS INT) ox2, CAST(c2.oy2 AS INT) oy2
        |    FROM pixels p JOIN cat c2 ON p.mask_id = c2.mask_id
        |    GROUP BY c2.image_id, p.x, p.y, c2.ox1, c2.oy1, c2.ox2, c2.oy2) c
        |  WHERE CAST(c.x AS INT) BETWEEN c.ox1 AND c.ox2
        |    AND CAST(c.y AS INT) BETWEEN c.oy1 AND c.oy2
        |    AND c.mv >= 0.6 AND c.mv < 1.0
        |  GROUP BY c.image_id) q ON c0.image_id = q.image_id""".stripMargin,
      "pixels" -> oraclePixels,
      "cat" -> oracleCatalog,
    )
  }

  test("filter–verification result equals DuckDB for a < predicate") {
    val pred = Predicate(CpExpr.term(ConstRoi(Roi(1, 1, 16, 16)), 0.7, 1.0), Lt, 30)
    val res = FilterVerify.execute(oracleCatalog, pred, oracleStore, chi)
    import spark.implicits._
    val sparkDf = res.rows.map(_.mask_id).toSeq.toDF("mask_id")
    Oracle.assertEquivalent(
      sparkDf,
      """SELECT CAST(c.mask_id AS BIGINT) AS mask_id
        |FROM cat c LEFT JOIN (
        |  SELECT mask_id, COUNT(*) AS cnt FROM pixels
        |  WHERE CAST(v AS DOUBLE) >= 0.7 AND CAST(v AS DOUBLE) < 1.0
        |  GROUP BY mask_id) q ON c.mask_id = q.mask_id
        |WHERE COALESCE(q.cnt, 0) < 30""".stripMargin,
      "pixels" -> oraclePixels,
      "cat" -> oracleCatalog,
    )
  }
}
