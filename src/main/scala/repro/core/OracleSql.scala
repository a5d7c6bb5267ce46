package repro.core

/** DuckDB SQL for exact temporal butterfly counting by brute-force 4-way
  * self-join — the ground truth fed to `repro.Oracle.assertEquivalent`.
  *
  * The query enumerates every (2,2)-biclique occurrence over an `edges`
  * table `(u, v, t)` (u upper, v lower), keeps only those whose four
  * timestamps are pairwise distinct and fall within `delta`, classifies
  * each with the same direction/coverage/layer rules as
  * [[ButterflyType.classify]] (read from the U-layer, the canonical
  * perspective fixed by the conversion rule), and returns a dense 6-row
  * `(btype, cnt)` result.
  */
object OracleSql {

  def countByType(delta: Long): String =
    s"""
       |WITH e AS (
       |  SELECT CAST(u AS BIGINT) AS u, CAST(v AS BIGINT) AS v, CAST(t AS BIGINT) AS t
       |  FROM edges
       |),
       |bf AS (
       |  SELECT e1.t AS tuv, e2.t AS tux, e3.t AS twv, e4.t AS twx
       |  FROM e e1
       |  JOIN e e2 ON e2.u = e1.u AND e1.v < e2.v
       |  JOIN e e3 ON e3.v = e1.v AND e1.u < e3.u
       |  JOIN e e4 ON e4.u = e3.u AND e4.v = e2.v
       |  WHERE greatest(e1.t, e2.t, e3.t, e4.t) - least(e1.t, e2.t, e3.t, e4.t) <= $delta
       |    AND e1.t <> e2.t AND e1.t <> e3.t AND e1.t <> e4.t
       |    AND e2.t <> e3.t AND e2.t <> e4.t AND e3.t <> e4.t
       |),
       |w AS (
       |  -- wedge 1 runs u -> v -> w (legs tuv, twv); wedge 2 runs u -> x -> w
       |  SELECT
       |    least(tuv, twv) AS ns1, greatest(tuv, twv) AS na1, (tuv < twv) AS f1,
       |    least(tux, twx) AS ns2, greatest(tux, twx) AS na2, (tux < twx) AS f2
       |  FROM bf
       |),
       |o AS (
       |  SELECT
       |    CASE WHEN ns1 < ns2 THEN na1 ELSE na2 END AS ia,
       |    CASE WHEN ns1 < ns2 THEN ns2 ELSE ns1 END AS js,
       |    CASE WHEN ns1 < ns2 THEN na2 ELSE na1 END AS ja,
       |    (f1 = f2) AS same_dir
       |  FROM w
       |),
       |typed AS (
       |  SELECT (CASE WHEN js > ia THEN 0 WHEN ja < ia THEN 2 ELSE 1 END)
       |       + (CASE WHEN same_dir THEN 0 ELSE 3 END) AS btype
       |  FROM o
       |),
       |agg AS (SELECT btype, COUNT(*) AS c FROM typed GROUP BY btype)
       |SELECT ty.btype AS btype, CAST(COALESCE(agg.c, 0) AS BIGINT) AS cnt
       |FROM (VALUES (0), (1), (2), (3), (4), (5)) AS ty(btype)
       |LEFT JOIN agg ON agg.btype = ty.btype
       |ORDER BY ty.btype
       |""".stripMargin
}
