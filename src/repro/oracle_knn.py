"""Brute-force k-NN as SQL, for the DuckDB oracle.

The query joins the long-format query and series tables on position,
computes Euclidean distances with SQL aggregation, and ranks with a
window function — an implementation entirely independent of the index
code, so an index bug cannot hide in the oracle.
"""


def knn_oracle_sql(k: int) -> str:
    """SQL computing global top-``k`` per query over tables ``queries``
    and ``series`` (columns: series_id, pos, val). Output columns match
    :meth:`DistributedIndex.knn`'s topk frame: qid, sid, dist, rank."""
    return f"""
        WITH d AS (
            SELECT q.series_id AS qid,
                   s.series_id AS sid,
                   sqrt(sum((q.val - s.val) * (q.val - s.val))) AS dist
            FROM queries q
            JOIN series s ON q.pos = s.pos
            GROUP BY 1, 2
        ),
        r AS (
            SELECT qid, sid, dist,
                   row_number() OVER (PARTITION BY qid ORDER BY dist, sid) AS rank
            FROM d
        )
        SELECT qid, sid, dist, rank FROM r WHERE rank <= {k}
    """
