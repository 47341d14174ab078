"""Shared DuckDB oracle SQL for (k-)NN over long-format series tables.

The engine's answers are checked row-for-row against brute-force SQL:
series and queries are unpivoted to ``(id|qid, pos, val)`` and the NN is
computed by join + group-by, ranked with deterministic id tie-breaking —
the exact merge semantics the coordinator uses.
"""

NN_SQL = """
WITH dists AS (
    SELECT q.qid AS query_id, s.id AS nn_id,
           sqrt(sum((s.val - q.val) * (s.val - q.val))) AS nn_dist
    FROM series s JOIN queries q ON s.pos = q.pos
    GROUP BY q.qid, s.id
), ranked AS (
    SELECT query_id, nn_dist, nn_id,
           row_number() OVER (PARTITION BY query_id ORDER BY nn_dist, nn_id) AS rn
    FROM dists
)
SELECT query_id, nn_dist, nn_id FROM ranked WHERE rn = 1
"""


def knn_sql(k: int) -> str:
    return f"""
WITH dists AS (
    SELECT q.qid AS query_id, s.id AS nn_id,
           sqrt(sum((s.val - q.val) * (s.val - q.val))) AS nn_dist
    FROM series s JOIN queries q ON s.pos = q.pos
    GROUP BY q.qid, s.id
), ranked AS (
    SELECT query_id, nn_dist, nn_id,
           row_number() OVER (PARTITION BY query_id ORDER BY nn_dist, nn_id) AS rn
    FROM dists
)
SELECT query_id, rn AS rank, nn_dist, nn_id FROM ranked WHERE rn <= {k}
"""
