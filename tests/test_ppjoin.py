"""Tests for the Spark PPJoin baseline, oracle-checked against a naive
all-pairs Jaccard join in DuckDB."""
import pandas as pd
import pytest

from repro.baselines.ppjoin import ppjoin, token_order
from repro.oracle import assert_equivalent

L_ROWS = [
    (0, "2008 LSU Tigers baseball team"),
    (1, "2008 LSU Tigers football team"),
    (2, "Springfield General Hospital"),
    (3, "alpha beta gamma delta"),
]
R_ROWS = [
    (10, "2008 LSU baseball team"),
    (11, "Springfield Hospital"),
    (12, "epsilon zeta"),
    (13, "alpha beta gamma"),
]


def _tok(rows, id_col):
    out = []
    for i, v in rows:
        for t in sorted(set(v.lower().split())):
            out.append((i, t))
    return pd.DataFrame(out, columns=[id_col, "token"])


@pytest.fixture(scope="module")
def dfs(spark):
    l = spark.createDataFrame(pd.DataFrame(L_ROWS, columns=["lid", "value"]))
    r = spark.createDataFrame(pd.DataFrame(R_ROWS, columns=["rid", "value"]))
    return l, r


class TestPPJoin:
    @pytest.mark.parametrize("t", [0.3, 0.5, 0.8])
    def test_matches_naive_allpairs_oracle(self, spark, dfs, t):
        l, r = dfs
        got = ppjoin(spark, l, r, key_col="value", threshold=t)
        assert_equivalent(
            got,
            f"""
            WITH inter AS (
              SELECT l.lid, r.rid, COUNT(*) AS c
              FROM ltok l JOIN rtok r USING (token) GROUP BY l.lid, r.rid),
            ls AS (SELECT lid, COUNT(*) AS n FROM ltok GROUP BY lid),
            rs AS (SELECT rid, COUNT(*) AS n FROM rtok GROUP BY rid)
            SELECT i.lid, i.rid,
                   CAST(i.c AS DOUBLE) / (ls.n + rs.n - i.c) AS jaccard
            FROM inter i JOIN ls USING (lid) JOIN rs USING (rid)
            WHERE CAST(i.c AS DOUBLE) / (ls.n + rs.n - i.c) >= {t}
            """,
            ltok=_tok(L_ROWS, "lid"),
            rtok=_tok(R_ROWS, "rid"),
        )

    def test_exact_duplicate_tokens(self, spark):
        l = spark.createDataFrame(pd.DataFrame([(0, "a b c")], columns=["lid", "value"]))
        r = spark.createDataFrame(pd.DataFrame([(0, "a b c")], columns=["rid", "value"]))
        out = ppjoin(spark, l, r, key_col="value", threshold=1.0).collect()
        assert len(out) == 1 and out[0]["jaccard"] == pytest.approx(1.0)

    def test_high_threshold_filters(self, spark, dfs):
        l, r = dfs
        out = ppjoin(spark, l, r, key_col="value", threshold=0.95).toPandas()
        # Nothing is ≥ 0.95-similar in this data.
        assert len(out) == 0


class TestTokenOrder:
    def test_rare_tokens_rank_first(self, spark, dfs):
        l, r = dfs
        order = token_order(l, r, "value").toPandas().set_index("token")["rank"]
        # "epsilon" appears once; "lsu" three times.
        assert order["epsilon"] < order["lsu"]
