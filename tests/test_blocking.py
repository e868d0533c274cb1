"""Tests for the Spark blocking dataflow (§3.2), oracle-checked with DuckDB."""
import math

import pandas as pd
import pytest

from repro.core.blocking import block_ll, block_lr, idf_table, top_k, _exploded_tokens
from repro.core.tokenize import qgrams
from repro.oracle import assert_equivalent

L_ROWS = [
    (0, "2008 LSU Tigers baseball team"),
    (1, "2008 LSU Tigers football team"),
    (2, "2007 Wisconsin Badgers football team"),
    (3, "2008 Mississippi State Bulldogs baseball team"),
]
R_ROWS = [
    (10, "2008 LSU baseball team"),
    (11, "2008 Missisippi State Bulldog baseball team"),
]


def _pdf_tokens(rows, id_col):
    out = []
    for rid, val in rows:
        for t in sorted(set(qgrams(val.lower(), 3))):
            out.append((rid, t))
    return pd.DataFrame(out, columns=[id_col, "token"])


@pytest.fixture(scope="module")
def l_df(spark):
    return spark.createDataFrame(pd.DataFrame(L_ROWS, columns=["lid", "value"]))


@pytest.fixture(scope="module")
def r_df(spark):
    return spark.createDataFrame(pd.DataFrame(R_ROWS, columns=["rid", "value"]))


class TestExplodedTokens:
    def test_matches_python_tokenizer(self, spark, l_df):
        got = _exploded_tokens(l_df, "lid", "value")
        assert_equivalent(
            got,
            "SELECT lid, token FROM expected",
            expected=_pdf_tokens(L_ROWS, "lid"),
        )


class TestIdfTable:
    def test_matches_duckdb_aggregation(self, spark, l_df):
        l_tok = _exploded_tokens(l_df, "lid", "value")
        got = idf_table(l_tok, n_left=len(L_ROWS))
        assert_equivalent(
            got,
            f"""
            SELECT token, ln(1 + {len(L_ROWS)}.0 / COUNT(DISTINCT lid)) AS weight
            FROM ltok GROUP BY token
            """,
            ltok=_pdf_tokens(L_ROWS, "lid"),
        )

    def test_rare_token_weight_higher(self, spark, l_df):
        l_tok = _exploded_tokens(l_df, "lid", "value")
        w = {r["token"]: r["weight"] for r in idf_table(l_tok, len(L_ROWS)).collect()}
        # "wis" appears in 1 record, "tea" in all 4.
        assert w["wis"] > w["tea"]
        assert w["tea"] == pytest.approx(math.log(1 + 4 / 4))


class TestTopK:
    def test_matches_duckdb_window(self, spark):
        scores = pd.DataFrame(
            [(1, 100, 5.0), (1, 101, 7.0), (1, 102, 6.0), (2, 100, 1.0)],
            columns=["rid", "lid", "score"],
        )
        got = top_k(spark.createDataFrame(scores), "rid", "lid", k=2)
        assert_equivalent(
            got,
            """
            SELECT rid, lid, score FROM (
              SELECT *, row_number() OVER (
                PARTITION BY rid ORDER BY score DESC, lid ASC) AS rk
              FROM scores
            ) WHERE rk <= 2
            """,
            scores=scores,
        )


class TestBlockLR:
    def test_ground_truth_survives_blocking(self, spark, l_df, r_df):
        pairs = block_lr(spark, l_df, r_df, key_col="value").collect()
        cand = {(p["rid"], p["lid"]) for p in pairs}
        assert (10, 0) in cand  # r10 ↔ l0
        assert (11, 3) in cand  # r11 ↔ l3

    def test_top_k_bound(self, spark, l_df, r_df):
        pairs = block_lr(spark, l_df, r_df, key_col="value", beta=1.0).toPandas()
        k = max(1, math.ceil(math.sqrt(len(L_ROWS))))
        assert pairs.groupby("rid").size().max() <= k

    def test_score_is_sum_of_common_token_weights(self, spark, l_df, r_df):
        # Oracle-check the full score computation for one (rid, lid) pair.
        pairs = block_lr(spark, l_df, r_df, key_col="value").toPandas()
        got_score = pairs.set_index(["rid", "lid"])["score"]
        import duckdb

        con = duckdb.connect()
        con.register("ltok", _pdf_tokens(L_ROWS, "lid"))
        con.register("rtok", _pdf_tokens(R_ROWS, "rid"))
        expected = con.execute(
            f"""
            WITH idf AS (
              SELECT token, ln(1 + {len(L_ROWS)}.0 / COUNT(DISTINCT lid)) AS w
              FROM ltok GROUP BY token)
            SELECT r.rid, l.lid, SUM(i.w) AS score
            FROM rtok r JOIN idf i USING (token) JOIN ltok l USING (token)
            GROUP BY r.rid, l.lid
            """
        ).fetchdf()
        con.close()
        for _, row in expected.iterrows():
            key = (row["rid"], row["lid"])
            if key in got_score.index:
                assert got_score[key] == pytest.approx(row["score"], rel=1e-6)


class TestBlockLL:
    def test_no_self_pairs(self, spark, l_df):
        pairs = block_ll(spark, l_df, key_col="value").toPandas()
        assert (pairs["lid"] != pairs["lid2"]).all()

    def test_near_duplicates_paired(self, spark, l_df):
        pairs = block_ll(spark, l_df, key_col="value").toPandas()
        cand = set(zip(pairs["lid"], pairs["lid2"]))
        assert (0, 1) in cand  # the two LSU rows block together
