"""DuckDB oracle checks: the Spark aggregation pipeline (block stats, ARCS
edge weighting, window co-occurrences, RCF, duplication likelihood) is
replayed in SQL over the same inputs via `repro.oracle.assert_equivalent`."""
import pytest
from pyspark.sql import functions as F

from repro.blocking import block_stats, standard_blocking, token_blocking_workflow
from repro.common import DIRTY
from repro.graph import duplication_likelihood, edge_weights
from repro.neighbor import neighbor_list, position_counts, rcf_weights, window_pairs
from repro.oracle import assert_equivalent
from repro.tokenize import tokenize_profiles


@pytest.fixture(scope="module")
def rest_tokens(spark, restaurant_ds):
    return tokenize_profiles(restaurant_ds.profiles).localCheckpoint()


def test_block_stats_match_duckdb(spark, rest_tokens):
    got = block_stats(standard_blocking(rest_tokens, DIRTY), DIRTY).select(
        "token", F.col("size").cast("long").alias("size"),
        F.col("cardinality").cast("long").alias("cardinality"),
    )
    sql = """
        SELECT token,
               count(*) AS size,
               (count(*) * (count(*) - 1) / 2)::BIGINT AS cardinality
        FROM tok GROUP BY token HAVING count(*) >= 2
    """
    assert_equivalent(got, sql, tok=rest_tokens)


def test_arcs_matches_duckdb(spark, rest_tokens):
    coll = token_blocking_workflow(
        rest_tokens, DIRTY, 864, purge_ratio=1.0, filter_ratio=1.0
    )
    got = edge_weights(coll, scheme="arcs")
    sql = """
        WITH stats AS (
            SELECT token, count(*) * (count(*) - 1) / 2 AS card
            FROM assign GROUP BY token HAVING count(*) >= 2
        )
        SELECT x.pid AS i, y.pid AS j, sum(1.0 / s.card) AS weight
        FROM assign x
        JOIN assign y ON x.token = y.token AND x.pid < y.pid
        JOIN stats s ON s.token = x.token
        GROUP BY x.pid, y.pid
    """
    assert_equivalent(got, sql, assign=coll.assignments)


def test_cbs_matches_duckdb(spark, rest_tokens):
    coll = token_blocking_workflow(
        rest_tokens, DIRTY, 864, purge_ratio=1.0, filter_ratio=1.0
    )
    got = edge_weights(coll, scheme="cbs")
    sql = """
        SELECT x.pid AS i, y.pid AS j, count(*)::DOUBLE AS weight
        FROM assign x JOIN assign y ON x.token = y.token AND x.pid < y.pid
        GROUP BY x.pid, y.pid
    """
    assert_equivalent(got, sql, assign=coll.assignments)


def test_window_pair_frequencies_match_duckdb(spark, rest_tokens):
    nl = neighbor_list(rest_tokens.withColumnRenamed("token", "key"), salt=0)
    got = (
        window_pairs(nl, [1, 2], DIRTY)
        .groupBy("w", "i", "j")
        .agg(F.count("*").alias("freq"))
    )
    sql = """
        SELECT d.w, least(x.pid, y.pid) AS i, greatest(x.pid, y.pid) AS j,
               count(*) AS freq
        FROM nl x
        JOIN (SELECT 1 AS w UNION ALL SELECT 2) d ON true
        JOIN nl y ON y.pos = x.pos + d.w
        WHERE x.pid <> y.pid
        GROUP BY d.w, least(x.pid, y.pid), greatest(x.pid, y.pid)
    """
    assert_equivalent(got, sql, nl=nl)


def test_rcf_matches_duckdb(spark, rest_tokens):
    nl = neighbor_list(rest_tokens.withColumnRenamed("token", "key"), salt=0)
    got = rcf_weights(
        window_pairs(nl, [1], DIRTY), position_counts(nl), per_window=False
    ).select("i", "j", "freq", "weight")
    sql = """
        WITH np AS (SELECT pid, count(*) AS n_pos FROM nl GROUP BY pid),
        f AS (
            SELECT least(x.pid, y.pid) AS i, greatest(x.pid, y.pid) AS j,
                   count(*) AS freq
            FROM nl x JOIN nl y ON y.pos = x.pos + 1
            WHERE x.pid <> y.pid
            GROUP BY 1, 2
        )
        SELECT f.i, f.j, f.freq,
               f.freq / greatest(a.n_pos + b.n_pos - f.freq, 1) AS weight
        FROM f JOIN np a ON a.pid = f.i JOIN np b ON b.pid = f.j
    """
    assert_equivalent(got, sql, nl=nl)


def test_duplication_likelihood_matches_duckdb(spark, rest_tokens):
    coll = token_blocking_workflow(
        rest_tokens, DIRTY, 864, purge_ratio=1.0, filter_ratio=1.0
    )
    edges = edge_weights(coll).localCheckpoint()
    got = duplication_likelihood(edges).select("pid", "dup_likelihood")
    sql = """
        WITH sym AS (
            SELECT i AS pid, weight FROM e
            UNION ALL
            SELECT j AS pid, weight FROM e
        )
        SELECT pid, avg(weight) AS dup_likelihood FROM sym GROUP BY pid
    """
    assert_equivalent(got, sql, e=edges)


def test_tpch_plumbing_oracle(spark):
    """Sanity: the provided TPC-H-lite generators + oracle wire together."""
    from repro.synth_data import lineitem

    li = lineitem(spark, sf=0.001)
    got = li.groupBy("l_returnflag").agg(
        F.count("*").alias("n"), F.round(F.sum("l_quantity"), 2).alias("qty")
    )
    sql = """
        SELECT l_returnflag, count(*) AS n, round(sum(l_quantity), 2) AS qty
        FROM li GROUP BY l_returnflag
    """
    assert_equivalent(got, sql, li=li)
