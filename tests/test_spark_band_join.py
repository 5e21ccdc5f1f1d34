"""Spark integration tests: the distributed band-join operator under
every partitioning, verified row-by-row against the DuckDB oracle."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.baselines.grid_eps import GridPartitioning
from repro.baselines.iejoin import IEJoinPartitioning
from repro.baselines.one_bucket import OneBucketPartitioning
from repro.core.recpart import recpart
from repro.dist.band_join import catalyst_band_join_count, distributed_band_join
from repro.dist.metrics import evaluate_partitioning
from repro.oracle import assert_equivalent
from repro.synth_data import lineitem, orders, pareto_points, to_spark

N = 1200
D = 2
EPS = np.array([40.0, 40.0])
DIMS = ["a1", "a2"]


@pytest.fixture(scope="module")
def data(spark):
    S = pareto_points(N, 1.5, D, seed=1)
    T = pareto_points(N, 1.5, D, seed=2)
    s_pdf = pd.DataFrame(S, columns=DIMS)
    s_pdf.insert(0, "id", np.arange(N, dtype=np.int64))
    t_pdf = pd.DataFrame(T, columns=DIMS)
    t_pdf.insert(0, "id", np.arange(N, dtype=np.int64))
    return S, T, s_pdf, t_pdf, to_spark(spark, S), to_spark(spark, T)


PAIR_SQL = """
    select s.id as s_id, t.id as t_id
    from s, t
    where abs(s.a1 - t.a1) <= 40 and abs(s.a2 - t.a2) <= 40
"""


def _parts(S, T):
    return {
        "recpart": recpart(S, T, EPS, 4, seed=0).partitioning,
        "recpart_s": recpart(S, T, EPS, 4, seed=0, symmetric=False).partitioning,
        "one_bucket": OneBucketPartitioning(len(S), len(T), 4, seed=0),
        "grid_eps": GridPartitioning(S, T, EPS, EPS, 4),
        "iejoin": IEJoinPartitioning(S, T, EPS, 4, 200, seed=0),
    }


@pytest.mark.parametrize(
    "method", ["recpart", "recpart_s", "one_bucket", "grid_eps", "iejoin"]
)
def test_operator_result_matches_duckdb_oracle(spark, data, method):
    """Every partitioner's distributed execution must return exactly the
    DuckDB band-join rows — the core Definition-1 guarantee, end to end
    through the real map-shuffle-reduce pipeline."""
    S, T, s_pdf, t_pdf, S_df, T_df = data
    part = _parts(S, T)[method]
    pairs, _, _ = distributed_band_join(spark, S_df, T_df, part, EPS, DIMS, produce_pairs=True)
    result_df = spark.createDataFrame(pairs[["s_id", "t_id"]])
    assert_equivalent(result_df, PAIR_SQL, s=s_pdf, t=t_pdf)


def test_counts_path_matches_pairs_path(spark, data):
    S, T, s_pdf, t_pdf, S_df, T_df = data
    part = OneBucketPartitioning(len(S), len(T), 4, seed=0)
    pairs, _, _ = distributed_band_join(spark, S_df, T_df, part, EPS, DIMS, produce_pairs=True)
    _, stats, _ = distributed_band_join(spark, S_df, T_df, part, EPS, DIMS)
    assert stats["output"].sum() == len(pairs)


def test_spark_stats_match_simulator(spark, data):
    """The Spark execution's per-worker shuffle inputs must equal the
    numpy simulator's exact accounting."""
    S, T, s_pdf, t_pdf, S_df, T_df = data
    part = OneBucketPartitioning(len(S), len(T), 4, seed=0)
    _, stats, _ = distributed_band_join(spark, S_df, T_df, part, EPS, DIMS)
    ev = evaluate_partitioning(part, S, T, EPS, reschedule=False)
    assert int(stats["input_s"].sum() + stats["input_t"].sum()) == ev.I
    assert int(stats["output"].sum()) == ev.O_total
    got = stats.set_index("worker").sort_index()
    want_in = ev.worker_input
    assert [int(got.loc[i, "input_s"] + got.loc[i, "input_t"]) for i in got.index] == [
        int(want_in[i]) for i in got.index
    ]


def test_catalyst_reference_count(spark, data):
    S, T, s_pdf, t_pdf, S_df, T_df = data
    part = OneBucketPartitioning(len(S), len(T), 4, seed=0)
    _, stats, _ = distributed_band_join(spark, S_df, T_df, part, EPS, DIMS)
    assert stats["output"].sum() == catalyst_band_join_count(spark, S_df, T_df, EPS, DIMS)


def test_eps_zero_equi_join(spark, data):
    S, T, s_pdf, t_pdf, S_df, T_df = data
    eps0 = np.array([0.0, 0.0])
    part = recpart(S, T, eps0, 4, seed=0).partitioning
    pairs, _, _ = distributed_band_join(spark, S_df, T_df, part, eps0, DIMS, produce_pairs=True)
    result_df = spark.createDataFrame(
        pairs[["s_id", "t_id"]], schema="s_id long, t_id long"
    )
    assert_equivalent(
        result_df,
        "select s.id as s_id, t.id as t_id from s, t where s.a1 = t.a1 and s.a2 = t.a2",
        s=s_pdf,
        t=t_pdf,
    )


class TestTpchDateBandJoin:
    """Band-join on TPC-H-lite date columns: the operator vs a plain
    Catalyst/DuckDB formulation, exercising the provided generators."""

    @pytest.fixture(scope="class")
    def tpch(self, spark):
        li = lineitem(spark, sf=0.002).withColumn(
            "ship_day", F.datediff("l_shipdate", F.lit("1992-01-01")).cast("double")
        )
        o = orders(spark, sf=0.002).withColumn(
            "order_day", F.datediff("o_orderdate", F.lit("1992-01-01")).cast("double")
        )
        li_p = li.select("l_orderkey", "ship_day").toPandas()
        o_p = o.select("o_orderkey", "order_day").toPandas()
        return li_p, o_p

    def test_orders_lineitem_within_2_days(self, spark, tpch):
        li_p, o_p = tpch
        li_sub = li_p.head(1500).reset_index(drop=True)
        o_sub = o_p.head(1500).reset_index(drop=True)
        S = li_sub[["ship_day"]].to_numpy(float)
        T = o_sub[["order_day"]].to_numpy(float)
        eps = np.array([2.0])
        part = recpart(S, T, eps, 4, seed=0).partitioning
        S_df = to_spark(spark, S)
        T_df = to_spark(spark, T)
        pairs, _, _ = distributed_band_join(
            spark, S_df, T_df, part, eps, ["a1"], produce_pairs=True
        )
        s_pdf = pd.DataFrame({"id": np.arange(len(S)), "a1": S[:, 0]})
        t_pdf = pd.DataFrame({"id": np.arange(len(T)), "a1": T[:, 0]})
        assert_equivalent(
            spark.createDataFrame(pairs[["s_id", "t_id"]]),
            "select s.id as s_id, t.id as t_id from s, t where abs(s.a1 - t.a1) <= 2",
            s=s_pdf,
            t=t_pdf,
        )

    def test_aggregate_over_band_join(self, spark, tpch):
        """Aggregation on top of the operator's output checked against
        DuckDB: matches-per-order histogram."""
        li_p, o_p = tpch
        S = li_p[["ship_day"]].head(1000).to_numpy(float)
        T = o_p[["order_day"]].head(1000).to_numpy(float)
        eps = np.array([1.0])
        part = recpart(S, T, eps, 4, seed=0).partitioning
        pairs, _, _ = distributed_band_join(
            spark, to_spark(spark, S), to_spark(spark, T), part, eps, ["a1"],
            produce_pairs=True,
        )
        agg = (
            spark.createDataFrame(pairs[["s_id", "t_id"]])
            .groupBy("t_id")
            .agg(F.count("*").alias("n"))
        )
        s_pdf = pd.DataFrame({"id": np.arange(len(S)), "a1": S[:, 0]})
        t_pdf = pd.DataFrame({"id": np.arange(len(T)), "a1": T[:, 0]})
        assert_equivalent(
            agg,
            """select t.id as t_id, count(*) as n from s, t
               where abs(s.a1 - t.a1) <= 1 group by t.id""",
            s=s_pdf,
            t=t_pdf,
        )
