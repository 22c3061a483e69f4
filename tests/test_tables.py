"""Integration tests for the experiment table builders (paper §4).

These run the actual pipeline (generate → partition → metrics →
simulate) at the cheap ``test`` tier on a subset of datasets, with the
disk cache redirected to a temp dir, and assert the paper's headline
*shape* claims hold end-to-end.
"""
import numpy as np
import pandas as pd
import pytest

import repro.experiments.tables as T
from repro.core.correlate import METRIC_COLS


@pytest.fixture(scope="module", autouse=True)
def _tmp_cache(tmp_path_factory):
    old = T.CACHE_DIR
    T.CACHE_DIR = tmp_path_factory.mktemp("profiles")
    yield
    T.CACHE_DIR = old


SMALL = ("pocek", "youtube")
STRATS = ("RVC", "1D", "2D", "CRVC", "SC", "DC")


@pytest.fixture(scope="module")
def runs_pr(spark):
    return T.runtime_table(spark, "pr", tier="test", datasets=SMALL, parts=(16, 32))


@pytest.fixture(scope="module")
def runs_tr(spark):
    return T.runtime_table(spark, "tr", tier="test", datasets=SMALL, parts=(16, 32))


class TestMetricsTable:
    def test_schema_and_rows(self, spark):
        t = T.metrics_table(spark, 16, tier="test", datasets=SMALL)
        assert list(t.columns) == [
            "dataset", "partitioner", "balance", "non_cut", "cut", "comm_cost", "part_stdev",
        ]
        assert len(t) == len(SMALL) * len(STRATS)

    def test_finer_partitioning_raises_commcost(self, spark):
        """Paper, Appendix A: 256-partition CommCost exceeds 128's but is
        'significantly lower than double'."""
        c16 = T.metrics_table(spark, 16, tier="test", datasets=("pocek",))
        c32 = T.metrics_table(spark, 32, tier="test", datasets=("pocek",))
        m = c16.merge(c32, on=["dataset", "partitioner"], suffixes=("_16", "_32"))
        assert (m.comm_cost_32 >= m.comm_cost_16).all()
        assert (m.comm_cost_32 <= 2 * m.comm_cost_16).all()

    def test_cache_roundtrip(self, spark):
        a = T.metrics_table(spark, 16, tier="test", datasets=("youtube",))
        b = T.metrics_table(spark, 16, tier="test", datasets=("youtube",))
        pd.testing.assert_frame_equal(a, b)


class TestRuntimeTables:
    def test_runtime_schema(self, runs_pr):
        assert {"dataset", "strategy", "n_parts", "time", *METRIC_COLS} <= set(runs_pr.columns)
        assert len(runs_pr) == len(SMALL) * len(STRATS) * 2
        assert (runs_pr.time > 0).all()

    def test_sssp_excludes_roadnets(self, spark):
        runs = T.runtime_table(
            spark, "sssp", tier="test", datasets=None, parts=(16,),
            strategies=("RVC",),
        )
        assert not (set(runs.dataset) & {"roadnet-pa", "roadnet-tx", "roadnet-ca"})

    def test_best_partitioner_table(self, runs_pr):
        best = T.best_partitioner_table(runs_pr)
        assert len(best) == len(SMALL) * 2
        # the winner's time is the min over its group
        for _, row in best.iterrows():
            grp = runs_pr[(runs_pr.dataset == row.dataset) & (runs_pr.n_parts == row.n_parts)]
            assert row.time == grp.time.min()

    def test_correlation_table(self, runs_pr):
        corr = T.correlation_table(runs_pr)
        assert set(corr.n_parts) == {16, 32}
        assert set(METRIC_COLS) <= set(corr.columns)

    def test_pr_commcost_strongly_correlated(self, runs_pr):
        """Figure 3's claim, scaled down: CommCost is a top-2 predictor
        of PR time with r > 0.8. (The strict top-metric claim holds at
        bench tier — asserted in benchmarks/bench_pagerank.py — but at
        1/2000 scale with two datasets Cut can edge it out.)"""
        corr = T.correlation_table(runs_pr).set_index("n_parts")
        for n in (16, 32):
            r = corr.loc[n, list(METRIC_COLS)].astype(float)
            assert r["comm_cost"] > 0.8
            assert r["comm_cost"] >= r.sort_values(ascending=False).iloc[1]

    def test_granularity_table(self, runs_pr):
        g = T.granularity_table(runs_pr)
        assert set(g.dataset) == set(SMALL)
        assert {"time_coarse", "time_fine", "fine_speedup_pct"} <= set(g.columns)


class TestInfraTable:
    def test_deltas_negative_and_ordered(self, spark):
        t = T.infra_table(spark, tier="test", dataset="pocek", strategy="2D")
        t = t.set_index("config")
        assert t.loc["ii (1Gbps, HDD)", "delta_vs_ii_pct"] == 0.0
        # paper ordering: (iv) < (iii) < (ii); compare raw times since
        # the rounded %-deltas can coincide at the tiny test tier
        t_ii = t.loc["ii (1Gbps, HDD)", "time"]
        t_iii = t.loc["iii (40Gbps, HDD)", "time"]
        t_iv = t.loc["iv (40Gbps, SSD)", "time"]
        assert t_iv < t_iii < t_ii


class TestParselTable:
    def test_parsel_eval(self, spark):
        t = T.parsel_table(
            spark, tier="test", datasets=("pocek",), parts=(16,),
            strategies=("RVC", "2D", "DC"),
        )
        assert set(t.algo) == {"pr", "cc", "tr", "sssp"}
        assert (t.regret_pct >= 0).all()
        # the metric heuristic should be near-optimal for comm-bound algos
        assert t[t.algo == "pr"].regret_pct.max() < 25.0


class TestTable1:
    def test_table1_tiny(self, spark):
        t = T.table1(spark, tier="test", datasets=("youtube",))
        row = t.iloc[0]
        assert row.dataset == "youtube"
        assert row.symm_pct == pytest.approx(100.0)
        assert row.zero_in_pct == 0.0 and row.zero_out_pct == 0.0
        assert row.components == 1
        assert np.isfinite(row.diameter)
        assert row.size_bytes > 0
        assert row.triangles > 0  # social graph has closed wedges
