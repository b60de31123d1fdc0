"""Experiment harness + table functions at tiny scale (shape, not numbers)."""
import pandas as pd
import pytest

from repro.datagen.streams import netflow_stream
from repro.datagen.queries import generate_query
from repro.experiments import tables as T
from repro.experiments.harness import ABLATIONS, METHODS, make_engine, run_stream


class TestMakeEngine:
    @pytest.mark.parametrize("name", METHODS + ABLATIONS[1:])
    def test_factory_builds_every_method(self, spark, name):
        stream = netflow_stream(120, n_ips=30, seed=0)
        gq = generate_query(stream, 3, order_mode="random", seed=0)
        eng = make_engine(name, spark, gq.query, 50, stream=stream)
        assert getattr(eng, "name") == name

    def test_unknown_method(self, spark):
        stream = netflow_stream(60, seed=0)
        gq = generate_query(stream, 3, order_mode="random", seed=0)
        with pytest.raises(ValueError):
            make_engine("nope", spark, gq.query, 50)


class TestRunStream:
    def test_metrics_shape(self, spark):
        stream = netflow_stream(120, n_ips=30, seed=0)
        gq = generate_query(stream, 3, order_mode="random", seed=1)
        eng = make_engine("Timing", spark, gq.query, 50)
        m = run_stream(eng, stream, 60)
        assert m.n_edges == 120
        assert m.elapsed_s > 0 and m.throughput > 0
        assert m.n_matches == len(m.matches)
        assert m.avg_space >= 0


class TestPurePythonTables:
    def test_t25_selectivity_shape(self, tmp_path, monkeypatch):
        monkeypatch.setattr(T, "RESULTS_DIR", tmp_path)
        df = T.t25_selectivity(
            dataset="wikitalk", windows=(60, 120), qsizes=(3, 4),
            n_edges=250, n_queries=2,
        )
        assert list(df["qsize"]) == [3, 4]
        assert (tmp_path / "T25_selectivity.md").exists()
        # Fig 25 shape: answers grow with window size
        assert (df[120] >= df[60]).all()

    def test_t19_speedup_shape(self, tmp_path, monkeypatch):
        monkeypatch.setattr(T, "RESULTS_DIR", tmp_path)
        df = T.t19_speedup_vs_window(
            dataset="netflow", windows=(80,), qsize=4, n_edges=400,
            threads=(1, 4),
        )
        one = df[df["threads"] == 1].iloc[0]
        assert one["Timing-N"] == pytest.approx(1.0, abs=0.01)
        four = df[df["threads"] == 4].iloc[0]
        assert four["Timing-N"] >= four["All-locks-N"] - 1e-6

    def test_t20_speedup_shape(self, tmp_path, monkeypatch):
        monkeypatch.setattr(T, "RESULTS_DIR", tmp_path)
        df = T.t20_speedup_vs_qsize(
            dataset="netflow", window=80, qsizes=(3, 5), n_edges=400,
            threads=(1, 8),
        )
        assert set(df["qsize"]) == {3, 5}
        assert (df["Timing-N"] >= df["All-locks-N"] - 1e-6).all()


@pytest.mark.slow
class TestSparkTablesSmoke:
    def test_sweep_cached(self, spark, tmp_path, monkeypatch):
        monkeypatch.setattr(T, "RESULTS_DIR", tmp_path)
        kw = dict(
            dataset="netflow", windows=(50,), qsizes=(3,),
            methods=("Timing", "SJ-tree"), n_edges=120, batch=60,
        )
        df1 = T.sweep(spark, **kw)
        df2 = T.sweep(spark, **kw)  # memoised — same object
        assert df1 is df2
        assert set(df1["method"]) == {"Timing", "SJ-tree"}

    def test_t15_t17_share_runs(self, spark, tmp_path, monkeypatch):
        monkeypatch.setattr(T, "RESULTS_DIR", tmp_path)
        kw = dict(windows=(50,), qsize=3, methods=("Timing",),
                  n_edges=120, batch=60)
        t15 = T.t15_throughput_vs_window(spark, **dict(kw))
        t17 = T.t17_space_vs_window(spark, **dict(kw))
        assert "Timing" in t15.columns and "Timing" in t17.columns
        assert (tmp_path / "T15_throughput_vs_window.md").exists()
        assert (tmp_path / "T17_space_vs_window.md").exists()
