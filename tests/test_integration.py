"""Integration tests: the full E-AFE pipeline end-to-end on Spark.

These are the repo's "does the whole thing hang together" checks:
FPE trained via the Spark labeling job, E-AFE run against it, the
selected features materialized back through Catalyst, and the final
engineered DataFrame verified against the DuckDB oracle.
"""
import numpy as np
import pandas as pd
import pytest

from repro.bench.tables import table1
from repro.core.eafe import AFEConfig, run_afe
from repro.core.fpe import FPEModel, label_corpus
from repro.core.transform import materialize, parse_spec
from repro.oracle import assert_equivalent
from repro.synth_data import fpe_corpus, make_tabular

CFG = AFEConfig(
    epochs_stage1=1, epochs_stage2=2, steps_per_agent=3, max_agents=5,
    cv_k=3, cv_trees=4, seed=1,
)


@pytest.fixture(scope="module")
def fpe(spark):
    corpus = fpe_corpus(5, seed=1200)
    labels = label_corpus(spark, corpus, thre=0.01, cv_cfg={"k": 3, "n_trees": 4})
    return FPEModel.fit(corpus, labels, fixed_variant="ccws", d_options=(16,), seed=0)


@pytest.fixture(scope="module")
def run(fpe):
    X, y = make_tabular(task="C", n_samples=260, n_features=6, seed=8)
    res = run_afe(X.values, y, "C", fpe, CFG)
    return X, y, res


class TestEndToEnd:
    def test_run_improved_or_matched(self, run):
        _, _, res = run
        assert res.best_score >= res.base_score

    def test_selected_specs_parse_round_trip(self, run):
        _, _, res = run
        for name in res.feature_names:
            assert parse_spec(name).name == name

    def test_materialized_features_match_numpy(self, spark, run):
        """The Catalyst rendering of the learned features equals the
        numpy values the RL loop actually evaluated."""
        X, y, res = run
        if not res.selected_specs:
            pytest.skip("run selected no engineered features")
        Xk = X.values[:, res.kept_columns]
        cols = [f"c{i}" for i in range(Xk.shape[1])]
        pdf = pd.DataFrame(Xk, columns=cols)
        sdf = spark.createDataFrame(pdf)
        out = materialize(sdf, cols, res.selected_specs).toPandas()
        for i, s in enumerate(res.selected_specs):
            got = np.sort(out[f"gen_{i}"].to_numpy(dtype=np.float64))
            want = np.sort(s.to_numpy(Xk))
            np.testing.assert_allclose(got, want, rtol=1e-9, atol=1e-9)

    def test_materialized_features_pass_oracle(self, spark, run):
        """Engineered DataFrame vs an independent DuckDB rendering.

        DuckDB cannot nest window calls, so a spec with minmax-inside-
        minmax is only checkable on the Spark/numpy pair (covered by the
        previous test); pick a spec whose SQL rendering is flat enough.
        """

        def _nested_minmax(s):
            def has_minmax(n):
                if n is None or n.is_leaf:
                    return False
                return n.op == "minmax" or has_minmax(n.left) or has_minmax(n.right)

            if s.is_leaf:
                return False
            inner = (s.op == "minmax") and (has_minmax(s.left) or has_minmax(s.right))
            return inner or _nested_minmax(s.left) or (s.right is not None and _nested_minmax(s.right))

        X, y, res = run
        eligible = [s for s in res.selected_specs if not _nested_minmax(s)]
        if not eligible:
            pytest.skip("no oracle-renderable spec selected in this run")
        Xk = X.values[:, res.kept_columns]
        cols = [f"c{i}" for i in range(Xk.shape[1])]
        pdf = pd.DataFrame(Xk, columns=cols)
        sdf = spark.createDataFrame(pdf)
        spec = eligible[0]
        spark_out = materialize(sdf, cols, [spec]).select("c0", "gen_0")
        sql = f'SELECT "c0", {spec.to_duckdb(cols)} AS gen_0 FROM t'
        assert_equivalent(spark_out, sql, t=pdf)

    def test_fewer_evaluations_than_nfs(self, run, fpe):
        """Table IV's shape at test scale."""
        X, y, res = run
        from repro.baselines.nfs import run_nfs

        nfs = run_nfs(X.values, y, "C", CFG)
        assert res.n_evaluated < nfs.n_evaluated

    def test_eval_dominates_epoch_time(self, run):
        """Table I's shape: evaluation is the bottleneck, generation is
        negligible."""
        _, _, res = run
        assert res.eval_time > 10 * res.gen_time


class TestTable1Harness:
    def test_table1_rows_and_shape(self):
        df = table1(epochs=1)
        assert list(df["dataset"]) == [
            "PimaIndian", "credit-a", "diabetes", "German Credit"
        ]
        # the reproduced claim: evaluation dominates, like the paper's 90%+
        assert (df["eval_share"] > 0.8).all()
        assert (df["gen_time_s"] < df["eval_time_s"]).all()
        assert (df["paper_eval_share"] > 0.85).all()
