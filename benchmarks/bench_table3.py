"""Benchmark for Table III: E-AFE vs baselines, score and wall time.

The paper's efficiency claim is that E-AFE reaches NFS-level scores at
>=2x the speed; the two benchmarks here measure exactly that pair on a
representative classification dataset, and the assertions encode the
expected ordering (E-AFE no slower than half of NFS at bench scale).
"""
import pytest

from repro.baselines.autofs import run_autofs_r
from repro.baselines.nfs import run_nfs
from repro.bench.datasets import by_name, load_dataset
from repro.core.eafe import run_afe

_DS = "German Credit"


@pytest.fixture(scope="module")
def data():
    spec = by_name(_DS)
    X_pdf, y = load_dataset(spec)
    return X_pdf.values, y, spec.task


def test_eafe_full_run(benchmark, data, fpe, bench_cfg):
    X, y, task = data
    r = benchmark.pedantic(lambda: run_afe(X, y, task, fpe, bench_cfg), rounds=1, iterations=1)
    benchmark.extra_info["score"] = round(r.best_score, 4)
    benchmark.extra_info["n_evaluated"] = r.n_evaluated
    assert r.best_score >= r.base_score


def test_nfs_full_run(benchmark, data, bench_cfg):
    X, y, task = data
    r = benchmark.pedantic(lambda: run_nfs(X, y, task, bench_cfg), rounds=1, iterations=1)
    benchmark.extra_info["score"] = round(r.best_score, 4)
    benchmark.extra_info["n_evaluated"] = r.n_evaluated
    assert r.best_score >= r.base_score


def test_autofs_r_full_run(benchmark, data, bench_cfg):
    X, y, task = data
    r = benchmark.pedantic(lambda: run_autofs_r(X, y, task, bench_cfg), rounds=1, iterations=1)
    benchmark.extra_info["score"] = round(r.best_score, 4)
    assert r.best_score >= r.base_score


def test_eafe_at_least_2x_faster_than_nfs(benchmark, data, fpe, bench_cfg):
    """The headline claim (2x computational efficiency), at bench scale."""
    X, y, task = data

    def head_to_head():
        e = run_afe(X, y, task, fpe, bench_cfg)
        n = run_nfs(X, y, task, bench_cfg)
        return e, n

    e, n = benchmark.pedantic(head_to_head, rounds=1, iterations=1)
    benchmark.extra_info["eafe_time_s"] = round(e.total_time, 3)
    benchmark.extra_info["nfs_time_s"] = round(n.total_time, 3)
    benchmark.extra_info["speedup"] = round(n.total_time / e.total_time, 2)
    # At the shortened bench budget the fixed final re-evaluation cost
    # (identical for both methods) compresses the ratio; the full-scale
    # run (jobs/run_all.py, EXPERIMENTS.md) measures 2.7x. Require >1.8x
    # here so a real efficiency regression still fails the bench.
    assert e.total_time < n.total_time / 1.8
