"""Benchmark for Table I: one NFS epoch — evaluation dominates.

The measured claim: >80% of an NFS epoch is downstream feature
evaluation and generation is negligible (the paper reports ~90% and
~0.1% respectively at its scale).
"""
import pytest

from repro.baselines.nfs import run_nfs
from repro.bench.datasets import TABLE1_DATASETS, by_name, load_dataset
from repro.core.eafe import AFEConfig


@pytest.mark.parametrize("name", TABLE1_DATASETS)
def test_nfs_one_epoch_timing(benchmark, name):
    spec = by_name(name)
    X_pdf, y = load_dataset(spec)
    X = X_pdf.values
    cfg = AFEConfig(epochs_stage1=0, epochs_stage2=1, seed=0)

    result = benchmark.pedantic(
        lambda: run_nfs(X, y, spec.task, cfg), rounds=1, iterations=1
    )
    benchmark.extra_info["n_generated"] = result.n_generated
    benchmark.extra_info["gen_time_s"] = round(result.gen_time, 4)
    benchmark.extra_info["eval_time_s"] = round(result.eval_time, 4)
    benchmark.extra_info["eval_share"] = round(
        result.eval_time / result.total_time, 4
    )
    assert result.eval_time / result.total_time > 0.8
    assert result.gen_time < 0.05 * result.total_time
