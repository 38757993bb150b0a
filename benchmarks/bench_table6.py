"""Benchmark for Table VI: the significance machinery.

The paired t-test (with the from-scratch incomplete-beta Student-t CDF)
runs over 36-dataset score vectors; the benchmark measures the full
table6 builder over a synthetic grid shaped like the real harness
output, and asserts the directional conclusions the paper reports.
"""
import numpy as np
import pandas as pd
import pytest

from repro.bench.tables import table6
from repro.stats import paired_t_test


@pytest.fixture(scope="module")
def grid_like():
    rng = np.random.default_rng(0)
    rows = []
    for i in range(36):
        ds = f"d{i}"
        base = rng.uniform(0.6, 0.9)
        rows += [
            {"dataset": ds, "method": "E-AFE", "score": base + 0.02 + rng.normal(0, 0.01), "time_s": 10.0},
            {"dataset": ds, "method": "NFS", "score": base + 0.015 + rng.normal(0, 0.01), "time_s": 25.0 + rng.normal(0, 2)},
            {"dataset": ds, "method": "FS_R", "score": base + rng.normal(0, 0.01), "time_s": 40.0 + rng.normal(0, 3)},
            {"dataset": ds, "method": "DL_N", "score": base - 0.15 + rng.normal(0, 0.05), "time_s": 2.0},
        ]
    return pd.DataFrame(rows)


def test_table6_builder(benchmark, grid_like):
    out = benchmark(table6, grid_like)
    assert set(out["baseline"]) == {"FS_R", "DL_N", "NFS"}
    by = out.set_index("baseline")
    # Paper's qualitative conclusions:
    assert by.loc["DL_N", "p_performance"] < 0.01  # DL is clearly worse
    assert by.loc["NFS", "p_performance"] > 0.01  # NFS gap is not dramatic
    assert by.loc["NFS", "p_time"] < 1e-4  # efficiency IS significant
    assert by.loc["FS_R", "p_time"] < 1e-4


def test_paired_t_test_speed(benchmark):
    rng = np.random.default_rng(1)
    a = rng.normal(size=36)
    b = a + 0.1 + rng.normal(scale=0.05, size=36)
    t, p = benchmark(paired_t_test, b, a)
    assert p < 1e-6
