"""Benchmark for Table V: re-scoring cached features with SVM / NB / MLP.

Measures the replacement-downstream evaluation used by Table V over a
feature matrix produced by an E-AFE run (classification) and a GP-scored
regression counterpart.
"""
import pytest

from repro.bench.datasets import by_name, load_dataset
from repro.bench.harness import replacement_scores
from repro.core.eafe import build_feature_matrix, run_afe


@pytest.fixture(scope="module")
def clf_matrix(fpe, bench_cfg):
    spec = by_name("diabetes")
    X_pdf, y = load_dataset(spec)
    r = run_afe(X_pdf.values, y, spec.task, fpe, bench_cfg)
    return build_feature_matrix(X_pdf.values, r), y


@pytest.fixture(scope="module")
def reg_matrix(fpe, bench_cfg):
    spec = by_name("Airfoil")
    X_pdf, y = load_dataset(spec)
    r = run_afe(X_pdf.values, y, spec.task, fpe, bench_cfg)
    return build_feature_matrix(X_pdf.values, r), y


def test_replacement_models_classification(benchmark, clf_matrix):
    M, y = clf_matrix
    out = benchmark.pedantic(
        lambda: replacement_scores(M, y, "C"), rounds=1, iterations=1
    )
    benchmark.extra_info.update({k: round(v, 4) for k, v in out.items()})
    assert set(out) == {"svm", "nbgp", "mlp"}


def test_replacement_models_regression(benchmark, reg_matrix):
    M, y = reg_matrix
    out = benchmark.pedantic(
        lambda: replacement_scores(M, y, "R"), rounds=1, iterations=1
    )
    benchmark.extra_info.update({k: round(v, 4) for k, v in out.items()})
    assert set(out) == {"svm", "nbgp", "mlp"}
