"""Shared fixtures for the table benchmarks.

The FPE model is trained once per benchmark session (it is reused across
target datasets in deployment, exactly as the paper argues in §III-D).
"""
import pytest

from repro.core.eafe import AFEConfig
from repro.core.fpe import FPEModel, label_corpus
from repro.synth_data import fpe_corpus


@pytest.fixture(scope="session")
def fpe(spark):
    corpus = fpe_corpus(8, seed=1000)
    labels = label_corpus(spark, corpus, thre=0.01, cv_cfg={"k": 3, "n_trees": 6})
    return FPEModel.fit(corpus, labels, fixed_variant="ccws", d_options=(48,), seed=0)


@pytest.fixture(scope="session")
def bench_cfg():
    """Benchmark-scale engine config: one quarter of the job-scale epochs
    so a full bench pass stays in tens of seconds per method."""
    return AFEConfig(
        epochs_stage1=1,
        epochs_stage2=5,
        steps_per_agent=4,
        max_agents=8,
        cv_k=3,
        cv_trees=6,
        seed=0,
    )
