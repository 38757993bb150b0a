"""Synthetic OLAP data at a configurable scale factor.

SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
benchmarks use SF~=0.1. Generators are deterministic in ``seed`` so the
DuckDB oracle sees identical input.
"""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

_N_LINEITEM_PER_SF = 6_000_000
_N_ORDERS_PER_SF = 1_500_000
_N_CUSTOMER_PER_SF = 150_000
_N_PART_PER_SF = 200_000


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def lineitem(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> DataFrame:
    n = max(1, int(_N_LINEITEM_PER_SF * sf))
    n_orders = max(1, int(_N_ORDERS_PER_SF * sf))
    n_part = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "l_orderkey": g.integers(1, n_orders + 1, n),
            "l_partkey": g.integers(1, n_part + 1, n),
            "l_linenumber": g.integers(1, 8, n),
            "l_quantity": g.integers(1, 51, n).astype("float64"),
            "l_extendedprice": (g.random(n) * 90000 + 900).round(2),
            "l_discount": (g.random(n) * 0.1).round(2),
            "l_tax": (g.random(n) * 0.08).round(2),
            "l_returnflag": g.choice(list("NRA"), n),
            "l_linestatus": g.choice(list("OF"), n),
            "l_shipdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2557, n), unit="D"),
        }
    )
    return spark.createDataFrame(pdf)


def orders(spark: SparkSession, *, sf: float = 0.01, seed: int = 1) -> DataFrame:
    n = max(1, int(_N_ORDERS_PER_SF * sf))
    n_cust = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "o_orderkey": np.arange(1, n + 1),
            "o_custkey": g.integers(1, n_cust + 1, n),
            "o_orderstatus": g.choice(list("OFP"), n),
            "o_totalprice": (g.random(n) * 500000 + 1000).round(2),
            "o_orderdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2406, n), unit="D"),
            "o_orderpriority": g.choice(
                ["1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT", "5-LOW"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def part(spark: SparkSession, *, sf: float = 0.01, seed: int = 5) -> DataFrame:
    n = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "p_partkey": np.arange(1, n + 1),
            "p_type": g.choice(
                ["STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO"], n
            ),
            "p_brand": g.choice([f"Brand#{i}{j}" for i in range(1, 6) for j in range(1, 6)], n),
            "p_size": g.integers(1, 51, n),
            "p_retailprice": (900 + (np.arange(1, n + 1) % 1000) / 10.0).round(2),
        }
    )
    return spark.createDataFrame(pdf)


def customer(spark: SparkSession, *, sf: float = 0.01, seed: int = 2) -> DataFrame:
    n = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "c_custkey": np.arange(1, n + 1),
            "c_nationkey": g.integers(0, 25, n),
            "c_acctbal": (g.random(n) * 10000 - 1000).round(2),
            "c_mktsegment": g.choice(
                ["BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def zipf_keys(spark: SparkSession, *, n: int, n_keys: int, alpha: float = 1.1, seed: int = 3) -> DataFrame:
    """Skewed key column — for join-skew / cardinality-estimation papers."""
    g = _rng(seed)
    ranks = np.arange(1, n_keys + 1)
    weights = 1.0 / ranks**alpha
    weights /= weights.sum()
    keys = g.choice(ranks, size=n, p=weights)
    return spark.createDataFrame(pd.DataFrame({"k": keys, "v": g.random(n)}))


def uniform_keys(spark: SparkSession, *, n: int, n_keys: int, seed: int = 4) -> DataFrame:
    g = _rng(seed)
    return spark.createDataFrame(
        pd.DataFrame({"k": g.integers(1, n_keys + 1, n), "v": g.random(n)})
    )


# --------------------------------------------------------------------------
# E-AFE reproduction: synthetic tabular datasets with planted interactions.
#
# The paper evaluates on 36 OpenML/UCI datasets and pre-trains FPE on 239
# public datasets; the box is offline, so we substitute a generator family
# whose targets depend on *compositions of the paper's own operator set*
# (products, ratios, logs, ... of raw columns). Feature generation can
# therefore genuinely raise downstream scores, which is the mechanism all
# the paper's tables measure. See DESIGN.md §3.
# --------------------------------------------------------------------------

_INTERACTIONS = (
    lambda a, b: a * b,
    lambda a, b: np.where(b != 0, np.divide(a, b, where=b != 0), 0.0),
    lambda a, b: np.log(np.abs(a) + 1.0) * b,
    lambda a, b: np.sqrt(np.abs(a)) - b,
    lambda a, b: a + b * b,
    lambda a, b: np.where(b != 0, np.fmod(a, np.where(b != 0, b, 1.0)), 0.0),
)


def _latent_score(Xz: np.ndarray, n_informative: int, g: np.random.Generator) -> np.ndarray:
    """Nonlinear latent score built from pairwise interactions of the
    first ``n_informative`` columns, reachable by the 9 AFE operators."""
    n_terms = max(2, n_informative - 1)
    s = np.zeros(len(Xz))
    for t in range(n_terms):
        i, j = g.choice(n_informative, size=2, replace=True)
        fn = _INTERACTIONS[g.integers(0, len(_INTERACTIONS))]
        w = g.normal(loc=0.0, scale=1.0)
        term = fn(Xz[:, i], Xz[:, j])
        sd = term.std()
        if sd > 0:
            s += w * (term - term.mean()) / sd
    return s


def make_tabular(
    *,
    task: str,
    n_samples: int,
    n_features: int,
    n_informative: int | None = None,
    n_classes: int = 2,
    noise: float = 0.1,
    seed: int = 0,
) -> tuple[pd.DataFrame, np.ndarray]:
    """Synthetic tabular dataset whose target needs engineered features.

    Returns (X as pandas with columns f0..f{N-1}, y as numpy). Columns
    beyond ``n_informative`` are pure distractors. ``task`` is 'C'
    (labels = quantile bins of the latent score, balanced) or 'R'
    (y = latent score + gaussian noise).
    """
    if task not in ("C", "R"):
        raise ValueError("task must be 'C' or 'R'")
    g = _rng(seed)
    if n_informative is None:
        n_informative = max(2, min(6, n_features // 2))
    n_informative = min(n_informative, n_features)
    X = g.normal(size=(n_samples, n_features))
    # Give columns heterogeneous scales/offsets so min-max/log matter.
    scales = g.uniform(0.5, 3.0, n_features)
    offsets = g.uniform(-1.0, 1.0, n_features)
    X = X * scales + offsets
    s = _latent_score(X, n_informative, g)
    s = s + noise * (s.std() or 1.0) * g.normal(size=n_samples)
    if task == "C":
        qs = np.quantile(s, np.linspace(0, 1, n_classes + 1)[1:-1])
        y = np.digitize(s, qs).astype(np.int64)
    else:
        y = s.astype(np.float64)
    pdf = pd.DataFrame(X, columns=[f"f{i}" for i in range(n_features)])
    return pdf, y


def tabular_spark(
    spark: SparkSession,
    *,
    task: str,
    n_samples: int,
    n_features: int,
    seed: int = 0,
    **kw,
) -> DataFrame:
    """Spark rendering of :func:`make_tabular` with the label as 'label'."""
    pdf, y = make_tabular(
        task=task, n_samples=n_samples, n_features=n_features, seed=seed, **kw
    )
    pdf = pdf.copy()
    pdf["label"] = y
    return spark.createDataFrame(pdf)


def fpe_corpus(n_datasets: int = 24, seed: int = 1000) -> list[dict]:
    """The 'public datasets' substitute used to pre-train the FPE model.

    Mix of classification and regression datasets at varied shapes, all
    with seeds disjoint from the target roster (which uses seeds < 1000).
    Each entry: {name, task, X (pandas), y (numpy)}.
    """
    g = _rng(seed)
    out = []
    for i in range(n_datasets):
        # Even task mix: the pre-selector must generalize to both the
        # F1-scored and the 1-rae-scored labeling distributions.
        task = "C" if i % 2 == 0 else "R"
        n = int(g.integers(150, 700))
        f = int(g.integers(6, 18))
        pdf, y = make_tabular(
            task=task,
            n_samples=n,
            n_features=f,
            n_informative=int(g.integers(2, max(3, f // 2))),
            noise=float(g.uniform(0.05, 0.3)),
            seed=seed + i + 1,
        )
        out.append({"name": f"corpus_{i}", "task": task, "X": pdf, "y": y})
    return out
