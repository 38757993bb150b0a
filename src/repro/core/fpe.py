"""Feature Pre-Evaluation (FPE) model — paper §III-B, Algorithm 1.

Two modules: the MinHash **sample compressor** (``repro.hashing``) and
the **feature pre-selector**, a binary classifier pre-trained on a
corpus of datasets whose feature-effectiveness labels come from
leave-one-feature-out Random-Forest scoring (Eq. 3).

Label job (the expensive part of Algorithm 1 — n datasets x m features
RF cross-validations) fans out on Spark via ``applyInPandas`` grouped by
dataset. The hyperparameter search of Eq. 6 (hash family x signature
dimension d, maximizing validation recall s.t. Prec > 0 and Rec < 1)
runs driver-side on the labeled corpus — signatures are microseconds to
compute next to the RF fits.

Signature note (substitution, see DESIGN.md §3): Eq. 3's labels depend
on the *target*, so a classifier whose input is target-blind cannot
carry the labeling across datasets; we therefore compress the
(normalized feature value, normalized label) pair at the d hash-selected
rows — still exactly "the feature represented by respective values in d
samples", with the validness task's own target visible — and use a small
MLP as the binary classifier (the paper tunes its classifier with
auto-sklearn, i.e. the model family is free).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from ..hashing.minhash import VARIANTS, select_indices
from ..ml.forest import cross_val_score
from ..ml.metrics import precision_recall
from ..ml.mlp import MLP

__all__ = ["feature_signature", "label_corpus", "FPEModel"]

DEFAULT_D_OPTIONS = (16, 32, 48, 64)


def _minmax01(v: np.ndarray) -> np.ndarray:
    v = np.nan_to_num(np.asarray(v, dtype=np.float64), nan=0.0, posinf=0.0, neginf=0.0)
    lo, hi = v.min(), v.max()
    return (v - lo) / (hi - lo) if hi > lo else np.zeros_like(v)


def _safe_corr(a: np.ndarray, b: np.ndarray) -> float:
    if a.std() == 0 or b.std() == 0:
        return 0.0
    c = float(np.corrcoef(a, b)[0, 1])
    return c if np.isfinite(c) else 0.0


def feature_signature(
    x: np.ndarray,
    y: np.ndarray,
    task: str,
    d: int = 48,
    variant: str = "ccws",
    seed: int = 0,
    context: np.ndarray | None = None,
    exclude: int | None = None,
) -> np.ndarray:
    """Fixed-size (3d + 6,) signature of one feature under a task.

    MinHash selects d rows from the feature's weight profile; the
    signature is the normalized feature values and normalized labels at
    those rows (so any sample count M compresses to the same shape),
    plus six scalars that are deterministic functions of the same
    compressed rows: target alignment (value and rank correlation with
    the label) and *redundancy* — the maximum/mean absolute correlation
    with the dataset's existing columns at the selected rows. Redundancy
    matters because the downstream forest is invariant to monotone
    transforms: a candidate can align perfectly with the target yet add
    nothing if it is a reshaping of a column the forest already has,
    and without this block the pre-selector systematically keeps such
    features (observed failure; see DESIGN.md §3).
    """
    idx = select_indices(x, d, variant, seed)
    xn = _minmax01(x)
    yn = _minmax01(np.asarray(y, dtype=np.float64))
    xs_raw, ys_raw = xn[idx], yn[idx]
    # Canonicalize the arbitrary hash-slot order by sorting on the
    # feature value: a feature that relates to the target then shows a
    # stable trend in the label block, which a small classifier can
    # learn across datasets.
    order = np.argsort(xs_raw, kind="stable")
    xs, ys = xs_raw[order], ys_raw[order]
    c = _safe_corr(xs, ys)
    pos = np.linspace(0.0, 1.0, len(xs))
    cr = _safe_corr(pos, ys)  # rank alignment with the label
    red_max, red_mean = 0.0, 0.0
    if context is not None and context.shape[1] > (1 if exclude is not None else 0):
        rs = []
        for j in range(context.shape[1]):
            if j == exclude:
                continue
            rs.append(abs(_safe_corr(xs_raw, _minmax01(context[:, j])[idx])))
        if rs:
            red_max, red_mean = float(max(rs)), float(np.mean(rs))
    return np.concatenate(
        [xs, ys, xs * ys, [c, abs(c), cr, abs(cr), red_max, red_mean]]
    )


# ---------------------------------------------------------------------------
# Algorithm 1, lines 3–16: leave-one-feature-out labeling of the corpus.
# ---------------------------------------------------------------------------

_LABEL_SCHEMA = (
    "dataset string, task string, feature int, kind string, spec string, "
    "a0 double, aj double, gain double, label int"
)


def _random_spec(n_cols: int, max_order: int, rng: np.random.Generator):
    """A uniformly random transformation spec over ``n_cols`` columns —
    used to extend the labeling corpus with *generated* candidates, the
    distribution the pre-selector actually faces at deployment."""
    from .operators import ALL_OPS, BINARY_OPS
    from .transform import apply_op, leaf as _leaf

    spec = _leaf(int(rng.integers(0, n_cols)))
    order = int(rng.integers(1, max_order + 1))
    for _ in range(order):
        op = ALL_OPS[rng.integers(0, len(ALL_OPS))]
        if op in BINARY_OPS:
            spec = apply_op(op, spec, _leaf(int(rng.integers(0, n_cols))))
        else:
            spec = apply_op(op, spec)
    return spec


def _label_one_dataset(
    entry: dict, thre: float, cv_cfg: dict, n_generated: int = 25
) -> pd.DataFrame:
    """Labeling rows for one corpus dataset (runs on a worker).

    Two kinds of rows: Eq. 3's leave-one-feature-out labels for the
    original features ('orig': gain = A_0 - A_j), and add-one labels for
    randomly generated candidates ('gen': gain = A_+j - A_0) — both are
    'does this feature carry value the task would miss', which is what
    the pre-selector must answer about RL-generated candidates.
    """
    from .transform import FeatureSpec  # local to keep worker imports lean

    X = entry["X"].values.astype(np.float64)
    y = np.asarray(entry["y"])
    task = entry["task"]
    a0 = cross_val_score(X, y, task, **cv_cfg)
    rows = []
    for j in range(X.shape[1]):
        Xj = np.delete(X, j, axis=1)
        aj = cross_val_score(Xj, y, task, **cv_cfg)
        gain = a0 - aj  # how much the dataset loses without feature j
        rows.append(
            {
                "dataset": entry["name"],
                "task": task,
                "feature": j,
                "kind": "orig",
                "spec": f"f{j}",
                "a0": a0,
                "aj": aj,
                "gain": gain,
                "label": int(gain > thre),
            }
        )
    # zlib.crc32: python's hash() is salted per process, which would make
    # Spark workers and the driver label different generated specs.
    import zlib

    rng = np.random.default_rng(zlib.crc32(entry["name"].encode()))
    made = 0
    attempts = 0
    while made < n_generated and attempts < n_generated * 10:
        attempts += 1
        spec = _random_spec(X.shape[1], max_order=3, rng=rng)
        v = spec.to_numpy(X)
        if not np.all(np.isfinite(v)) or v.std() == 0.0:
            continue
        a_add = cross_val_score(np.c_[X, v], y, task, **cv_cfg)
        gain = a_add - a0  # how much the candidate adds
        rows.append(
            {
                "dataset": entry["name"],
                "task": task,
                "feature": X.shape[1] + made,
                "kind": "gen",
                "spec": spec.name,
                "a0": a0,
                "aj": a_add,
                "gain": gain,
                "label": int(gain > thre),
            }
        )
        made += 1
    return pd.DataFrame(rows)


def label_corpus(
    spark: SparkSession,
    corpus: list[dict],
    thre: float = 0.01,
    cv_cfg: dict | None = None,
) -> pd.DataFrame:
    """Eq. 3 labels for every (dataset, feature) pair, fanned out on Spark.

    Each Spark task labels one corpus dataset (1 + m RF CVs); the corpus
    rides the closure (it is a few MB of synthetic pandas frames).
    """
    cv_cfg = cv_cfg or {}
    by_name = {e["name"]: e for e in corpus}
    ids = spark.createDataFrame(
        pd.DataFrame({"dataset": list(by_name)})
    ).repartition(len(by_name), "dataset")

    def run(key, pdf):
        return _label_one_dataset(by_name[key[0]], thre, cv_cfg)

    out = ids.groupBy("dataset").applyInPandas(run, schema=_LABEL_SCHEMA)
    return out.toPandas().sort_values(["dataset", "feature"]).reset_index(drop=True)


# ---------------------------------------------------------------------------
# The trained FPE model (Eq. 4–6).
# ---------------------------------------------------------------------------


@dataclass
class FPEModel:
    """Sample compressor + feature pre-selector, after Algorithm 1.

    ``d_a_max``/``d_a_min`` are the extreme observed score gains from the
    labeling pass — the DeltaA_max/DeltaA_min of Eq. 8.
    """

    variant: str = "ccws"
    d: int = 48
    thre: float = 0.01
    seed: int = 0
    d_a_max: float = 0.1
    d_a_min: float = -0.1
    recall_: float = float("nan")
    precision_: float = float("nan")
    # Decision threshold calibrated on the corpus's *generated* rows so
    # that the deployed drop rate is ~the paper's ">0.5" (§III-D); raw
    # MLP probabilities are uncalibrated, so a fixed 0.5 would give an
    # arbitrary keep rate. predict_proba rescales through this pivot so
    # Eq. 7/8's p=0.5 boundary keeps its meaning.
    threshold_: float = 0.5
    _clf: MLP | None = field(default=None, repr=False)

    # -- training ------------------------------------------------------------

    @staticmethod
    def _signatures(
        corpus: list[dict], labels: pd.DataFrame, d: int, variant: str, seed: int
    ) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
        from .transform import parse_spec

        by_name = {e["name"]: e for e in corpus}
        sigs, ls, ds = [], [], []
        for _, r in labels.iterrows():
            e = by_name[r["dataset"]]
            X = e["X"].values.astype(np.float64)
            spec = parse_spec(r["spec"])
            x = spec.to_numpy(X)
            # Redundancy block: original features exclude themselves;
            # generated candidates compare against all originals.
            exclude = int(r["feature"]) if r["kind"] == "orig" else None
            sigs.append(
                feature_signature(
                    x, e["y"], e["task"], d, variant, seed,
                    context=X, exclude=exclude,
                )
            )
            ls.append(int(r["label"]))
            ds.append(r["dataset"])
        return np.stack(sigs), np.array(ls), np.array(ds)

    @classmethod
    def fit(
        cls,
        corpus: list[dict],
        labels: pd.DataFrame,
        *,
        variants: tuple[str, ...] = VARIANTS,
        d_options: tuple[int, ...] = DEFAULT_D_OPTIONS,
        thre: float = 0.01,
        val_fraction: float = 0.3,
        fixed_variant: str | None = None,
        seed: int = 0,
    ) -> "FPEModel":
        """Grid-search (variant, d) maximizing validation recall (Eq. 6).

        ``fixed_variant`` pins the hash family (the E-AFE^{L,P,I} table
        variants) and searches only d. Validation split is by *dataset*
        so recall measures cross-dataset generalization, as in the paper.
        """
        names = sorted({e["name"] for e in corpus})
        rng = np.random.default_rng(seed)
        n_val = max(1, int(len(names) * val_fraction))
        val_names = set(rng.choice(names, size=n_val, replace=False))
        search_variants = (fixed_variant,) if fixed_variant else variants
        best = None
        for variant in search_variants:
            for d in d_options:
                H, L, D = cls._signatures(corpus, labels, d, variant, seed)
                is_val = np.isin(D, list(val_names))
                if L[~is_val].sum() == 0 or L[is_val].sum() == 0:
                    continue
                clf = MLP(task="C", hidden=(32, 16), epochs=150, seed=seed)
                clf.fit(H[~is_val], L[~is_val])
                pred = clf.predict(H[is_val])
                prec, rec = precision_recall(L[is_val], pred)
                # Eq. 6 constraints: Prec > 0 rejects degenerate
                # all-positive output; Rec < 1 rejects trivial recall.
                if prec <= 0.0 or rec >= 1.0:
                    eligible = False
                else:
                    eligible = True
                key = (eligible, rec, prec)
                if best is None or key > best[0]:
                    best = (key, variant, d, prec, rec)
        if best is None:
            raise RuntimeError("FPE grid search found no trainable configuration")
        _, variant, d, prec, rec = best
        model = cls(
            variant=variant,
            d=d,
            thre=thre,
            seed=seed,
            d_a_max=float(labels["gain"].max()),
            d_a_min=float(labels["gain"].min()),
            recall_=rec,
            precision_=prec,
        )
        # Final classifier retrained on the full corpus.
        H, L, _ = cls._signatures(corpus, labels, d, variant, seed)
        model._clf = MLP(task="C", hidden=(32, 16), epochs=200, seed=seed)
        model._clf.fit(H, L)
        # Calibrate the operating point on the generated-candidate rows
        # (the deployment distribution): median raw probability -> a
        # drop rate of ~0.5 for random candidates; a policy that
        # proposes better-than-random candidates then clears it more
        # than half the time, matching the paper's drop-rate claim.
        gen_mask = (labels["kind"] == "gen").to_numpy()
        if gen_mask.any():
            raw = np.array([model._raw_proba(h) for h in H[gen_mask]])
            model.threshold_ = float(np.clip(np.median(raw), 0.05, 0.95))
        return model

    # -- inference -------------------------------------------------------------

    def _raw_proba(self, sig: np.ndarray) -> float:
        logits = self._clf._forward(
            (sig[None, :] - self._clf._mu) / self._clf._sd
        )[-1][0]
        z = logits - logits.max()
        p = np.exp(z)
        p /= p.sum()
        pos = int(np.argmax(self._clf.classes_ == 1))
        return float(p[pos])

    def predict_proba(
        self,
        x: np.ndarray,
        y: np.ndarray,
        task: str,
        context: np.ndarray | None = None,
    ) -> float:
        """Eq. 7: positive-class probability, rescaled so the calibrated
        operating point sits at 0.5 (piecewise-linear through
        ``threshold_``), keeping Eq. 8's pivot meaningful. ``context``
        is the current feature matrix, used for the redundancy block."""
        sig = feature_signature(
            x, y, task, self.d, self.variant, self.seed, context=context
        )
        raw = self._raw_proba(sig)
        t = self.threshold_
        if raw <= t:
            return 0.5 * raw / t if t > 0 else 0.0
        return 0.5 + 0.5 * (raw - t) / (1.0 - t) if t < 1 else 1.0

    def is_positive(
        self,
        x: np.ndarray,
        y: np.ndarray,
        task: str,
        context: np.ndarray | None = None,
    ) -> bool:
        return self.predict_proba(x, y, task, context) >= 0.5
