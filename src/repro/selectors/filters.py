"""Filter-model feature scores: F-test, mutual information, Pearson.

Each score has two implementations with identical semantics:

* a vectorized numpy path used on coreset-sized matrices inside the
  selection loops, and
* a distributed Spark path (`*_spark`) expressed as DataFrame
  aggregations — per-feature sufficient statistics via one wide agg
  (F-test / Pearson) or a melt + groupBy contingency count followed by a
  per-feature ``applyInPandas`` reduction (mutual information). The Spark
  paths exist so the scores can be computed over the *full* joined table
  without collecting it; tests assert both paths agree.

For regression targets the F statistic is the univariate regression
F = (n-2) r^2 / (1 - r^2); for classification it is the one-way ANOVA F.
MI discretizes numeric columns into quantile bins.
"""
from __future__ import annotations

import numpy as np

from repro.selectors.base import register_ranker

__all__ = ["f_scores", "mutual_info_scores", "pearson_scores",
           "f_scores_spark", "mutual_info_spark"]

_MI_BINS = 12


# --------------------------------------------------------------- numpy paths
def pearson_scores(X: np.ndarray, y: np.ndarray) -> np.ndarray:
    X = np.asarray(X, dtype=float)
    y = np.asarray(y, dtype=float)
    Xc = X - X.mean(axis=0)
    yc = y - y.mean()
    denom = np.sqrt((Xc**2).sum(axis=0) * (yc**2).sum())
    with np.errstate(divide="ignore", invalid="ignore"):
        r = (Xc * yc[:, None]).sum(axis=0) / denom
    return np.abs(np.nan_to_num(r))


def f_scores(X: np.ndarray, y: np.ndarray, task: str) -> np.ndarray:
    X = np.asarray(X, dtype=float)
    n = X.shape[0]
    if task == "reg":
        r = pearson_scores(X, y)
        r2 = np.minimum(r**2, 1 - 1e-12)
        return (n - 2) * r2 / (1 - r2)
    classes, y_enc = np.unique(y, return_inverse=True)
    k = len(classes)
    if k < 2 or n <= k:
        return np.zeros(X.shape[1])
    grand = X.mean(axis=0)
    ss_between = np.zeros(X.shape[1])
    ss_within = np.zeros(X.shape[1])
    for c in range(k):
        Xi = X[y_enc == c]
        mi = Xi.mean(axis=0)
        ss_between += len(Xi) * (mi - grand) ** 2
        ss_within += ((Xi - mi) ** 2).sum(axis=0)
    with np.errstate(divide="ignore", invalid="ignore"):
        F = (ss_between / (k - 1)) / (ss_within / (n - k))
    return np.nan_to_num(F, nan=0.0, posinf=np.finfo(float).max / 2)


def _quantile_bin(v: np.ndarray, bins: int) -> np.ndarray:
    edges = np.quantile(v, np.linspace(0, 1, bins + 1)[1:-1])
    return np.searchsorted(edges, v, side="left")


def _mi_from_joint(joint: np.ndarray) -> float:
    n = joint.sum()
    if n == 0:
        return 0.0
    p = joint / n
    px = p.sum(axis=1, keepdims=True)
    py = p.sum(axis=0, keepdims=True)
    with np.errstate(divide="ignore", invalid="ignore"):
        t = p * np.log(p / (px * py))
    return float(np.nansum(t))


def mutual_info_scores(X: np.ndarray, y: np.ndarray, task: str,
                       bins: int = _MI_BINS) -> np.ndarray:
    X = np.asarray(X, dtype=float)
    if task == "reg":
        yb = _quantile_bin(np.asarray(y, dtype=float), bins)
    else:
        _, yb = np.unique(y, return_inverse=True)
    ny = int(yb.max()) + 1
    out = np.zeros(X.shape[1])
    for j in range(X.shape[1]):
        xb = _quantile_bin(X[:, j], bins)
        nx = int(xb.max()) + 1
        joint = np.bincount(xb * ny + yb, minlength=nx * ny).reshape(nx, ny)
        out[j] = _mi_from_joint(joint)
    return out


# --------------------------------------------------------------- spark paths
def f_scores_spark(df, feature_cols: list[str], label_col: str, task: str) -> np.ndarray:
    """F scores from per-feature sufficient statistics computed by Catalyst.

    One aggregation pass collects n, sum(x), sum(x^2) (per class for
    classification; plus sum(x*y), sum(y), sum(y^2) for regression) —
    no data is collected to the driver beyond the statistics row(s).
    """
    from pyspark.sql import functions as F

    if task == "reg":
        aggs = [F.count(F.lit(1)).alias("__n"),
                F.sum(F.col(label_col)).alias("__sy"),
                F.sum(F.col(label_col) ** 2).alias("__syy")]
        for i, c in enumerate(feature_cols):
            x = F.col(c).cast("double")
            aggs += [F.sum(x).alias(f"sx_{i}"), F.sum(x * x).alias(f"sxx_{i}"),
                     F.sum(x * F.col(label_col)).alias(f"sxy_{i}")]
        row = df.agg(*aggs).collect()[0]
        n, sy, syy = row["__n"], row["__sy"], row["__syy"]
        out = np.zeros(len(feature_cols))
        vy = syy - sy * sy / n
        for i in range(len(feature_cols)):
            sx, sxx, sxy = row[f"sx_{i}"], row[f"sxx_{i}"], row[f"sxy_{i}"]
            vx = sxx - sx * sx / n
            cov = sxy - sx * sy / n
            r2 = 0.0 if vx <= 0 or vy <= 0 else min(cov * cov / (vx * vy), 1 - 1e-12)
            out[i] = (n - 2) * r2 / (1 - r2)
        return out
    aggs = [F.count(F.lit(1)).alias("__n")]
    for i, c in enumerate(feature_cols):
        x = F.col(c).cast("double")
        aggs += [F.sum(x).alias(f"sx_{i}"), F.sum(x * x).alias(f"sxx_{i}")]
    per_class = df.groupBy(label_col).agg(*aggs).collect()
    k = len(per_class)
    n = sum(r["__n"] for r in per_class)
    out = np.zeros(len(feature_cols))
    if k < 2 or n <= k:
        return out
    for i in range(len(feature_cols)):
        tot_s = sum(r[f"sx_{i}"] for r in per_class)
        grand = tot_s / n
        ssb = sum(r["__n"] * (r[f"sx_{i}"] / r["__n"] - grand) ** 2 for r in per_class)
        ssw = sum(r[f"sxx_{i}"] - r[f"sx_{i}"] ** 2 / r["__n"] for r in per_class)
        out[i] = 0.0 if ssw <= 0 else (ssb / (k - 1)) / (ssw / (n - k))
    return out


def mutual_info_spark(df, feature_cols: list[str], label_col: str, task: str,
                      bins: int = _MI_BINS) -> np.ndarray:
    """Distributed MI: quantile-bin every column with ``approxQuantile``
    fused into a melt (stack) -> groupBy(feature, xbin, ybin).count()
    contingency table, then a per-feature applyInPandas MI reduction."""
    import pandas as pd
    from pyspark.sql import functions as F

    probs = list(np.linspace(0, 1, bins + 1)[1:-1])
    label_edges = (df.approxQuantile(label_col, probs, 0.001)
                   if task == "reg" else None)
    feat_edges = dict(zip(feature_cols,
                          df.approxQuantile(feature_cols, probs, 0.001)))

    def bin_expr(col, edges):
        e = F.array(*[F.lit(float(v)) for v in edges])
        # searchsorted(left): count of edges strictly below the value
        return F.aggregate(e, F.lit(0),
                           lambda acc, x: acc + F.when(F.col(col) > x, 1).otherwise(0))

    ycol = (bin_expr(label_col, label_edges) if task == "reg"
            else F.col(label_col).cast("string"))
    stacked = df.select(
        ycol.alias("__ybin"),
        F.explode(F.array(*[
            F.struct(F.lit(c).alias("feature"), bin_expr(c, feat_edges[c]).alias("xbin"))
            for c in feature_cols])).alias("fx"))
    cont = (stacked.select("__ybin", "fx.feature", "fx.xbin")
            .groupBy("feature", "xbin", "__ybin").count())

    def mi_of(pdf: pd.DataFrame) -> pd.DataFrame:
        piv = pdf.pivot_table(index="xbin", columns="__ybin", values="count",
                              aggfunc="sum", fill_value=0).to_numpy(dtype=float)
        return pd.DataFrame({"feature": [pdf["feature"].iloc[0]],
                             "mi": [_mi_from_joint(piv)]})

    rows = (cont.groupBy("feature")
            .applyInPandas(mi_of, schema="feature string, mi double").collect())
    got = {r["feature"]: r["mi"] for r in rows}
    return np.array([got.get(c, 0.0) for c in feature_cols])


# ----------------------------------------------------------------- registry
@register_ranker("f_test")
def _f_test_ranker(X, y, task, seed=0):
    return f_scores(X, y, task)


@register_ranker("mutual_info")
def _mi_ranker(X, y, task, seed=0):
    return mutual_info_scores(X, y, task)


@register_ranker("pearson")
def _pearson_ranker(X, y, task, seed=0):
    return pearson_scores(X, np.unique(y, return_inverse=True)[1] if task == "cls" else y)
