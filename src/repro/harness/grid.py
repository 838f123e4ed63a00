"""Spark-parallel experiment grid for the paper's evaluation section.

The unit of work is one *fold task*: ``(dataset, noise_ratio, rep,
fold)``. Inside a task the dataset is materialised deterministically,
the stratified fold split applied, every sampling method run on the
training fold (GBABS first — SRS reuses its sampling ratio, matching the
paper's protocol), every classifier trained on each sampled set, and one
metric row emitted per (method, classifier).

``run_grid`` fans the task table out with ``groupBy().applyInPandas`` so
the ~400-task evaluation saturates the local cluster; each task is
seeded from its key, so results are reproducible regardless of
scheduling. ``run_fold_task`` is the plain-Python core, unit-testable
without Spark.
"""
from __future__ import annotations

import itertools
import zlib

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from ..baselines.ggbs import ggbs, igbs
from ..baselines.simple import srs
from ..baselines.smote import borderline_smote, smote, smotenc
from ..baselines.tomek import tomek
from ..classifiers import accuracy, g_mean, make_classifier
from ..core.gbabs import gbabs_sample
from ..datasets.registry import REGISTRY, load_dataset
from ..stats.crossval import stratified_kfold

__all__ = [
    "DEFAULT_METHODS",
    "ALL_METHODS",
    "RESULT_SCHEMA",
    "run_fold_task",
    "build_task_grid",
    "run_grid",
]

DEFAULT_METHODS = ["GBABS", "GGBS", "SRS", "none"]
# Extended roster for the imbalanced comparison (paper Fig. 9 family).
ALL_METHODS = DEFAULT_METHODS + ["IGBS", "SM", "BSM", "SMNC", "Tomek"]

RESULT_SCHEMA = (
    "dataset string, noise double, rep long, fold long, method string, "
    "classifier string, accuracy double, g_mean double, "
    "sampling_ratio double, n_train long, n_sampled long"
)
RESULT_COLUMNS = [f.split()[0] for f in RESULT_SCHEMA.split(", ")]


def _task_seed(dataset: str, noise: float, rep: int, fold: int) -> int:
    key = f"{dataset}|{noise:.3f}|{rep}|{fold}".encode()
    return zlib.crc32(key) & 0x7FFFFFFF


def _apply_method(
    method: str,
    X: np.ndarray,
    y: np.ndarray,
    *,
    cat_dims: tuple[int, ...],
    rho: int,
    gbabs_ratio: float | None,
    seed: int,
) -> tuple[np.ndarray, np.ndarray]:
    """Dispatch one sampling method; returns the sampled training set."""
    if method == "GBABS":
        idx, _ = gbabs_sample(X, y, rho=rho, seed=seed)
        return X[idx], y[idx]
    if method == "GGBS":
        return ggbs(X, y, purity_threshold=1.0, seed=seed)
    if method == "IGBS":
        return igbs(X, y, purity_threshold=1.0, seed=seed)
    if method == "SRS":
        if gbabs_ratio is None:
            raise ValueError("SRS requires the GBABS ratio — run GBABS first")
        return srs(X, y, ratio=gbabs_ratio, seed=seed)
    if method == "none":
        return X, y
    if method == "SM":
        return smote(X, y, seed=seed)
    if method == "BSM":
        return borderline_smote(X, y, seed=seed)
    if method == "SMNC":
        return smotenc(X, y, cat_dims, seed=seed)
    if method == "Tomek":
        return tomek(X, y)
    raise ValueError(f"unknown sampling method {method!r}")


def run_fold_task(
    dataset: str,
    noise: float,
    rep: int,
    fold: int,
    *,
    methods: list[str] | None = None,
    classifiers: list[str] | None = None,
    n_splits: int = 5,
    rho: int = 5,
) -> pd.DataFrame:
    """Run one fold task and return its metric rows (plain Python core)."""
    from ..classifiers import CLASSIFIER_NAMES

    methods = list(methods or DEFAULT_METHODS)
    classifiers = list(classifiers or CLASSIFIER_NAMES)
    X, y, spec = load_dataset(dataset, noise_ratio=noise, noise_seed=rep)
    folds = stratified_kfold(y, n_splits=n_splits, seed=rep)
    tr_idx, te_idx = folds[fold]
    X_tr, y_tr = X[tr_idx], y[tr_idx]
    X_te, y_te = X[te_idx], y[te_idx]
    seed = _task_seed(dataset, noise, rep, fold)

    # GBABS always runs first so its ratio is available to SRS.
    ordered = sorted(methods, key=lambda m: m != "GBABS")
    gbabs_ratio: float | None = None
    rows = []
    for method in ordered:
        X_s, y_s = _apply_method(
            method,
            X_tr,
            y_tr,
            cat_dims=spec.cat_dims,
            rho=rho,
            gbabs_ratio=gbabs_ratio,
            seed=seed,
        )
        ratio = len(X_s) / len(X_tr)
        if method == "GBABS":
            gbabs_ratio = ratio
        for clf_name in classifiers:
            clf = make_classifier(clf_name, seed=seed)
            clf.fit(X_s, y_s)
            pred = clf.predict(X_te)
            rows.append(
                {
                    "dataset": dataset,
                    "noise": noise,
                    "rep": rep,
                    "fold": fold,
                    "method": method,
                    "classifier": clf_name,
                    "accuracy": accuracy(y_te, pred),
                    "g_mean": g_mean(y_te, pred),
                    "sampling_ratio": ratio,
                    "n_train": len(X_tr),
                    "n_sampled": len(X_s),
                }
            )
    return pd.DataFrame(rows, columns=RESULT_COLUMNS)


def build_task_grid(
    *,
    datasets: list[str] | None = None,
    noises: list[float] | None = None,
    reps: int = 1,
    n_splits: int = 5,
) -> pd.DataFrame:
    """The task table: one row per (dataset, noise, rep, fold)."""
    datasets = datasets or list(REGISTRY)
    noises = noises if noises is not None else [0.0]
    rows = [
        {"dataset": d, "noise": nz, "rep": r, "fold": f}
        for d, nz, r, f in itertools.product(
            datasets, noises, range(reps), range(n_splits)
        )
    ]
    return pd.DataFrame(rows)


def run_grid(
    spark: SparkSession,
    *,
    datasets: list[str] | None = None,
    noises: list[float] | None = None,
    methods: list[str] | None = None,
    classifiers: list[str] | None = None,
    reps: int = 1,
    n_splits: int = 5,
    rho: int = 5,
) -> DataFrame:
    """Fan the task grid out over the cluster; returns the metric rows."""
    grid = build_task_grid(
        datasets=datasets, noises=noises, reps=reps, n_splits=n_splits
    )
    tasks = spark.createDataFrame(grid).repartition(len(grid), "dataset", "noise", "rep", "fold")
    m, c = methods, classifiers

    def run_one(key, pdf):
        dataset, noise, rep, fold = key
        return run_fold_task(
            str(dataset),
            float(noise),
            int(rep),
            int(fold),
            methods=m,
            classifiers=c,
            n_splits=n_splits,
            rho=rho,
        )

    return tasks.groupBy("dataset", "noise", "rep", "fold").applyInPandas(
        run_one, schema=RESULT_SCHEMA
    )
