"""Spark-parallel Monte-Carlo trial harness.

The paper runs every condition 1,000 times. A single trial is a cheap
numpy kernel (core.sampler / core.groupby); the fleet of trials is
embarrassingly parallel, so we distribute it with ``mapInPandas`` over
a DataFrame of trial seeds: the per-stratum arrays are broadcast once,
each executor core runs its share of seeds, and only (trial, estimate,
ci) rows come back. This is the distributed_dataflow shape of the
reproduction — dataset-scan work (stratification) happens in Catalyst,
trial replication happens across the cluster.

``run_trials`` / ``run_group_trials`` fall back to a local loop when
``spark`` is None (unit tests that don't need the cluster).
"""
from __future__ import annotations

from collections.abc import Iterator
from typing import Any

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.core.bootstrap import bootstrap_ci
from repro.core.groupby import (
    GroupByData,
    groupby_multi_trial,
    groupby_single_trial,
    groupby_uniform_trial,
)
from repro.core.sampler import abae_trial, uniform_trial

SCALAR_KINDS = ("abae", "abae_noreuse", "uniform")
GROUP_KINDS = ("groupby_single", "groupby_multi", "uniform_single", "uniform_multi")


def _scalar_trial(kind: str, data: Any, n_budget: int, rng, stage1_frac: float):
    if kind == "abae":
        return abae_trial(data, n_budget, rng, stage1_frac=stage1_frac, reuse=True)
    if kind == "abae_noreuse":
        return abae_trial(data, n_budget, rng, stage1_frac=stage1_frac, reuse=False)
    if kind == "uniform":
        values, labels = data
        return uniform_trial(values, labels, n_budget, rng)
    raise ValueError(f"unknown scalar trial kind: {kind}")


def run_trials(
    spark: SparkSession | None,
    *,
    kind: str,
    data: Any,
    n_budget: int,
    n_trials: int,
    base_seed: int = 0,
    stage1_frac: float = 0.5,
    with_ci: bool = False,
    n_boot: int = 1000,
    alpha: float = 0.05,
) -> pd.DataFrame:
    """Run ``n_trials`` independent trials of a scalar-estimate method.

    Args:
        spark: session for distributed execution, or None for local.
        kind: "abae" | "abae_noreuse" | "uniform".
        data: per-stratum arrays for ABAE kinds, (values, labels) for
            uniform.
        n_budget: oracle budget per trial.
        n_trials: number of Monte-Carlo repetitions.
        base_seed: trial i uses seed ``base_seed + i``.
        with_ci: also compute a bootstrap CI per trial (Algorithm 2).

    Returns:
        DataFrame with columns trial, estimate, lo, hi, calls.
    """
    if kind not in SCALAR_KINDS:
        raise ValueError(f"kind must be one of {SCALAR_KINDS}, got {kind!r}")

    def one(seed: int) -> tuple[int, float, float, float, int]:
        rng = np.random.default_rng(seed)
        res = _scalar_trial(kind, data, n_budget, rng, stage1_frac)
        lo = hi = float("nan")
        if with_ci:
            lo, hi = bootstrap_ci(res.samples, rng, n_boot=n_boot, alpha=alpha)
        return seed - base_seed, res.estimate, lo, hi, res.oracle_calls

    cols = ["trial", "estimate", "lo", "hi", "calls"]
    if spark is None:
        rows = [one(base_seed + i) for i in range(n_trials)]
        return pd.DataFrame(rows, columns=cols)

    bc = spark.sparkContext.broadcast(data)

    def worker(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        payload = bc.value
        for batch in batches:
            rows = []
            for seed in batch["id"]:
                rng = np.random.default_rng(int(seed))
                res = _scalar_trial(kind, payload, n_budget, rng, stage1_frac)
                lo = hi = float("nan")
                if with_ci:
                    lo, hi = bootstrap_ci(res.samples, rng, n_boot=n_boot, alpha=alpha)
                rows.append(
                    (int(seed) - base_seed, res.estimate, lo, hi, res.oracle_calls)
                )
            yield pd.DataFrame(rows, columns=cols)

    n_part = min(n_trials, max(2, spark.sparkContext.defaultParallelism))
    seeds = spark.range(base_seed, base_seed + n_trials).repartition(n_part)
    out = seeds.mapInPandas(
        worker, schema="trial long, estimate double, lo double, hi double, calls long"
    ).toPandas()
    bc.unpersist()
    return out.sort_values("trial").reset_index(drop=True)


def run_group_trials(
    spark: SparkSession | None,
    *,
    kind: str,
    data: Any,
    n_budget: int,
    n_trials: int,
    n_groups: int,
    base_seed: int = 0,
    stage1_frac: float = 0.5,
) -> pd.DataFrame:
    """Run group-by trials; returns one row per (trial, group).

    Args:
        kind: "groupby_single" | "groupby_multi" (ABAE-GroupBy) or
            "uniform_single" | "uniform_multi" (baseline).
        data: :class:`GroupByData` for ABAE kinds, (values, groups)
            arrays for the uniform kinds.
        n_budget: total oracle budget per trial (already multiplied by
            the number of groups — the figures normalize by G).
    """
    if kind not in GROUP_KINDS:
        raise ValueError(f"kind must be one of {GROUP_KINDS}, got {kind!r}")

    def one(seed: int) -> list[tuple[int, int, float, int]]:
        rng = np.random.default_rng(seed)
        if kind == "groupby_single":
            res = groupby_single_trial(data, n_budget, rng, stage1_frac=stage1_frac)
        elif kind == "groupby_multi":
            res = groupby_multi_trial(data, n_budget, rng, stage1_frac=stage1_frac)
        else:
            values, groups = data
            res = groupby_uniform_trial(
                values, groups, n_budget, rng, n_groups,
                per_group_oracle=(kind == "uniform_multi"),
            )
        t = seed - base_seed
        return [
            (t, g, float(res.estimates[g]), res.oracle_calls) for g in range(n_groups)
        ]

    cols = ["trial", "group", "estimate", "calls"]
    if spark is None:
        rows = [r for i in range(n_trials) for r in one(base_seed + i)]
        return pd.DataFrame(rows, columns=cols)

    bc = spark.sparkContext.broadcast(data)

    def worker(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        payload = bc.value
        for batch in batches:
            rows = []
            for seed in batch["id"]:
                rng = np.random.default_rng(int(seed))
                if kind == "groupby_single":
                    res = groupby_single_trial(
                        payload, n_budget, rng, stage1_frac=stage1_frac
                    )
                elif kind == "groupby_multi":
                    res = groupby_multi_trial(
                        payload, n_budget, rng, stage1_frac=stage1_frac
                    )
                else:
                    values, groups = payload
                    res = groupby_uniform_trial(
                        values, groups, n_budget, rng, n_groups,
                        per_group_oracle=(kind == "uniform_multi"),
                    )
                t = int(seed) - base_seed
                rows.extend(
                    (t, g, float(res.estimates[g]), res.oracle_calls)
                    for g in range(n_groups)
                )
            yield pd.DataFrame(rows, columns=cols)

    n_part = min(n_trials, max(2, spark.sparkContext.defaultParallelism))
    seeds = spark.range(base_seed, base_seed + n_trials).repartition(n_part)
    out = seeds.mapInPandas(
        worker, schema="trial long, group long, estimate double, calls long"
    ).toPandas()
    bc.unpersist()
    return out.sort_values(["trial", "group"]).reset_index(drop=True)


def estimates_matrix(df: pd.DataFrame, n_groups: int) -> np.ndarray:
    """Pivot run_group_trials output to a (n_trials, n_groups) matrix."""
    return (
        df.pivot(index="trial", columns="group", values="estimate")
        .sort_index()[list(range(n_groups))]
        .to_numpy()
    )
