"""End-to-end ABAE over a Spark DataFrame (single predicate).

This is the query-processing path: the full dataset only ever flows
through *cheap* Catalyst operators (proxy stratification, seeded rank,
filters); the expensive oracle UDF touches **only sampled rows**, which
is the entire point of the paper. The dataflow is:

1. ``add_stratum`` — exact proxy-quantile strata (Algorithm 1 Init).
2. A deterministic per-stratum sampling order via ``xxhash64(id, seed)``
   ranked within each stratum (window partitioned by stratum ⇒ runs in
   parallel across strata). One ordering serves both stages: Stage 1
   takes ranks 1..N₁/K, Stage 2 takes the next ⌊N₂·T̂_k⌋ ranks — this
   is sampling without replacement with sample reuse.
3. Stage-1 plug-in estimates via ``groupBy(stratum).agg`` (K rows to
   the driver), allocation by Proposition 1.
4. Stage-2 filter + oracle, final per-stratum estimates, combined
   answer; optional bootstrap CI (Algorithm 2) over the collected
   sample values (≤ N rows).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql.window import Window

from repro.core.allocation import optimal_allocation, stage2_counts
from repro.core.bootstrap import bootstrap_ci
from repro.core.estimator import combine
from repro.core.sampler import split_budget
from repro.core.stratify import add_stratum
from repro.simulate.oracles import SimulatedOracle


@dataclass
class ABAEQueryResult:
    """Result of an ABAE Spark query.

    Attributes:
        estimate: the approximate answer μ̂_all.
        ci: (lower, upper) bootstrap CI, or None if no CI requested.
        oracle_calls: oracle invocations actually spent.
        p_hat/mu_hat/sigma_hat: final per-stratum plug-in estimates.
        allocation: Stage-2 allocation T̂.
        samples: per-stratum sampled (values, labels), for reuse.
    """

    estimate: float
    ci: tuple[float, float] | None
    oracle_calls: int
    p_hat: np.ndarray
    mu_hat: np.ndarray
    sigma_hat: np.ndarray
    allocation: np.ndarray
    samples: list[tuple[np.ndarray, np.ndarray]] = field(default_factory=list)


def _ranked(df: DataFrame, k: int, proxy_col: str, id_col: str, seed: int) -> DataFrame:
    """Stratify and attach a deterministic per-stratum sampling rank.

    ``xxhash64(id, seed)`` is a pure function of the row, so the rank
    is stable across stages and re-evaluations (unlike ``rand()``).
    """
    out = add_stratum(df, k, proxy_col=proxy_col, id_col=id_col)
    w = Window.partitionBy("stratum").orderBy(
        F.xxhash64(F.col(id_col), F.lit(seed)), F.col(id_col)
    )
    return out.withColumn("_rank", F.row_number().over(w))


def _strata_stats(labeled: DataFrame, value_col: str, k: int) -> tuple[np.ndarray, ...]:
    """Per-stratum (n, n_pos, μ̂, σ̂) from an oracle-labeled sample."""
    pos_val = F.when(F.col("oracle_label") == 1, F.col(value_col))
    rows = (
        labeled.groupBy("stratum")
        .agg(
            F.count(F.lit(1)).alias("n"),
            F.sum("oracle_label").alias("n_pos"),
            F.avg(pos_val).alias("mu"),
            F.stddev_samp(pos_val).alias("sigma"),
        )
        .collect()
    )
    n = np.zeros(k)
    n_pos = np.zeros(k)
    mu = np.zeros(k)
    sigma = np.zeros(k)
    for r in rows:
        s = int(r["stratum"])
        n[s] = r["n"]
        n_pos[s] = r["n_pos"] or 0
        mu[s] = r["mu"] if r["mu"] is not None else 0.0
        sigma[s] = r["sigma"] if r["sigma"] is not None else 0.0
    return n, n_pos, mu, sigma


def abae_query(
    df: DataFrame,
    *,
    n_budget: int,
    oracle: SimulatedOracle,
    k: int = 5,
    stage1_frac: float = 0.5,
    proxy_col: str = "proxy",
    value_col: str = "value",
    id_col: str = "id",
    seed: int = 0,
    n_boot: int = 0,
    alpha: float = 0.05,
) -> ABAEQueryResult:
    """Answer ``SELECT AVG(value) WHERE O(x) ORACLE LIMIT n_budget``
    with ABAE on a Spark DataFrame. See module docstring for dataflow.
    """
    ranked = _ranked(df, k, proxy_col, id_col, seed).persist()
    try:
        n1_per, n2 = split_budget(n_budget, k, stage1_frac)

        # Persist the labeled Stage-1 sample: it is consumed twice (for
        # the pilot stats and in the final union) and re-evaluating it
        # would re-invoke the oracle — double-charging the budget.
        stage1 = oracle.apply(ranked.filter(F.col("_rank") <= n1_per)).persist()
        n1, n_pos1, _, sigma1 = _strata_stats(stage1, value_col, k)
        p1 = np.divide(n_pos1, n1, out=np.zeros(k), where=n1 > 0)

        t_hat = optimal_allocation(p1, sigma1)
        extra = stage2_counts(t_hat, n2)

        # rank ∈ (n1_per, n1_per + extra_k] per stratum.
        limit_expr = F.lit(int(n1_per))
        for i in range(k):
            limit_expr = F.when(
                F.col("stratum") == i, F.lit(int(n1_per + extra[i]))
            ).otherwise(limit_expr)
        stage2 = oracle.apply(
            ranked.filter((F.col("_rank") > n1_per) & (F.col("_rank") <= limit_expr))
        )

        sampled = stage1.unionByName(stage2)
        pdf = sampled.select("stratum", value_col, "oracle_label").toPandas()
        stage1.unpersist()
        samples = []
        final_p = np.zeros(k)
        final_mu = np.zeros(k)
        final_sigma = np.zeros(k)
        for i in range(k):
            sub = pdf[pdf["stratum"] == i]
            v = sub[value_col].to_numpy(dtype=float)
            l = sub["oracle_label"].to_numpy()
            samples.append((v, l))
            pos = v[l == 1]
            final_p[i] = pos.size / v.size if v.size else 0.0
            final_mu[i] = float(pos.mean()) if pos.size else 0.0
            final_sigma[i] = float(pos.std(ddof=1)) if pos.size > 1 else 0.0

        est = combine(final_p, final_mu)
        ci = None
        if n_boot > 0:
            ci = bootstrap_ci(
                samples, np.random.default_rng(seed + 7), n_boot=n_boot, alpha=alpha
            )
        return ABAEQueryResult(
            estimate=est,
            ci=ci,
            oracle_calls=oracle.calls,
            p_hat=final_p,
            mu_hat=final_mu,
            sigma_hat=final_sigma,
            allocation=t_hat,
            samples=samples,
        )
    finally:
        ranked.unpersist()


def uniform_query(
    df: DataFrame,
    *,
    n_budget: int,
    oracle: SimulatedOracle,
    value_col: str = "value",
    id_col: str = "id",
    seed: int = 0,
    n_boot: int = 0,
    alpha: float = 0.05,
) -> ABAEQueryResult:
    """Uniform-sampling baseline as a Spark query: take the first
    ``n_budget`` ranks of a seeded hash ordering (a uniform without-
    replacement sample), label them with the oracle, average the
    positives.

    The sample is selected with a rank window + filter rather than
    ``orderBy().limit()``: the latter compiles to TakeOrderedAndProject
    whose projection evaluates the oracle UDF outside a task, losing
    the accumulator updates that meter the oracle budget.
    """
    w = Window.orderBy(F.xxhash64(F.col(id_col), F.lit(seed)), F.col(id_col))
    sampled = (
        df.withColumn("_rank", F.row_number().over(w))
        .filter(F.col("_rank") <= n_budget)
    )
    labeled = oracle.apply(sampled)
    pdf = labeled.select(value_col, "oracle_label").toPandas()
    v = pdf[value_col].to_numpy(dtype=float)
    l = pdf["oracle_label"].to_numpy()
    pos = v[l == 1]
    est = float(pos.mean()) if pos.size else 0.0
    ci = None
    if n_boot > 0:
        ci = bootstrap_ci(
            [(v, l)], np.random.default_rng(seed + 7), n_boot=n_boot, alpha=alpha
        )
    return ABAEQueryResult(
        estimate=est,
        ci=ci,
        oracle_calls=oracle.calls,
        p_hat=np.array([pos.size / v.size if v.size else 0.0]),
        mu_hat=np.array([est]),
        sigma_hat=np.array([float(pos.std(ddof=1)) if pos.size > 1 else 0.0]),
        allocation=np.array([]),
        samples=[(v, l)],
    )
