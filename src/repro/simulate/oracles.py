"""Simulated expensive oracles (substrate).

The paper's oracles are expensive DNNs (Mask R-CNN, BERT) or human
labelers; cost is measured in oracle *invocations* (§5.1 "Metrics").
Our surrogate datasets carry the oracle's answer as a hidden column;
this module is the only sanctioned way to read it, and it counts every
invocation so tests and experiments can assert the sampling budget is
respected — the core claim of the paper is doing fewer of these calls.

Two interfaces are provided:

* ``SimulatedOracle.call(labels_or_rows)`` — local/numpy path, counts
  on the driver.
* ``SimulatedOracle.spark_udf(spark)`` — a pandas UDF whose invocations
  are counted with a Spark accumulator, for the DataFrame query path
  where the oracle runs on executors against only the sampled rows.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F


class BudgetExceededError(RuntimeError):
    """Raised when an oracle is invoked more times than its budget."""


class SimulatedOracle:
    """Call-counting gate in front of a hidden label column.

    Args:
        label_col: name of the hidden ground-truth column in the dataset
            (e.g. ``"label"`` for the predicate, ``"group"`` for a
            group-by key oracle).
        budget: optional hard cap on invocations; exceeding it raises
            BudgetExceededError, mirroring the ``ORACLE LIMIT`` clause.
    """

    def __init__(self, label_col: str = "label", budget: int | None = None):
        self.label_col = label_col
        self.budget = budget
        self._count = 0
        self._acc = None

    # ------------------------------------------------------------------
    # Local / numpy path
    # ------------------------------------------------------------------
    def call(self, values: np.ndarray) -> np.ndarray:
        """Invoke the oracle on ``values`` (the hidden labels of the
        sampled records). Returns them unchanged; counts the calls."""
        values = np.asarray(values)
        self._charge(values.size)
        return values

    def _charge(self, n: int) -> None:
        self._count += int(n)
        if self.budget is not None and self.calls > self.budget:
            raise BudgetExceededError(
                f"oracle exceeded budget: {self.calls} > {self.budget}"
            )

    # ------------------------------------------------------------------
    # Spark path
    # ------------------------------------------------------------------
    def spark_udf(self, spark: SparkSession):
        """A pandas UDF ``oracle(hidden_label) -> label`` that counts
        invocations with a Spark accumulator (sums across executors)."""
        import pyspark.sql.functions as F  # noqa: F811  (udf decorator)

        if self._acc is None:
            self._acc = spark.sparkContext.accumulator(0)
        acc = self._acc

        @F.pandas_udf("long")
        def _oracle(col: pd.Series) -> pd.Series:
            acc.add(len(col))
            return col.astype("int64")

        return _oracle

    def apply(self, df, out_col: str = "oracle_label"):
        """Apply the oracle to a (sampled!) DataFrame, adding ``out_col``.

        Applying this to the full dataset defeats the paper's purpose;
        tests assert via ``calls`` that only sampled rows are labeled.
        """
        spark = SparkSession.getActiveSession()
        udf = self.spark_udf(spark)
        return df.withColumn(out_col, udf(F.col(self.label_col)))

    @property
    def calls(self) -> int:
        """Total invocations so far (local + Spark accumulator)."""
        return self._count + (self._acc.value if self._acc is not None else 0)

    def reset(self) -> None:
        self._count = 0
        if self._acc is not None:
            self._acc = None
