"""Complex predicates (§3.3, ABAE-MultiPred).

Queries may combine any number of expensive predicates with ¬ / ∧ / ∨.
ABAE-MultiPred folds the per-predicate proxy scores into one score by
rewriting the Boolean expression arithmetically:

* ¬a  →  1 − a
* a ∧ b  →  a · b
* a ∨ b  →  max(a, b)

and then runs plain ABAE with the combined score. The same AST also
evaluates the *oracle truth* of the expression (Boolean semantics), so
one oracle invocation per sampled record resolves the whole predicate.

Expressions are built programmatically::

    expr = And(Pred("cars"), Not(Pred("red_light")))
    expr.score({"cars": s1, "red_light": s2})    # numpy
    expr.score_col({"cars": F.col("proxy_0"), ...})  # Spark Column
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
from pyspark.sql import Column
from pyspark.sql import functions as F


class PredExpr:
    """Base class for predicate-expression nodes."""

    def score(self, scores: dict[str, np.ndarray]) -> np.ndarray:
        """Combined proxy score in [0, 1] (arithmetic rewriting)."""
        raise NotImplementedError

    def truth(self, labels: dict[str, np.ndarray]) -> np.ndarray:
        """Oracle truth of the expression (Boolean semantics, {0,1})."""
        raise NotImplementedError

    def score_col(self, cols: dict[str, Column]) -> Column:
        """Spark Column version of :meth:`score`."""
        raise NotImplementedError

    def truth_col(self, cols: dict[str, Column]) -> Column:
        """Spark Column version of :meth:`truth`."""
        raise NotImplementedError

    def names(self) -> set[str]:
        """All base-predicate names referenced by the expression."""
        raise NotImplementedError


@dataclass(frozen=True)
class Pred(PredExpr):
    """A base expensive predicate identified by name."""

    name: str

    def score(self, scores):
        return np.asarray(scores[self.name], dtype=float)

    def truth(self, labels):
        return np.asarray(labels[self.name]).astype(np.int64)

    def score_col(self, cols):
        return cols[self.name]

    def truth_col(self, cols):
        return cols[self.name].cast("long")

    def names(self):
        return {self.name}


@dataclass(frozen=True)
class Not(PredExpr):
    """Negation: score 1 − a, truth ¬a."""

    child: PredExpr

    def score(self, scores):
        return 1.0 - self.child.score(scores)

    def truth(self, labels):
        return 1 - self.child.truth(labels)

    def score_col(self, cols):
        return F.lit(1.0) - self.child.score_col(cols)

    def truth_col(self, cols):
        return F.lit(1) - self.child.truth_col(cols)

    def names(self):
        return self.child.names()


class _NAry(PredExpr):
    def __init__(self, *children: PredExpr):
        if len(children) < 2:
            raise ValueError(f"{type(self).__name__} needs >= 2 children")
        self.children = tuple(children)

    def __eq__(self, other):
        return type(self) is type(other) and self.children == other.children

    def __hash__(self):
        return hash((type(self).__name__, self.children))

    def names(self):
        out: set[str] = set()
        for c in self.children:
            out |= c.names()
        return out


class And(_NAry):
    """Conjunction: score = product, truth = logical AND."""

    def score(self, scores):
        out = self.children[0].score(scores)
        for c in self.children[1:]:
            out = out * c.score(scores)
        return out

    def truth(self, labels):
        out = self.children[0].truth(labels)
        for c in self.children[1:]:
            out = out & c.truth(labels)
        return out

    def score_col(self, cols):
        out = self.children[0].score_col(cols)
        for c in self.children[1:]:
            out = out * c.score_col(cols)
        return out

    def truth_col(self, cols):
        out = self.children[0].truth_col(cols)
        for c in self.children[1:]:
            out = out * c.truth_col(cols)
        return out


class Or(_NAry):
    """Disjunction: score = max, truth = logical OR."""

    def score(self, scores):
        return np.maximum.reduce([c.score(scores) for c in self.children])

    def truth(self, labels):
        out = self.children[0].truth(labels)
        for c in self.children[1:]:
            out = out | c.truth(labels)
        return out

    def score_col(self, cols):
        return F.greatest(*[c.score_col(cols) for c in self.children])

    def truth_col(self, cols):
        return F.greatest(*[c.truth_col(cols) for c in self.children])


def combined_proxy_column(expr: PredExpr, mapping: dict[str, str]) -> Column:
    """Build the combined-proxy Column from column *names*.

    Args:
        expr: the predicate expression.
        mapping: base-predicate name → proxy-score column name.
    """
    return expr.score_col({n: F.col(c) for n, c in mapping.items()})


def combined_truth_column(expr: PredExpr, mapping: dict[str, str]) -> Column:
    """Build the oracle-truth Column from label column names."""
    return expr.truth_col({n: F.col(c) for n, c in mapping.items()})
