"""Community quality metrics (Section 8's evaluation metric)."""
from __future__ import annotations

from typing import Iterable, Set


def precision(found: Set[int], truth: Set[int]) -> float:
    """|C ∩ Ĉ| / |C| (0 for an empty answer)."""
    return len(found & truth) / len(found) if found else 0.0


def recall(found: Set[int], truth: Set[int]) -> float:
    """|C ∩ Ĉ| / |Ĉ| (0 for an empty ground truth)."""
    return len(found & truth) / len(truth) if truth else 0.0


def f1_score(found: Set[int], truth: Set[int]) -> float:
    """Harmonic mean of precision and recall against a ground-truth community."""
    p, r = precision(found, truth), recall(found, truth)
    return 2 * p * r / (p + r) if p + r > 0 else 0.0


def mean(xs: Iterable[float]) -> float:
    xs = list(xs)
    return sum(xs) / len(xs) if xs else 0.0
