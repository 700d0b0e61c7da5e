"""Geometric primitives for indoor spaces.

Partitions produced by the generators are convex (grid cells or stairwells),
so the intra-partition door-to-door distance of Eq. 1 is the straight-line
Euclidean distance between the two door positions — except stairways, whose
walking length is fixed (20 m in both the synthetic space and the mall) and
stored explicitly on the partition.
"""
from __future__ import annotations

import math
from dataclasses import dataclass

import numpy as np


def euclid(a, b) -> float:
    """Euclidean distance between two 3-D points.

    Pure-Python on purpose: this sits on the innermost search loop and a
    NumPy ``norm`` call costs ~10× more than three subtractions here.
    """
    return math.sqrt(
        (float(a[0]) - float(b[0])) ** 2
        + (float(a[1]) - float(b[1])) ** 2
        + (float(a[2]) - float(b[2])) ** 2
    )


@dataclass(frozen=True)
class IndoorPoint:
    """A point inside a partition: the paper's ``p_s`` / ``p_t``."""

    partition: int
    xyz: tuple[float, float, float]

    def coords(self) -> np.ndarray:
        return np.asarray(self.xyz, dtype=float)
