"""Driver-side representation of a decomposed maximal pattern truss.

The paper stores the decomposition of C*_p(0) as a linked list
``L_p = (alpha_1, R_p(alpha_1)), ..., (alpha_h, R_p(alpha_h))`` (Section
6.1). We store one removal threshold per edge — the two forms are
equivalent: the k-th list node is exactly the set of edges with threshold
alpha_k, and Equation 1 becomes a filter ``threshold > alpha``. Numpy arrays
keep the per-node memory footprint close to the paper's C++ implementation.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import List, Sequence, Tuple

import numpy as np

from repro.core.reference import Edge


@dataclass
class PatternDecomposition:
    """The linked list L_p, stored columnar: edges of C*_p(0) with the
    decomposition threshold alpha_k at which each is removed."""

    pid: str
    u: np.ndarray  # int64
    v: np.ndarray  # int64
    threshold: np.ndarray  # float64, > 0

    @classmethod
    def from_rows(cls, pid: str, rows: Sequence[Tuple[int, int, float]]) -> "PatternDecomposition":
        rows = sorted(rows)
        return cls(
            pid=pid,
            u=np.array([r[0] for r in rows], dtype=np.int64),
            v=np.array([r[1] for r in rows], dtype=np.int64),
            threshold=np.array([r[2] for r in rows], dtype=np.float64),
        )

    def __len__(self) -> int:
        return len(self.u)

    @property
    def alpha_star(self) -> float:
        """Upper bound of the nontrivial alpha range: C*_p(alpha) = ∅ for all
        alpha >= alpha_star (the last linked-list node's threshold)."""
        return float(self.threshold.max()) if len(self) else 0.0

    def levels(self) -> List[float]:
        """The ascending threshold sequence A_p = alpha_1 < ... < alpha_h."""
        return sorted(set(self.threshold.tolist()))

    def truss_edges(self, alpha: float) -> List[Edge]:
        """Equation 1: E*_p(alpha) = edges with removal threshold > alpha."""
        mask = self.threshold > alpha
        return [
            (int(a), int(b)) for a, b in zip(self.u[mask], self.v[mask])
        ]

    def linked_list(self) -> List[Tuple[float, List[Edge]]]:
        """Materialize the paper's L_p form: [(alpha_k, R_p(alpha_k)), ...]."""
        out: List[Tuple[float, List[Edge]]] = []
        for a in self.levels():
            mask = self.threshold == a
            out.append(
                (float(a), [(int(x), int(y)) for x, y in zip(self.u[mask], self.v[mask])])
            )
        return out

    def nbytes(self) -> int:
        return int(self.u.nbytes + self.v.nbytes + self.threshold.nbytes)
