"""Common container for captured lineage of one operation call."""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd


@dataclass
class CapturedLineage:
    """Lineage of one operation call ``Y = op(X1, ..., Xn)``.

    ``relations[i]`` is the full lineage relation between input ``Xi``
    and the output: integer columns ``b0..b{l-1}, a0..a{m_i-1}`` (paper
    §III.B), one row per contribution, set semantics, 0-based.
    """

    out_shape: tuple[int, ...]
    in_shapes: tuple[tuple[int, ...], ...]
    relations: list[pd.DataFrame] = field(default_factory=list)

    @property
    def n_rows(self) -> int:
        return sum(len(r) for r in self.relations)

    def relation(self, i: int = 0) -> pd.DataFrame:
        return self.relations[i]
