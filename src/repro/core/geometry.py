"""Grid/cell geometry (paper Definition 6) and the SURGE→cSPOT reduction.

A grid is the set of lines ``x = sx + i·b``, ``y = sy + j·a``; cell ``(i, j)``
is the half-open box ``[sx + i·b, sx + (i+1)·b) × [sy + j·a, sy + (j+1)·a)``,
so cells partition the plane. Shifted grids (``sx``/``sy`` offsets) are what
MGAP-SURGE uses (Section V-B).

A closed rectangle object of size ``b × a`` overlaps at most 4 cells
(Lemma 1); ``cells_overlapping`` returns exactly the cells whose half-open
boxes contain at least one point of the closed rectangle.
"""
from __future__ import annotations

import math
from dataclasses import dataclass

from .model import Query, SpatialObject


@dataclass(frozen=True)
class Grid:
    """Uniform grid with cell width ``b`` (x) and height ``a`` (y)."""

    a: float  # cell height
    b: float  # cell width
    sx: float = 0.0  # x shift of the grid lines
    sy: float = 0.0  # y shift

    def cell_of(self, x: float, y: float) -> tuple[int, int]:
        """Cell containing point (x, y) under the half-open convention."""
        return (
            math.floor((x - self.sx) / self.b),
            math.floor((y - self.sy) / self.a),
        )

    def cell_bounds(self, key: tuple[int, int]) -> tuple[float, float, float, float]:
        """(x0, y0, x1, y1) of cell ``key`` — half-open on the x1/y1 side."""
        i, j = key
        x0 = self.sx + i * self.b
        y0 = self.sy + j * self.a
        return x0, y0, x0 + self.b, y0 + self.a

    def cells_overlapping(self, o: SpatialObject, q: Query) -> list[tuple[int, int]]:
        """Cells intersecting the closed rectangle object anchored at ``o``.

        The rectangle spans ``[o.x, o.x+b] × [o.y, o.y+a]``; the touched cell
        columns are ``floor((o.x−sx)/b) .. floor((o.x+b−sx)/b)`` (the second
        floor lands in the next column only for the measure-zero boundary
        point, which the half-open cell there owns). At most 2×2 cells.
        """
        i0 = math.floor((o.x - self.sx) / self.b)
        i1 = math.floor((o.x + q.b - self.sx) / self.b)
        j0 = math.floor((o.y - self.sy) / self.a)
        j1 = math.floor((o.y + q.a - self.sy) / self.a)
        return [(i, j) for i in range(i0, i1 + 1) for j in range(j0, j1 + 1)]


def base_grid(q: Query) -> Grid:
    """Grid 1 of the paper (also the Cell-CSPOT grid)."""
    return Grid(a=q.a, b=q.b)


def shifted_grids(q: Query) -> list[Grid]:
    """The four grids of MGAP-SURGE (Section V-B).

    Grid 3's printed x-lines ``x = b + i·b`` coincide with Grid 1's
    ``x = i·b``, i.e. Grid 3 shifts only y — we keep that reading.
    """
    return [
        Grid(a=q.a, b=q.b, sx=0.0, sy=0.0),
        Grid(a=q.a, b=q.b, sx=0.5 * q.b, sy=0.0),
        Grid(a=q.a, b=q.b, sx=0.0, sy=0.5 * q.a),
        Grid(a=q.a, b=q.b, sx=0.5 * q.b, sy=0.5 * q.a),
    ]


def rects_overlap(o1: SpatialObject, o2: SpatialObject, q: Query) -> bool:
    """Do the two (closed, same-size) rectangle objects intersect?"""
    return abs(o1.x - o2.x) <= q.b and abs(o1.y - o2.y) <= q.a
