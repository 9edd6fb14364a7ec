"""Top-k nearest-segment queries (Definition 8's candidate sets).

The paper uses an R-tree (STR); we use a uniform grid over segment bounding
boxes with expanding ring search — same exact-top-k semantics (verified
against brute force in tests), simpler and fully deterministic.
"""
from __future__ import annotations

import numpy as np

from repro.roadnet.graph import RoadNetwork


class SegmentIndex:
    """Uniform-grid spatial index over a road network's segments."""

    def __init__(self, net: RoadNetwork, cell: float | None = None):
        self.net = net
        x0, y0, x1, y1 = net.bbox()
        self.cell = float(cell) if cell else max(float(np.median(net.length)), 1.0)
        self.x0, self.y0 = x0, y0
        self.ncx = max(1, int(np.ceil((x1 - x0) / self.cell)) + 1)
        self.ncy = max(1, int(np.ceil((y1 - y0) / self.cell)) + 1)
        buckets: dict[tuple[int, int], list[int]] = {}
        for s in range(net.n_segments):
            cx0 = int((min(net.ux[s], net.vx[s]) - x0) // self.cell)
            cx1 = int((max(net.ux[s], net.vx[s]) - x0) // self.cell)
            cy0 = int((min(net.uy[s], net.vy[s]) - y0) // self.cell)
            cy1 = int((max(net.uy[s], net.vy[s]) - y0) // self.cell)
            for cx in range(cx0, cx1 + 1):
                for cy in range(cy0, cy1 + 1):
                    buckets.setdefault((cx, cy), []).append(s)
        self.buckets = {k: np.array(v, dtype=np.int64) for k, v in buckets.items()}

    def _ring(self, cx: int, cy: int, r: int) -> list[np.ndarray]:
        out = []
        if r == 0:
            b = self.buckets.get((cx, cy))
            return [b] if b is not None else []
        for dx in range(-r, r + 1):
            for dy in range(-r, r + 1):
                if max(abs(dx), abs(dy)) != r:
                    continue
                b = self.buckets.get((cx + dx, cy + dy))
                if b is not None:
                    out.append(b)
        return out

    def query(self, x: float, y: float, k: int) -> tuple[np.ndarray, np.ndarray]:
        """Exact top-``k`` nearest segments to ``(x, y)``.

        Returns ``(segment_ids, distances)`` sorted ascending by
        perpendicular (clamped) distance. Expands ring-by-ring until the
        k-th best distance is provably smaller than anything a farther ring
        could hold.
        """
        # clamp far-outside queries onto the grid so ring search still
        # reaches the populated cells
        cx = int(np.clip((x - self.x0) // self.cell, 0, self.ncx - 1))
        cy = int(np.clip((y - self.y0) // self.cell, 0, self.ncy - 1))
        cand: list[np.ndarray] = []
        seen = 0
        r = 0
        max_r = max(self.ncx, self.ncy) + 2
        kth = np.inf
        while r <= max_r:
            ring = self._ring(cx, cy, r)
            for b in ring:
                cand.append(b)
                seen += len(b)
            # Any segment in ring r+1 or farther is at least r*cell away
            # from the query cell's centre cell boundary.
            if seen >= k and (r) * self.cell >= kth:
                break
            if seen >= k or r > 0:
                ids = np.unique(np.concatenate(cand)) if cand else np.empty(0, np.int64)
                if len(ids) >= k:
                    d = self.net.seg_distances(x, y, ids)
                    kth = np.partition(d, k - 1)[k - 1]
                    if (r) * self.cell >= kth:
                        break
            r += 1
        ids = np.unique(np.concatenate(cand)) if cand else np.empty(0, np.int64)
        d = self.net.seg_distances(x, y, ids)
        kk = min(k, len(ids))
        top = np.argsort(d, kind="stable")[:kk]
        return ids[top], d[top]

    def nearest(self, x: float, y: float) -> int:
        """Id of the single nearest segment (the Nearest baseline)."""
        return int(self.query(x, y, 1)[0][0])
