"""Synthetic city road-network generator.

Substitutes the paper's OpenStreetMap networks (DESIGN.md §2). A city is a
perturbed grid: ``nx × ny`` intersection nodes with positional jitter, roads
between 4-neighbours kept with probability ``keep_p``, each road either
two-way (a pair of antiparallel directed segments, each offset ~``lane_off``
metres to the right of its travel direction, like lanes) or one-way with
probability ``one_way_p``. The result is restricted to its largest strongly
connected component so routing never dead-ends.

The antiparallel twins are the key difficulty knob: their geometry is nearly
identical, so a nearest-segment matcher is a coin flip between the two travel
directions — exactly the ~0.7 top-1 hit ratio the paper measures (Fig. 2) —
while directional features (MMA's four cosines) disambiguate them.
"""
from __future__ import annotations

import numpy as np

from repro.roadnet.graph import RoadNetwork


def _largest_scc(n_nodes: int, edges: list[tuple[int, int]]) -> set[int]:
    """Largest strongly connected component via iterative Kosaraju."""
    fwd = [[] for _ in range(n_nodes)]
    bwd = [[] for _ in range(n_nodes)]
    for u, v in edges:
        fwd[u].append(v)
        bwd[v].append(u)

    order: list[int] = []
    seen = [False] * n_nodes
    for start in range(n_nodes):
        if seen[start]:
            continue
        stack = [(start, iter(fwd[start]))]
        seen[start] = True
        while stack:
            node, it = stack[-1]
            advanced = False
            for nxt in it:
                if not seen[nxt]:
                    seen[nxt] = True
                    stack.append((nxt, iter(fwd[nxt])))
                    advanced = True
                    break
            if not advanced:
                order.append(node)
                stack.pop()

    comp = [-1] * n_nodes
    best: list[int] = []
    for start in reversed(order):
        if comp[start] != -1:
            continue
        members = [start]
        comp[start] = start
        stack2 = [start]
        while stack2:
            node = stack2.pop()
            for nxt in bwd[node]:
                if comp[nxt] == -1:
                    comp[nxt] = start
                    members.append(nxt)
                    stack2.append(nxt)
        if len(members) > len(best):
            best = members
    return set(best)


def make_city(
    nx: int,
    ny: int,
    spacing: float = 120.0,
    jitter: float = 0.18,
    keep_p: float = 0.94,
    one_way_p: float = 0.35,
    lane_off: float = 5.0,
    seed: int = 0,
) -> RoadNetwork:
    """Build a synthetic city (see module docstring).

    ``spacing`` is the mean road spacing in metres; ``jitter`` the node
    jitter as a fraction of spacing. Deterministic in ``seed``.
    """
    rng = np.random.default_rng(seed)
    n_raw = nx * ny
    gx, gy = np.meshgrid(np.arange(nx), np.arange(ny), indexing="ij")
    node_x = (gx.ravel() + rng.normal(0, jitter, n_raw)) * spacing
    node_y = (gy.ravel() + rng.normal(0, jitter, n_raw)) * spacing

    def nid(i: int, j: int) -> int:
        return i * ny + j

    # Undirected candidate roads between 4-neighbours.
    roads: list[tuple[int, int]] = []
    for i in range(nx):
        for j in range(ny):
            if i + 1 < nx and rng.random() < keep_p:
                roads.append((nid(i, j), nid(i + 1, j)))
            if j + 1 < ny and rng.random() < keep_p:
                roads.append((nid(i, j), nid(i, j + 1)))

    # Direct the roads: two-way → both directions, one-way → a random one.
    directed: list[tuple[int, int, bool]] = []  # (u, v, has_twin)
    for u, v in roads:
        if rng.random() < one_way_p:
            if rng.random() < 0.5:
                u, v = v, u
            directed.append((u, v, False))
        else:
            directed.append((u, v, True))
            directed.append((v, u, True))

    keep_nodes = _largest_scc(n_raw, [(u, v) for u, v, _ in directed])
    directed = [(u, v, tw) for u, v, tw in directed if u in keep_nodes and v in keep_nodes]
    if len(directed) < 8:
        raise ValueError("degenerate network — increase nx/ny or keep_p")

    # Re-index surviving nodes densely.
    remap = {old: new for new, old in enumerate(sorted(keep_nodes))}
    m = len(remap)
    nxr = np.empty(m)
    nyr = np.empty(m)
    for old, new in remap.items():
        nxr[new] = node_x[old]
        nyr[new] = node_y[old]

    seg_u, seg_v, sux, suy, svx, svy = [], [], [], [], [], []
    twin_key: dict[tuple[int, int], int] = {}
    twin = []
    for u, v, has_twin in directed:
        u, v = remap[u], remap[v]
        dx, dy = nxr[v] - nxr[u], nyr[v] - nyr[u]
        norm = float(np.hypot(dx, dy))
        # offset to the right of travel: rotate direction by -90°
        offx, offy = (dy / norm * lane_off, -dx / norm * lane_off) if has_twin else (0.0, 0.0)
        seg_id = len(seg_u)
        seg_u.append(u)
        seg_v.append(v)
        sux.append(nxr[u] + offx)
        suy.append(nyr[u] + offy)
        svx.append(nxr[v] + offx)
        svy.append(nyr[v] + offy)
        if has_twin and (v, u) in twin_key:
            other = twin_key[(v, u)]
            twin.append(other)
            twin[other] = seg_id
        else:
            twin.append(-1)
            if has_twin:
                twin_key[(u, v)] = seg_id

    n = len(seg_u)
    out_segs = [[] for _ in range(m)]
    in_segs = [[] for _ in range(m)]
    for s in range(n):
        out_segs[seg_u[s]].append(s)
        in_segs[seg_v[s]].append(s)

    return RoadNetwork(
        seg_u=np.array(seg_u, dtype=np.int64),
        seg_v=np.array(seg_v, dtype=np.int64),
        ux=np.array(sux),
        uy=np.array(suy),
        vx=np.array(svx),
        vy=np.array(svy),
        node_x=nxr,
        node_y=nyr,
        out_segs=[np.array(s, dtype=np.int64) for s in out_segs],
        in_segs=[np.array(s, dtype=np.int64) for s in in_segs],
        twin=np.array(twin, dtype=np.int64),
    )
