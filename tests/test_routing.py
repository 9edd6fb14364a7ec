"""Tests for route planning, stitching, historical costs and network
distances."""
import numpy as np
import pytest

from repro.roadnet.routing import (
    HistoricalCosts,
    NetworkDistance,
    network_distance_for,
    plan_route,
    stitch_route,
)


def test_plan_route_is_connected(net_small):
    route = plan_route(net_small, 0, net_small.n_segments // 2)
    assert route is not None
    assert route[0] == 0
    assert route[-1] == net_small.n_segments // 2
    for a, b in zip(route, route[1:]):
        assert net_small.seg_v[a] == net_small.seg_u[b]


def test_plan_route_same_src_dst(net_small):
    assert plan_route(net_small, 7, 7) == [7]


def test_plan_route_respects_expansion_budget(net_small):
    assert plan_route(net_small, 0, net_small.n_segments - 1, max_expansions=1) is None


def test_plan_route_minimises_length(net_small):
    """Cost of the planned route ≤ cost of any single-hop detour variant."""
    src, dst = 3, 60
    route = plan_route(net_small, src, dst)
    cost = net_small.length[route[1:]].sum()
    # brute-force Dijkstra over segments for reference
    import heapq

    dist = {src: 0.0}
    pq = [(0.0, src)]
    while pq:
        d, s = heapq.heappop(pq)
        if d > dist.get(s, np.inf):
            continue
        for nxt in net_small.successors(s):
            nxt = int(nxt)
            nd = d + float(net_small.length[nxt])
            if nd < dist.get(nxt, np.inf):
                dist[nxt] = nd
                heapq.heappush(pq, (nd, nxt))
    assert cost == pytest.approx(dist[dst])


def test_stitch_route_contains_anchors(net_small):
    anchors = [2, 40, 90]
    route = stitch_route(net_small, anchors)
    for a in anchors:
        assert a in route
    # connected except possibly at fallback concatenations
    for a, b in zip(route, route[1:]):
        assert net_small.seg_v[a] == net_small.seg_u[b]


def test_stitch_route_dedups_consecutive(net_small):
    route = stitch_route(net_small, [5, 5, 5])
    assert route == [5]


def test_historical_costs_discount_popular(net_small):
    hc0 = HistoricalCosts(net_small)
    hc = HistoricalCosts(net_small, routes=[[1, 2, 3], [1, 2], [1]])
    assert np.allclose(hc0.cost, net_small.length)
    assert hc.cost[1] < hc.cost[4] or net_small.length[1] < net_small.length[4]
    assert hc.cost[1] < net_small.length[1]
    assert hc.counts[1] == 3


def test_network_distance_same_segment(net_small):
    nd = NetworkDistance(net_small)
    d = nd.dist(4, 0.2, 4, 0.7)
    assert d == pytest.approx(0.5 * net_small.length[4])


def test_network_distance_zero_for_same_point(net_small):
    nd = NetworkDistance(net_small)
    assert nd.dist(9, 0.4, 9, 0.4) == pytest.approx(0.0)


def test_network_distance_symmetric(net_small):
    nd = NetworkDistance(net_small)
    assert nd.dist(3, 0.5, 77, 0.25) == pytest.approx(nd.dist(77, 0.25, 3, 0.5))


def test_network_distance_lower_bounded_by_euclid(net_small):
    nd = NetworkDistance(net_small)
    for a, b in [(0, 50), (10, 120), (33, 34)]:
        x1, y1 = net_small.point_at(a, 0.5)
        x2, y2 = net_small.point_at(b, 0.5)
        euclid = float(np.hypot(x1 - x2, y1 - y2))
        assert nd.dist(a, 0.5, b, 0.5) >= euclid - 11.0  # lane offset slack


def test_directed_consistent_with_adjacent_segments(net_small):
    nd = NetworkDistance(net_small)
    s = 0
    nxt = int(net_small.successors(s)[0])
    d = nd.directed(s, 0.5, nxt, 0.5)
    expect = 0.5 * net_small.length[s] + 0.5 * net_small.length[nxt]
    assert d == pytest.approx(expect)


def test_network_distance_cache_shared(net_small):
    a = network_distance_for(net_small)
    b = network_distance_for(net_small)
    assert a is b
