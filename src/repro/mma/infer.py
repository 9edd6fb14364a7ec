"""Spark-batched map-matching inference.

This is the ``single_node_parallelizable`` layering the reproduction hint
prescribes: the model-heavy per-trajectory computation runs inside
``groupBy("traj_id").applyInPandas`` with the matcher (model weights +
road network + spatial index) shipped once per executor via broadcast.

One pass per matcher produces both outputs of Algorithm 1:
* matched points — (traj_id, idx, seg, ratio), the per-GPS-point segments
  (with projected position ratios, Alg. 2 lines 2-4), and
* routes — (traj_id, pos, seg), the stitched route ``R``.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.roadnet.routing import stitch_route
from repro.traj.datasets import CityData

_COMBINED_SCHEMA = "traj_id long, kind string, ord long, idx long, seg long, ratio double"


@dataclass
class MatchResult:
    """Matched points + stitched routes for one (matcher, split)."""

    points: DataFrame  # traj_id, idx, seg, ratio
    routes: DataFrame  # traj_id, pos, seg


def run_matcher(
    spark: SparkSession,
    city: CityData,
    matcher,
    split: str = "test",
    costs: np.ndarray | None = None,
) -> MatchResult:
    """Run a matcher over every sparse trajectory of a split (see module
    docstring). ``costs`` are the historical routing costs used to stitch
    gaps (Alg. 1 line 12); defaults to plain shortest path."""
    obs = city.points.filter((F.col("split") == split) & F.col("observed"))
    bc = spark.sparkContext.broadcast({"matcher": matcher, "costs": costs})

    def per_traj(key, pdf):
        env = bc.value
        m = env["matcher"]
        net = m.net
        pdf = pdf.sort_values("idx")
        xs = pdf["x"].to_numpy(np.float64)
        ys = pdf["y"].to_numpy(np.float64)
        ts = pdf["t"].to_numpy(np.float64)
        t0 = float(pdf["t0"].iloc[0])
        segs = m.match(xs, ys, ts, t0)
        ratios = np.array([net.project(float(x), float(y), int(s))[0] for x, y, s in zip(xs, ys, segs)])
        route = stitch_route(net, [int(s) for s in segs], env["costs"])
        tid = int(key[0])
        prow = pd.DataFrame(
            {
                "traj_id": tid,
                "kind": "point",
                "ord": -1,
                "idx": pdf["idx"].to_numpy(np.int64),
                "seg": segs.astype(np.int64),
                "ratio": ratios,
            }
        )
        rrow = pd.DataFrame(
            {
                "traj_id": tid,
                "kind": "route",
                "ord": np.arange(len(route)),
                "idx": -1,
                "seg": np.array(route, dtype=np.int64),
                "ratio": 0.0,
            }
        )
        return pd.concat([prow, rrow], ignore_index=True)

    combined = obs.groupBy("traj_id").applyInPandas(per_traj, schema=_COMBINED_SCHEMA).cache()
    points = combined.filter(F.col("kind") == "point").select("traj_id", "idx", "seg", "ratio")
    routes = combined.filter(F.col("kind") == "route").select(
        "traj_id", F.col("ord").alias("pos"), "seg"
    )
    return MatchResult(points=points, routes=routes)
