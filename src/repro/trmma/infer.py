"""Spark-batched trajectory recovery.

``run_recovery`` applies any *recoverer* (TRMMA or a baseline) to every
sparse test trajectory via ``groupBy("traj_id").applyInPandas`` — the
batched dual-transformer inference over trajectory partitions named in the
reproduction hint. A recoverer implements::

    recover(xs, ys, ts, t0, idxs, n_ticks) -> (segs, ratios)   # per ε tick

:class:`TRMMARecoverer` chains the full Algorithm 2 inside the executor:
MMA matching → route stitching → DualFormer encode → sequential decode.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.roadnet.routing import stitch_route
from repro.traj.datasets import CityData
from repro.trmma.features import build_infer_sample
from repro.trmma.model import TRMMAModel


class TRMMARecoverer:
    """Algorithm 2 end to end (see module docstring)."""

    name = "TRMMA"

    def __init__(
        self, matcher, model: TRMMAModel, norm: dict, eps: float, costs=None,
        time_per_meter=None,
    ):
        self.matcher = matcher  # any repro.mma matcher (holds net + index)
        self.model = model
        self.norm = norm
        self.eps = eps
        self.costs = costs
        self.time_per_meter = time_per_meter

    def recover(self, xs, ys, ts, t0, idxs, n_ticks):
        net = self.matcher.net
        segs_m = self.matcher.match(xs, ys, ts, t0)  # Alg. 2 line 1 (via Alg. 1)
        ratios_m = np.array(
            [net.project(float(x), float(y), int(s))[0] for x, y, s in zip(xs, ys, segs_m)]
        )
        route = np.array(stitch_route(net, [int(s) for s in segs_m], self.costs), dtype=np.int64)
        sample = build_infer_sample(
            net, self.norm, xs, ys, ts, t0, idxs, n_ticks, self.eps, segs_m, ratios_m, route,
            time_per_meter=self.time_per_meter,
        )
        return self.model.recover(sample)


def run_recovery(
    spark: SparkSession,
    city: CityData,
    recoverer,
    split: str = "test",
) -> DataFrame:
    """Recovered ``T_ε`` for every trajectory of a split:
    (traj_id, idx, seg, ratio) with one row per ε tick."""
    obs = city.points.filter((F.col("split") == split) & F.col("observed"))
    bc = spark.sparkContext.broadcast(recoverer)
    schema = "traj_id long, idx long, seg long, ratio double"

    def per_traj(key, pdf):
        rec = bc.value
        pdf = pdf.sort_values("idx")
        idxs = pdf["idx"].to_numpy(np.int64)
        n_ticks = int(idxs[-1]) + 1
        segs, ratios = rec.recover(
            pdf["x"].to_numpy(np.float64),
            pdf["y"].to_numpy(np.float64),
            pdf["t"].to_numpy(np.float64),
            float(pdf["t0"].iloc[0]),
            idxs,
            n_ticks,
        )
        return pd.DataFrame(
            {
                "traj_id": int(key[0]),
                "idx": np.arange(n_ticks, dtype=np.int64),
                "seg": np.asarray(segs, dtype=np.int64),
                "ratio": np.asarray(ratios, dtype=np.float64),
            }
        )

    return obs.groupBy("traj_id").applyInPandas(per_traj, schema=schema)
