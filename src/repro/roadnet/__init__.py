"""Road-network substrate: graph model, synthetic city generator, spatial
index (top-k nearest segment), routing, and Node2Vec-lite embeddings.

Everything is plain numpy + stdlib and picklable, because the Spark
inference/metric paths broadcast the :class:`repro.roadnet.graph.RoadNetwork`
to executors.
"""
from repro.roadnet.graph import RoadNetwork  # noqa: F401
from repro.roadnet.generate import make_city  # noqa: F401
from repro.roadnet.spatial_index import SegmentIndex  # noqa: F401
