"""Road-network substrate: dynamic graphs, synthetic datasets, traffic model."""
from .graph import Edge, Graph, Subgraph, path_distance
from .generator import (
    DATASETS,
    RoadNetSpec,
    grid_road_network,
    load_dataset,
    random_connected_graph,
)
from .dynamics import apply_deltas, evolve, snapshot_deltas

__all__ = [
    "Edge",
    "Graph",
    "Subgraph",
    "path_distance",
    "DATASETS",
    "RoadNetSpec",
    "grid_road_network",
    "load_dataset",
    "random_connected_graph",
    "apply_deltas",
    "evolve",
    "snapshot_deltas",
]
