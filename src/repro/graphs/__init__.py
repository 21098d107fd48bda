"""Graph substrate: synthetic generators and local/Spark representations."""
from repro.graphs.gen import (  # noqa: F401
    DATASETS,
    ba_graph,
    dataset_graph,
    edges_to_spark,
)
from repro.graphs.local import LocalGraph, to_local  # noqa: F401
