"""Graph partitioners used by GoGraph's divide phase (paper §IV, Fig 13)."""
from repro.partition.api import PARTITIONERS, partition  # noqa: F401
