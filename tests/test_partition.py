"""Tests for the graph partitioners (GoGraph divide phase, Fig 13)."""
import numpy as np
import pytest

from repro.graphs.gen import community_ba_graph, dataset_graph
from repro.partition.api import PARTITIONERS, cap_sizes, edge_cut, partition
from repro.partition.labelprop import labelprop_communities
from repro.partition.metis_like import bfs_order


@pytest.mark.parametrize("method", PARTITIONERS)
@pytest.mark.parametrize("name", ["IC", "CP"])
def test_every_vertex_assigned(method, name):
    g = dataset_graph(name, scale=0.1)
    parts = partition(g, method, target_size=64)
    assert len(parts) == g.n
    assert (parts >= 0).all()


@pytest.mark.parametrize("method", PARTITIONERS)
def test_deterministic(method):
    g = dataset_graph("IC", scale=0.1)
    assert np.array_equal(
        partition(g, method, target_size=64), partition(g, method, target_size=64)
    )


@pytest.mark.parametrize("method", ["rabbit", "louvain"])
def test_community_methods_bound_part_sizes(method):
    g = dataset_graph("CP", scale=0.1)
    parts = partition(g, method, target_size=64)
    sizes = np.bincount(parts)
    assert sizes.max() <= 2 * 64


def test_metis_like_balanced():
    g = dataset_graph("CP", scale=0.1)
    parts = partition(g, "metis", target_size=64)
    sizes = np.bincount(parts)
    assert sizes.max() <= 64
    assert sizes.min() >= 1


def test_fennel_respects_load_cap():
    g = dataset_graph("CP", scale=0.1)
    parts = partition(g, "fennel", target_size=64)
    sizes = np.bincount(parts, minlength=parts.max() + 1)
    k = -(-g.n // 64)
    assert sizes.max() <= int(1.1 * g.n / k) + 1


@pytest.mark.parametrize("method", ["rabbit", "louvain", "metis"])
def test_cut_better_than_random(method):
    """Locality-aware partitioners must beat a random assignment."""
    g = community_ba_graph(1200, 4, comm_size=60, seed=3)
    parts = partition(g, method, target_size=80)
    rng = np.random.default_rng(0)
    k = parts.max() + 1
    rand_cuts = [
        edge_cut(g, rng.integers(0, k, size=g.n)) for _ in range(3)
    ]
    assert edge_cut(g, parts) < min(rand_cuts)


def test_fennel_worse_than_community_methods():
    """Fig 13 mechanism: streaming Fennel has higher edge-cut."""
    g = community_ba_graph(1200, 4, comm_size=60, seed=4)
    cut_fennel = edge_cut(g, partition(g, "fennel", target_size=80))
    cut_rabbit = edge_cut(g, partition(g, "rabbit", target_size=80))
    assert cut_rabbit < cut_fennel


def test_labelprop_converges_to_communities():
    g = community_ba_graph(800, 4, comm_size=80, seed=5)
    labels = labelprop_communities(g, seed=0)
    n_comms = len(set(labels.tolist()))
    assert 2 <= n_comms < g.n / 4  # nontrivial grouping


def test_cap_sizes_splits_oversized():
    g = community_ba_graph(600, 4, comm_size=600, seed=6)
    labels = np.zeros(g.n, dtype=np.int64)  # everything one community
    parts = cap_sizes(g, labels, target_size=64)
    sizes = np.bincount(parts)
    assert sizes.max() <= 2 * 64
    assert (parts >= 0).all()


def test_cap_sizes_packs_small():
    from repro.graphs.local import LocalGraph

    # 30 isolated vertices, each its own community → packed together
    g = LocalGraph(
        n=30,
        src=np.array([], dtype=np.int64),
        dst=np.array([], dtype=np.int64),
        w=np.array([]),
    )
    parts = cap_sizes(g, np.arange(30), target_size=16)
    assert np.bincount(parts).max() <= 16
    assert parts.max() + 1 <= 3


def test_bfs_order_covers_all_vertices():
    g = dataset_graph("IC", scale=0.1)
    order = bfs_order(g)
    assert sorted(order.tolist()) == list(range(g.n))


def test_unknown_partitioner_raises():
    g = dataset_graph("IC", scale=0.1)
    with pytest.raises(ValueError):
        partition(g, "spectral")


def test_edge_cut_extremes():
    g = dataset_graph("IC", scale=0.1)
    assert edge_cut(g, np.zeros(g.n, dtype=np.int64)) == 0
    assert edge_cut(g, np.arange(g.n)) == int((g.src != g.dst).sum())


def test_partition_edge_weights_via_duckdb_oracle(spark):
    """Inter-part edge weights (super-edges) cross-checked in DuckDB."""
    import pandas as pd
    from pyspark.sql import functions as F

    from repro.graphs.gen import edges_to_spark
    from repro.oracle import assert_equivalent

    g = dataset_graph("IC", scale=0.1)
    parts = partition(g, "rabbit", target_size=32)
    edf = edges_to_spark(spark, g)
    pmap = spark.createDataFrame(
        pd.DataFrame({"vid": np.arange(g.n), "part": parts})
    )
    sup = (
        edf.join(pmap.select(F.col("vid").alias("src"), F.col("part").alias("ps")), "src")
        .join(pmap.select(F.col("vid").alias("dst"), F.col("part").alias("pd")), "dst")
        .where(F.col("ps") != F.col("pd"))
        .groupBy("ps", "pd")
        .agg(F.count("*").alias("w"))
    )
    assert_equivalent(
        sup,
        """
        SELECT p1.part AS ps, p2.part AS pd, COUNT(*) AS w
        FROM edges e JOIN pmap p1 ON e.src = p1.vid JOIN pmap p2 ON e.dst = p2.vid
        WHERE p1.part <> p2.part GROUP BY 1, 2
        """,
        edges=pd.DataFrame({"src": g.src, "dst": g.dst}),
        pmap=pd.DataFrame({"vid": np.arange(g.n), "part": parts}),
    )
