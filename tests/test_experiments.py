"""Smoke tests for the per-table experiment harnesses (test scale)."""
import numpy as np
import pytest

from repro.experiments.async_impact import async_impact
from repro.experiments.cache import cache_misses, partition_effect
from repro.experiments.common import markdown_table
from repro.experiments.convergence import convergence, gograph_time_fraction
from repro.experiments.degrees import degrees_experiment
from repro.experiments.memuse import memory_usage
from repro.experiments.overall import gograph_speedups, overall
from repro.experiments.partition_methods import partition_methods
from repro.experiments.table1 import PAPER_TABLE1, table1
from repro.experiments.table2 import PAPER_TABLE2, table2
from repro.reorder.api import METHODS


def test_table1_covers_all_paper_datasets():
    df = table1("test")
    assert set(df["graph"]) == set(PAPER_TABLE1)
    assert (df["ours_V"] > 0).all() and (df["ours_E"] > 0).all()


def test_table2_has_all_methods_and_columns():
    df = table2("test")
    assert list(df["method"]) == list(METHODS)
    for c in ("M", "M_over_E", "rounds_pagerank", "rounds_sssp", "rounds_bfs", "rounds_php"):
        assert c in df.columns


def test_table2_gograph_max_metric_min_pagerank_rounds():
    """The paper's Table II shape at test scale."""
    df = table2("test").set_index("method")
    assert df["M"].idxmax() == "gograph"
    assert df.loc["gograph", "rounds_pagerank"] == df["rounds_pagerank"].min()
    assert df.loc["gograph", "rounds_php"] == df["rounds_php"].min()


def test_table2_default_matches_forward_frac():
    df = table2("test").set_index("method")
    assert df.loc["default", "M_over_E"] == pytest.approx(0.07, abs=0.03)


def test_overall_normalization():
    df = overall("test", graphs=("IC",), algos=("sssp",), repeats=1)
    base = df[(df["method"] == "default")]
    assert np.allclose(base["norm_rounds"], 1.0)
    assert np.allclose(base["norm_runtime"], 1.0)
    assert len(df) == len(METHODS)


def test_gograph_speedups_shape():
    df = overall("test", graphs=("CP",), algos=("pagerank",), repeats=1)
    sp = gograph_speedups(df)
    assert set(sp["vs_method"]) == set(METHODS) - {"gograph"}
    assert (sp["round_red_avg_pct"] >= 0).all()


def test_async_impact_rounds_ordering():
    """Sync ≥ Async+Default ≥ Async+GoGraph in rounds (paper Fig 8)."""
    df = async_impact("test", graphs=("CP",), repeats=1)
    assert (df["async_def_rounds"] <= df["sync_def_rounds"]).all()
    assert (df["async_gograph_rounds"] <= df["async_def_rounds"]).all()


def test_cache_misses_harness_columns():
    df = cache_misses("test", graphs=("IC",))
    assert set(df["method"]) == set(METHODS)
    assert (df["misses"] <= df["accesses"]).all()


def test_partition_effect_harness():
    df = partition_effect("test", graphs=("IC",))
    assert {"misses_with_partition", "misses_without_partition"} <= set(df.columns)


def test_memory_usage_sync_highest():
    df = memory_usage("test", graphs=("CP",))
    assert (df["sync_default_MiB"] > df["async_default_MiB"]).all()
    assert (df["async_gograph_MiB"] == df["async_default_MiB"]).all()


def test_degrees_experiment_shape():
    df = degrees_experiment(n=600, repeats=1)
    assert set(df["avg_degree"]) == {2, 4, 6, 8}
    # heavier graphs have more edges
    e = df.groupby("avg_degree")["edges"].first()
    assert e.loc[8] > e.loc[2]


def test_partition_methods_normalized_to_rabbit():
    df = partition_methods("test", graphs=("CP",), repeats=1)
    rb = df[df["partitioner"] == "rabbit"]
    assert np.allclose(rb["norm_rounds"], 1.0)
    assert set(df["partitioner"]) == {"rabbit", "metis", "louvain", "fennel"}


def test_convergence_harness():
    df = convergence("test", graphs=("CP",), algos=("pagerank",))
    assert set(df["method"]) == set(METHODS)
    frac = gograph_time_fraction(df)
    assert (frac["gograph_time_frac"] > 0).all()


def test_markdown_table_renders():
    df = table1("test")
    md = markdown_table(df)
    assert md.startswith("| graph |")
    assert md.count("\n") == len(df) + 1
