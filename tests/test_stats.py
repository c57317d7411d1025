"""Graph statistics harness (Table 2 columns)."""
import pytest

from repro.graphs import generators as gen
from repro.graphs.stats import graph_stats, spark_counts


def test_counts_match_generator(spark):
    g = gen.chung_lu(300, 6, 2.2, seed=0, name="t")
    n, m = spark_counts(spark, g)
    assert n == 300 and m == g.m


def test_bad_vertex_count_detected(spark):
    g = gen.chung_lu(100, 4, 2.2, seed=0)
    broken = gen.GraphData(n=50, edges=g.edges, name="broken")
    with pytest.raises(AssertionError):
        spark_counts(spark, broken)


def test_stats_cycle_graph(spark):
    g = gen.cycle_graph(40, two=True, name="2x20")
    s = graph_stats(spark, g)
    assert s.n == 40 and s.m == 40
    assert s.num_cc == 2 and s.largest_cc == 20
    assert s.diameter == 10 and s.diameter_exact


def test_stats_single_cycle(spark):
    g = gen.cycle_graph(30, two=False, name="c30")
    s = graph_stats(spark, g)
    assert s.num_cc == 1 and s.diameter == 15


def test_stats_row_shape(spark):
    s = graph_stats(spark, gen.cycle_graph(20, two=False, name="c"))
    row = s.row()
    assert set(row) == {"Dataset", "n", "m", "Diam.", "Num. CC", "Largest CC"}
    assert "*" not in row["Diam."]


def test_stats_large_graph_uses_lower_bound(spark):
    g = gen.chung_lu(6000, 4, 2.3, seed=1, name="big")
    s = graph_stats(spark, g)
    assert not s.diameter_exact
    assert s.row()["Diam."].endswith("*")


def test_hl_stats_components(spark):
    g = gen.dataset("HL")
    s = graph_stats(spark, g)
    assert s.num_cc > 100
    assert s.largest_cc > 0.7 * s.n


@pytest.mark.parametrize("name", ["OK"])
def test_dataset_stats_sanity(spark, name):
    s = graph_stats(spark, gen.dataset(name))
    assert s.num_cc == 1  # spine keeps social stand-ins connected
    assert s.m > s.n
