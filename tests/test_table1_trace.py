"""Table-1 reproduction test: the Bellman-Ford differential trace.

The paper's claim: after G0, maintaining the computation across G1 and G2
touches only a constant number of states in the w-component — none in the
(arbitrarily large) z-component.
"""
import pytest

from repro.experiments.table1 import run_table1


@pytest.fixture(scope="module")
def trace(spark):
    return run_table1(spark, n_z=300)


def test_three_versions(trace):
    assert [v["version"] for v in trace["versions"]] == ["G0", "G1", "G2"]
    assert trace["versions"][0]["mode"] == "scratch"
    assert trace["versions"][1]["mode"] == "diff"
    assert trace["versions"][2]["mode"] == "diff"


def test_g0_distances(trace):
    v = trace["versions"][0]
    assert (v["dist_w1"], v["dist_w2"], v["dist_w3"]) == (2.0, 4.0, 6.0)


def test_g1_distances(trace):
    # (s,w1) 2→1: w1=1, w2 via w1 = 3, w3 = 5 (paper Table 1, G1 column)
    v = trace["versions"][1]
    assert (v["dist_w1"], v["dist_w2"], v["dist_w3"]) == (1.0, 3.0, 5.0)


def test_g2_distances(trace):
    # (s,w2) 10→1: w2=1, w3=3 (paper Table 1, G2 column)
    v = trace["versions"][2]
    assert (v["dist_w1"], v["dist_w2"], v["dist_w3"]) == (1.0, 1.0, 3.0)


def test_updates_touch_only_w_component(trace):
    """Differential updates must be tiny and independent of the z size."""
    for v in trace["versions"][1:]:
        assert v["affected_total"] <= 12  # the paper's "merely 30 updates"


def test_z_size_does_not_change_diff_work(spark):
    small = run_table1(spark, n_z=50)
    big = run_table1(spark, n_z=500)
    for s, b in zip(small["versions"][1:], big["versions"][1:]):
        assert s["affected_total"] == b["affected_total"]
