"""Benchmark: Table 1 — synthetic stand-in network construction.

Times the DAG + cardinality-fit generator for each paper network and
asserts the Table 1 shape targets hold.
"""
import pytest

from repro.bayesnet import networks
from repro.bayesnet.networks import PAPER_NETWORKS


@pytest.mark.parametrize("name", list(PAPER_NETWORKS))
def test_bench_network_build(benchmark, name):
    s = PAPER_NETWORKS[name]

    def build():
        return networks.synth_network(
            name, s.n_nodes, s.n_edges, s.target_params,
            card_cap=s.card_cap, d_max=s.d_max, seed=0, attempts=4,
        )

    net = benchmark.pedantic(build, rounds=1, iterations=1)
    assert net.n == s.n_nodes
    assert net.n_edges == s.n_edges
    assert abs(net.n_params - s.target_params) / s.target_params < 0.10
