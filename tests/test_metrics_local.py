"""Tests for local cohesiveness metrics (paper Eq. 1-6)."""
import math

import pytest

from repro.graph.local import AdjGraph
from repro.graph.metrics import (
    clustering_coefficient_local,
    diameter_local,
    edge_density_local,
    subgraph_metrics_local,
)
from tests.helpers import clique_edges, cycle_edges, path_edges


class TestDiameter:
    def test_single_vertex(self):
        assert diameter_local(AdjGraph(vertices=[1])) == 0

    def test_path(self):
        assert diameter_local(AdjGraph(path_edges(5))) == 4

    def test_cycle(self):
        assert diameter_local(AdjGraph(cycle_edges(8))) == 4

    def test_clique(self):
        assert diameter_local(AdjGraph(clique_edges(range(6)))) == 1

    def test_star(self):
        g = AdjGraph([(0, i) for i in range(1, 6)])
        assert diameter_local(g) == 2


class TestEdgeDensity:
    def test_clique_is_one(self):
        assert edge_density_local(AdjGraph(clique_edges(range(5)))) == 1.0

    def test_cycle(self):
        g = AdjGraph(cycle_edges(5))
        assert math.isclose(edge_density_local(g), 2 * 5 / (5 * 4))

    def test_degenerate(self):
        assert edge_density_local(AdjGraph(vertices=[1])) == 0.0


class TestClustering:
    def test_clique_is_one(self):
        assert clustering_coefficient_local(AdjGraph(clique_edges(range(5)))) == 1.0

    def test_triangle_free(self):
        assert clustering_coefficient_local(AdjGraph(cycle_edges(6))) == 0.0

    def test_paper_formula_small(self):
        # triangle plus pendant: c = (1 + 1 + 1/3 + 0) / 4... compute:
        # vertices 0,1,2 triangle; 2-3 pendant.
        g = AdjGraph([(0, 1), (1, 2), (0, 2), (2, 3)])
        # c(0)=1, c(1)=1, c(2)= 1/(3*2/2)=1/3, c(3)=0 (deg<2)
        expected = (1 + 1 + 1 / 3 + 0) / 4
        assert math.isclose(clustering_coefficient_local(g), expected)

    def test_empty(self):
        assert clustering_coefficient_local(AdjGraph()) == 0.0


class TestBundle:
    def test_subgraph_metrics_keys(self):
        m = subgraph_metrics_local(AdjGraph(clique_edges(range(4))))
        assert m == {
            "n": 4,
            "m": 6,
            "diameter": 1,
            "density": 1.0,
            "clustering": 1.0,
        }

    @pytest.mark.parametrize("n", [3, 5, 8])
    def test_cohesion_ordering_clique_vs_cycle(self, n):
        cl = subgraph_metrics_local(AdjGraph(clique_edges(range(n))))
        cy = subgraph_metrics_local(AdjGraph(cycle_edges(n)))
        assert cl["density"] >= cy["density"]
        assert cl["diameter"] <= cy["diameter"]
        assert cl["clustering"] >= cy["clustering"]
