"""Unit tests for the lattice, spanning tree, and memory models."""
import pytest

from repro.core.lattice import (
    Lattice,
    arraycube_memory_bound,
    mvdcube_memory_bound,
    roaring_bitmap_bound,
)


@pytest.fixture(scope="module")
def lat3():
    # The Example 3 lattice: nationality (5), company/area (4), gender (2).
    return Lattice(("nationality", "company/area", "gender"), (5, 4, 2))


def test_node_count(lat3):
    assert len(lat3.nodes) == 8  # 2^3


def test_root_has_no_parent(lat3):
    assert lat3.nodes[lat3.root].parent is None


def test_every_non_root_parent_has_one_more_dim(lat3):
    for dims, node in lat3.nodes.items():
        if node.parent is not None:
            assert len(node.parent) == len(dims) + 1
            assert dims < node.parent


def test_spanning_tree_prefers_small_parent(lat3):
    # {} (apex) should be computed from the smallest 1-dim node: gender.
    apex = lat3.nodes[frozenset()]
    assert lat3.names(apex.parent) == ("gender",)


def test_edge_label(lat3):
    apex = lat3.nodes[frozenset()]
    label = lat3.edge_label(frozenset())
    assert label in apex.parent
    assert lat3.edge_label(lat3.root) is None


def test_topological_order_parents_first(lat3):
    order = lat3.topological_order()
    pos = {d: i for i, d in enumerate(order)}
    for dims, node in lat3.nodes.items():
        if node.parent is not None:
            assert pos[node.parent] < pos[dims]


def test_estimated_cells(lat3):
    # +1 per dimension for the null value added by translation.
    assert lat3.estimated_cells(lat3.root) == 6 * 5 * 3
    assert lat3.estimated_cells(frozenset()) == 1


def test_names_by_position(lat3):
    assert lat3.names(frozenset({0, 2})) == ("nationality", "gender")


def test_children_of_root(lat3):
    kids = lat3.children_of(lat3.root)
    assert all(len(k) == 2 for k in kids) and len(kids) == 3


def test_single_dim_lattice():
    lat = Lattice(("d",), (7,))
    assert len(lat.nodes) == 2
    assert lat.nodes[frozenset()].parent == frozenset({0})


def test_arraycube_memory_bound_formula():
    # M_T = c^N + (d+1+c)^(N-1) — Section 4.3.
    assert arraycube_memory_bound(3, 100, 10) == 10**3 + 111**2
    assert arraycube_memory_bound(1, 5, 2) == 2 + 1


def test_roaring_bitmap_bound_formula():
    # 2Z + 9(u/65535 + 1) + 8 — [32] as quoted in Section 4.3.
    assert roaring_bitmap_bound(100, 65535) == 200 + 9 * 2 + 8


def test_mvdcube_memory_bound_monotone():
    small = mvdcube_memory_bound(2, 10, 2, 100, 2)
    big = mvdcube_memory_bound(3, 10, 2, 1000, 4)
    assert big > small > 0
