"""Tree edit distance (Definition 9's d; Figure 2 / Examples 9–10)."""
import pytest

from repro.core.treedist import (
    Node,
    relation_distance,
    relation_to_tree,
    tree_edit_distance,
    value_to_tree,
)


def leaf(lbl):
    return Node(lbl)


class TestTedBasics:
    def test_identical_trees(self):
        t = Node("a", [leaf("b"), leaf("c")])
        assert tree_edit_distance(t, t) == 0

    def test_single_rename(self):
        assert tree_edit_distance(leaf("a"), leaf("b")) == 1

    def test_insert_leaf(self):
        t1 = Node("a", [leaf("b")])
        t2 = Node("a", [leaf("b"), leaf("c")])
        assert tree_edit_distance(t1, t2) == 1

    def test_delete_subtree(self):
        t1 = Node("a", [Node("b", [leaf("c"), leaf("d")])])
        t2 = Node("a")
        assert tree_edit_distance(t1, t2) == 3

    def test_symmetry(self):
        t1 = Node("a", [leaf("x"), Node("y", [leaf("z")])])
        t2 = Node("a", [leaf("w")])
        assert tree_edit_distance(t1, t2) == tree_edit_distance(t2, t1)

    def test_triangle_inequality_samples(self):
        a = Node("r", [leaf("1"), leaf("2")])
        b = Node("r", [leaf("2"), leaf("3")])
        c = Node("r", [leaf("4")])
        dab = tree_edit_distance(a, b)
        dbc = tree_edit_distance(b, c)
        dac = tree_edit_distance(a, c)
        assert dac <= dab + dbc


class TestRelationEncoding:
    def test_flat_rows(self):
        t = relation_to_tree([{"x": 1}, {"x": 2}])
        assert t.label == "R" and len(t.children) == 2

    def test_nested_rows(self):
        t = relation_to_tree([{"city": "LA", "nList": [{"name": "Sue"}]}])
        assert t.size() == 6  # R → t → {city leaf, nList → t → name leaf}

    def test_canonical_ordering_makes_order_irrelevant(self):
        r1 = [{"x": 1}, {"x": 2}]
        r2 = [{"x": 2}, {"x": 1}]
        assert relation_distance(r1, r2) == 0

    def test_value_leaf_labels_include_value(self):
        n = value_to_tree("x", 5)
        assert n.label == "x=5"


class TestExample9:
    """Figure 2: SR_σ's result T₂ changes the original result more than
    SR_Fσ's result T₃ — d(T₁,T₂) > d(T₁,T₃)."""

    T1 = [{"city": "LA", "nList": [{"name": "Sue"}]}]
    T2 = [
        {"city": "LA", "nList": [{"name": "Sue"}]},
        {"city": "NY", "nList": [{"name": "Sue"}]},
        {"city": "SF", "nList": [{"name": "Peter"}]},
    ]
    T3 = [
        {"city": "LA", "nList": [{"name": "Sue"}, {"name": "Peter"}]},
        {"city": "NY", "nList": [{"name": "Sue"}]},
    ]

    def test_t2_further_than_t3(self):
        d12 = relation_distance(self.T1, self.T2)
        d13 = relation_distance(self.T1, self.T3)
        assert d12 > d13

    def test_distances_positive(self):
        assert relation_distance(self.T1, self.T2) > 0
        assert relation_distance(self.T1, self.T3) > 0

    def test_self_distance_zero(self):
        assert relation_distance(self.T1, self.T1) == 0
