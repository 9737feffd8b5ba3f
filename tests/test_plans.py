"""Tests for the plan structures (repro.core.plans)."""
import pytest

from repro.core.plans import (
    OrderPlan,
    TreeNode,
    TreePlan,
    all_tree_plans,
    join,
    leaf,
    left_deep_tree,
)


class TestOrderPlan:
    def test_valid(self):
        assert OrderPlan((2, 0, 1)).n == 3

    def test_rejects_non_permutation(self):
        with pytest.raises(ValueError):
            OrderPlan((0, 0, 1))
        with pytest.raises(ValueError):
            OrderPlan((1, 2))


class TestTreeNode:
    def test_leaf(self):
        n = leaf(3)
        assert n.is_leaf() and n.mask == 0b1000
        assert n.leaves_in_order() == (3,)

    def test_join(self):
        n = join(leaf(0), join(leaf(2), leaf(1)))
        assert n.mask == 0b111
        assert n.leaves_in_order() == (0, 2, 1)
        assert [x.mask for x in n.nodes()] == [0b001, 0b100, 0b010, 0b110, 0b111]

    def test_leaf_mask_mismatch(self):
        with pytest.raises(ValueError):
            TreeNode(mask=0b10, leaf=0)

    def test_leaf_with_children(self):
        with pytest.raises(ValueError):
            TreeNode(mask=0b11, leaf=0, left=leaf(1), right=leaf(0))

    def test_internal_requires_children(self):
        with pytest.raises(ValueError):
            TreeNode(mask=0b11)

    def test_overlapping_children(self):
        with pytest.raises(ValueError):
            TreeNode(mask=0b1, left=leaf(0), right=leaf(0))

    def test_internal_mask_mismatch(self):
        with pytest.raises(ValueError):
            TreeNode(mask=0b111, left=leaf(0), right=leaf(1))


class TestLeftDeep:
    def test_structure(self):
        t = left_deep_tree((2, 0, 1))
        assert t.root.leaves_in_order() == (2, 0, 1)
        assert t.root.right.is_leaf()
        assert t.n == 3


class TestEnumeration:
    def test_trees_distinct(self):
        plans = list(all_tree_plans(4))
        shapes = {
            tuple(sorted(n.mask for n in t.root.nodes() if not n.is_leaf()))
            for t in plans
        }
        assert len(shapes) == len(plans) == 15

    def test_all_cover_full_mask(self):
        for t in all_tree_plans(4):
            assert t.root.mask == 0b1111
