"""Unit tests for the logical plan layer (repro.core.plan) — no Spark jobs."""
import pytest

from repro.core import plan as P
from repro.core.spec import smax, smin, spec_of


class FakeDF:
    """Stands in for a DataFrame where only .columns is consulted."""

    def __init__(self, cols):
        self.columns = list(cols)


def rel(*cols):
    return P.Relation(FakeDF(cols))


class TestSelectItemName:
    @pytest.mark.parametrize("item,name", [
        ("a", "a"),
        ("  a  ", "a"),
        ("t.a", "a"),
        ("a AS b", "b"),
        ("sum(x) AS s", "s"),
        ("sum(x) as s", "s"),
        ("sum(x)", None),
        ("a + b", None),
    ])
    def test_cases(self, item, name):
        assert P.select_item_name(item) == name


class TestOutputColumns:
    def test_relation(self):
        assert P.output_columns(rel("a", "b")) == ["a", "b"]

    def test_project(self):
        p = P.Project(rel("a", "b", "c"), ("a", "b AS bb"))
        assert P.output_columns(p) == ["a", "bb"]

    def test_project_star(self):
        p = P.Project(rel("a", "b"), ("*", "a AS a2"))
        assert P.output_columns(p) == ["a", "b", "a2"]

    def test_project_unknown_expr_placeholder(self):
        p = P.Project(rel("a"), ("a + 1",))
        assert P.output_columns(p) == ["<expr:a + 1>"]

    def test_filter_sort_limit_passthrough(self):
        r = rel("a")
        assert P.output_columns(P.Filter(r, "a > 1")) == ["a"]
        assert P.output_columns(P.Sort(r, "a")) == ["a"]
        assert P.output_columns(P.Limit(r, 3)) == ["a"]

    def test_skyline_passthrough(self):
        s = P.Skyline(rel("a", "b"), spec_of(smin("a")))
        assert P.output_columns(s) == ["a", "b"]

    def test_join_using_dedupes_keys(self):
        j = P.Join(rel("k", "a"), rel("k", "b"), on=("k",))
        assert P.output_columns(j) == ["k", "a", "b"]


class TestJoinValidation:
    def test_bad_non_reductive_rejected(self):
        with pytest.raises(ValueError):
            P.Join(rel("a"), rel("b"), on=("a",), non_reductive="both")

    @pytest.mark.parametrize("side", [None, "left", "right"])
    def test_valid_sides(self, side):
        P.Join(rel("a"), rel("b"), on=("a",), non_reductive=side)


class TestTransformUp:
    def test_identity(self):
        tree = P.Skyline(P.Filter(rel("a"), "a > 0"), spec_of(smin("a")))
        assert P.transform_up(tree, lambda n: n) is tree

    def test_bottom_up_order(self):
        visited = []
        tree = P.Skyline(P.Filter(rel("a"), "a > 0"), spec_of(smin("a")))
        P.transform_up(tree, lambda n: (visited.append(type(n).__name__), n)[1])
        assert visited == ["Relation", "Filter", "Skyline"]

    def test_child_replacement_rebuilds_ancestors(self):
        r = rel("a")
        tree = P.Skyline(P.Filter(r, "a > 0"), spec_of(smin("a")))

        def rule(n):
            if isinstance(n, P.Filter):
                return P.Filter(n.child, "a > 1")
            return n

        new = P.transform_up(tree, rule)
        assert new is not tree
        assert new.child.condition == "a > 1"
        assert new.child.child is r

    def test_join_children_both_visited(self):
        names = []
        j = P.Join(rel("a"), rel("b"), on=())
        P.transform_up(j, lambda n: (names.append(type(n).__name__), n)[1])
        assert names == ["Relation", "Relation", "Join"]
