"""Interval evaluator (Section VI) vs the reference semantics, plus its
fragment boundaries and the coalesced-output conventions of Table II."""
import pytest

from repro.trpq import ast
from repro.trpq import queries as Q
from repro.trpq.interval_eval import IntervalEvaluator, UnsupportedFragment
from repro.trpq.match import (
    eval_match_interval,
    eval_match_local,
    out_columns,
)
from repro.trpq.semantics import eval_path as ref_eval
from tests.conftest import ALL_QUERIES


@pytest.mark.parametrize("name", ALL_QUERIES)
def test_queries_match_reference(name, fig1_interval_results, fig1_expected):
    assert fig1_interval_results[name] == fig1_expected[name]


@pytest.mark.parametrize("name", ("Q1", "Q2", "Q5", "Q6", "Q8", "Q9", "Q10", "Q11", "Q12"))
def test_gen_graph_matches_reference(name, gen_interval_ev, gen_local):
    """Same check on a generated contact-tracing graph."""
    q = Q.query(name)
    got = {
        tuple(r)
        for r in eval_match_interval(gen_interval_ev, q)
        .points()
        .select(*out_columns(q))
        .collect()
    }
    assert got == eval_match_local(gen_local, q)


class TestLinkRelations:
    """eval_link against the reference ⟦·⟧ (expanded to points)."""

    LINKS = [
        ast.seq(ast.TestExpr(ast.LabelTest("Person")), ast.F),
        ast.seq(ast.TestExpr(ast.NODE), ast.F, ast.AndTest(ast.LabelTest("meets"), ast.EXISTS), ast.F),
        ast.seq(ast.TestExpr(ast.EXISTS), ast.Repeat(ast.seq(ast.N, ast.EXISTS), 0, None)),
        ast.seq(ast.TestExpr(ast.EXISTS), ast.Repeat(ast.seq(ast.P, ast.EXISTS), 1, 3)),
        ast.seq(ast.TestExpr(ast.EXISTS), ast.Repeat(ast.seq(ast.N, ast.EXISTS), 2, 2), ast.TestExpr(ast.EXISTS)),
        ast.seq(ast.TestExpr(ast.PropTest("test", "pos")), ast.P, ast.TestExpr(ast.EXISTS)),
        ast.seq(
            ast.TestExpr(ast.NODE),
            ast.union(
                ast.seq(ast.F, ast.AndTest(ast.LabelTest("meets"), ast.EXISTS), ast.F),
                ast.seq(ast.F, ast.AndTest(ast.LabelTest("visits"), ast.EXISTS), ast.F),
            ),
        ),
        ast.seq(ast.TestExpr(ast.NotTest(ast.EXISTS)), ast.N),
        ast.seq(ast.TestExpr(ast.AndTest(ast.NODE, ast.LtTest(5))), ast.Repeat(ast.N, 0, 3)),
        ast.seq(ast.TestExpr(ast.EXISTS), ast.Repeat(ast.P, 2, None)),
    ]

    @pytest.mark.parametrize("idx", range(len(LINKS)))
    def test_link_matches_reference(self, idx, fig1_interval_ev, fig1_local):
        link = self.LINKS[idx]
        lr = fig1_interval_ev.eval_link(link)
        got = set()
        for row in lr.lifted().collect():
            for t1 in range(row["s1"], row["e1"] + 1):
                lo = row["dmin"] if row["dmin"] is not None else -10**9
                hi = row["dmax"] if row["dmax"] is not None else 10**9
                for t2 in range(max(row["s2"], t1 + lo), min(row["e2"], t1 + hi) + 1):
                    got.add((row["o1"], t1, row["o2"], t2))
        assert got == ref_eval(fig1_local, link)


class TestFragmentBoundaries:
    def test_path_condition_unsupported(self, fig1_interval_ev):
        link = ast.seq(
            ast.TestExpr(ast.PathTest(ast.F)), ast.F
        )
        with pytest.raises(UnsupportedFragment):
            fig1_interval_ev.eval_link(link).df.count()

    def test_structural_repeat_unsupported(self, fig1_interval_ev):
        link = ast.seq(ast.TestExpr(ast.NODE), ast.Repeat(ast.seq(ast.F, ast.F), 0, None))
        with pytest.raises(UnsupportedFragment):
            fig1_interval_ev.eval_link(link)

    def test_two_temporal_segments_unsupported(self, fig1_interval_ev):
        link = ast.seq(
            ast.TestExpr(ast.NODE),
            ast.Repeat(ast.seq(ast.N, ast.EXISTS), 0, None),
            ast.F,
            ast.F,
            ast.Repeat(ast.seq(ast.P, ast.EXISTS), 0, None),
        )
        with pytest.raises(UnsupportedFragment):
            fig1_interval_ev.eval_link(link)

    def test_two_temporal_links_unsupported(self, fig1_interval_ev):
        from repro.trpq.parser import parse_match

        q = parse_match("MATCH (x)-/NEXT/-(y)-/PREV/-(z) ON g")
        with pytest.raises(UnsupportedFragment):
            eval_match_interval(fig1_interval_ev, q)


class TestCoalescedOutput:
    def test_q5_coalesced_matches_paper(self, fig1_interval_ev):
        """Section VI's coalesced Q5 table: two interval rows."""
        ib = eval_match_interval(fig1_interval_ev, Q.query("Q5"))
        rows = {
            (r["x"], r["z"], r["y"], r["s"], r["e"])
            for r in ib.coalesced().collect()
        }
        assert rows == {
            ("n1", "e1", "n2", 5, 6),
            ("n2", "e2", "n3", 1, 2),
        }

    def test_q1_coalesced_is_existence_intervals(self, fig1_interval_ev):
        ib = eval_match_interval(fig1_interval_ev, Q.query("Q1"))
        rows = {(r["x"], r["s"], r["e"]) for r in ib.coalesced().collect()}
        assert rows == {
            ("n1", 1, 9), ("n2", 1, 9), ("n3", 1, 7), ("n6", 2, 9), ("n7", 4, 9)
        }

    def test_coalesced_requires_aligned(self, fig1_interval_ev):
        ib = eval_match_interval(fig1_interval_ev, Q.query("Q6"))
        with pytest.raises(UnsupportedFragment):
            ib.coalesced()

    @pytest.mark.parametrize("name", Q.STRUCTURAL_ONLY)
    def test_structural_queries_are_aligned(self, name, fig1_interval_ev):
        ib = eval_match_interval(fig1_interval_ev, Q.query(name))
        assert not ib.offset

    @pytest.mark.parametrize("name", [n for n in Q.TABLE2 if n not in Q.STRUCTURAL_ONLY])
    def test_temporal_queries_are_offset(self, name, fig1_interval_ev):
        ib = eval_match_interval(fig1_interval_ev, Q.query(name))
        assert ib.offset


class TestVariableSides:
    def test_q7_pre_post_split(self, fig1_interval_ev):
        ib = eval_match_interval(fig1_interval_ev, Q.query("Q7"))
        assert ib.vars_pre == ["x"]
        assert ib.vars_post == ["y", "z"]

    def test_q9_only_pre(self, fig1_interval_ev):
        ib = eval_match_interval(fig1_interval_ev, Q.query("Q9"))
        assert ib.vars_pre == ["x"] and ib.vars_post == []

    def test_intro_pre_and_post(self, fig1_interval_ev):
        ib = eval_match_interval(fig1_interval_ev, Q.query("INTRO"))
        assert ib.vars_pre == ["x"] and ib.vars_post == ["y"]
