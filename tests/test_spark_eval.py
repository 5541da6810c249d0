"""Point-based Spark evaluator (Theorem C.1) vs the reference semantics."""
import pytest

from repro.trpq import ast
from repro.trpq.semantics import eval_path as ref_eval
from tests.conftest import ALL_QUERIES


def spark_rel(ev, path):
    return {tuple(r) for r in ev.rel(path).collect()}


@pytest.mark.parametrize("name", ALL_QUERIES)
def test_queries_match_reference(name, fig1_point_results, fig1_expected):
    assert fig1_point_results[name] == fig1_expected[name]


AXES = [ast.F, ast.B, ast.N, ast.P]
EXPRESSIONS = [
    ast.TestExpr(ast.NODE),
    ast.TestExpr(ast.EDGE),
    ast.TestExpr(ast.EXISTS),
    ast.TestExpr(ast.LabelTest("Person")),
    ast.TestExpr(ast.LabelTest("meets")),
    ast.TestExpr(ast.PropTest("risk", "high")),
    ast.TestExpr(ast.LtTest(4)),
    ast.TestExpr(ast.NotTest(ast.EXISTS)),
    ast.TestExpr(ast.AndTest(ast.NODE, ast.NotTest(ast.LtTest(5)))),
    ast.TestExpr(ast.OrTest(ast.LabelTest("Room"), ast.LabelTest("visits"))),
    ast.seq(ast.F, ast.F),
    ast.seq(ast.B, ast.B),
    ast.seq(ast.N, ast.P),
    ast.union(ast.N, ast.P),
    ast.Repeat(ast.N, 2, 2),
    ast.Repeat(ast.N, 0, 3),
    ast.Repeat(ast.N, 2, None),
    ast.Repeat(ast.seq(ast.N, ast.EXISTS), 0, None),
    ast.Repeat(ast.seq(ast.P, ast.EXISTS), 1, 3),
    ast.seq(ast.F, ast.AndTest(ast.LabelTest("visits"), ast.EXISTS), ast.F),
    ast.TestExpr(ast.PathTest(ast.seq(ast.F, ast.AndTest(ast.LabelTest("meets"), ast.EXISTS)))),
    ast.Repeat(ast.union(ast.F, ast.B), 0, 2),
    ast.Repeat(ast.Repeat(ast.P, 2, 2), 0, None),
]


@pytest.mark.parametrize("idx", range(len(AXES)))
def test_axes_match_reference(idx, fig1_point_ev, fig1_local):
    p = AXES[idx]
    assert spark_rel(fig1_point_ev, p) == ref_eval(fig1_local, p)


@pytest.mark.parametrize("idx", range(len(EXPRESSIONS)))
def test_expressions_match_reference(idx, fig1_point_ev, fig1_local):
    p = EXPRESSIONS[idx]
    assert spark_rel(fig1_point_ev, p) == ref_eval(fig1_local, p)


class TestRepetitionAlgebra:
    """The squaring/doubling recursions (Algorithms 1–2) against the
    reference on exact bounds — the trickiest part of the evaluator."""

    @pytest.mark.parametrize("n", [0, 1, 2, 3, 5])
    def test_exact_power(self, n, fig1_point_ev, fig1_local):
        p = ast.Repeat(ast.N, n, n)
        assert spark_rel(fig1_point_ev, p) == ref_eval(fig1_local, p)

    @pytest.mark.parametrize("lo,hi", [(0, 1), (0, 4), (1, 3), (2, 5), (3, 3)])
    def test_bounded(self, lo, hi, fig1_point_ev, fig1_local):
        p = ast.Repeat(ast.P, lo, hi)
        assert spark_rel(fig1_point_ev, p) == ref_eval(fig1_local, p)

    @pytest.mark.parametrize("lo", [0, 1, 4])
    def test_unbounded(self, lo, fig1_point_ev, fig1_local):
        p = ast.Repeat(ast.N, lo, None)
        assert spark_rel(fig1_point_ev, p) == ref_eval(fig1_local, p)

    def test_no_overshoot(self, fig1_point_ev):
        """[0,2] must not include 3-step tuples (doubling overshoot bug)."""
        rel = spark_rel(fig1_point_ev, ast.Repeat(ast.N, 0, 2))
        assert all(t2 - t1 <= 2 for _, t1, _, t2 in rel)


class TestSubsetSumOnSpark:
    @pytest.mark.parametrize("A,S,expected", [
        ((2, 5, 7), 9, True),   # 2+7
        ((2, 5, 7), 6, False),
        ((3, 3, 4), 10, True),
        ((3, 3, 4), 5, False),
    ])
    def test_reduction(self, spark, A, S, expected):
        from repro.tpg.model import ITPGData, SparkITPG
        from repro.trpq.spark_eval import PointEvaluator

        smax = sum(A)
        data = ITPGData.build((0, smax), [("v", "l", [(0, smax)], {})], [])
        ev = PointEvaluator(SparkITPG.from_data(spark, data).to_tpg())
        path = ast.seq(
            *[ast.union(ast.Repeat(ast.N, a, a), ast.Repeat(ast.N, 0, 0)) for a in A]
        )
        rel = spark_rel(ev, path)
        assert (("v", 0, "v", S) in rel) is expected


def test_gen_graph_queries_match_reference(gen_point_ev, gen_local):
    """Cross-check on a generated contact-tracing graph (not just Figure 1)."""
    from repro.trpq import queries as Q
    from repro.trpq.match import eval_match_local, eval_match_point

    for name in ("Q1", "Q5", "Q6", "Q9", "Q11"):
        q = Q.query(name)
        got = {tuple(r) for r in eval_match_point(gen_point_ev, q).collect()}
        assert got == eval_match_local(gen_local, q), name
