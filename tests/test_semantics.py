"""Tests of the reference semantics (Section V-B) on hand-checked graphs."""
import pytest

from repro.tpg.model import ITPGData
from repro.trpq import ast
from repro.trpq.semantics import LocalTPG, eval_path, holds


@pytest.fixture(scope="module")
def g():
    """a --e--> b over Ω=[1,5]; a:[1,4], b:[2,5], e:[2,3]; a.p=v @ [1,2]."""
    data = ITPGData.build(
        (1, 5),
        [
            ("a", "L1", [(1, 4)], {"p": [("v", 1, 2)]}),
            ("b", "L2", [(2, 5)], {}),
        ],
        [("e", "a", "b", "knows", [(2, 3)], {})],
    )
    return LocalTPG.from_data(data)


class TestAxes:
    def test_F_ignores_existence(self, g):
        # F is defined on PTO(G): edge hops exist at every t, even when
        # the edge does not exist there (the paper's navigation domain).
        rel = eval_path(g, ast.F)
        assert ("a", 1, "e", 1) in rel  # e does not exist at 1 — still navigable
        assert ("e", 5, "b", 5) in rel
        assert all(t1 == t2 for _, t1, _, t2 in rel)

    def test_F_shape(self, g):
        rel = eval_path(g, ast.F)
        # (src→e) and (e→tgt) for each t: 2 hops × 5 time points
        assert len(rel) == 10

    def test_B_is_reverse_structural(self, g):
        rel = eval_path(g, ast.B)
        assert ("b", 2, "e", 2) in rel
        assert ("e", 2, "a", 2) in rel

    def test_N_stays_on_object(self, g):
        rel = eval_path(g, ast.N)
        assert ("a", 1, "a", 2) in rel
        assert ("a", 5, "a", 6) not in rel  # outside Ω
        assert all(o1 == o2 for o1, _, o2, _ in rel)

    def test_P(self, g):
        rel = eval_path(g, ast.P)
        assert ("b", 3, "b", 2) in rel
        assert ("b", 1, "b", 0) not in rel


class TestTests:
    def test_node_edge(self, g):
        assert holds(g, ast.NODE, "a", 1)
        assert not holds(g, ast.NODE, "e", 1)
        assert holds(g, ast.EDGE, "e", 1)

    def test_label(self, g):
        assert holds(g, ast.LabelTest("L1"), "a", 1)
        assert not holds(g, ast.LabelTest("L1"), "b", 1)

    def test_label_is_time_invariant(self, g):
        # λ does not depend on t, even where the object does not exist
        assert holds(g, ast.LabelTest("knows"), "e", 5)

    def test_exists(self, g):
        assert holds(g, ast.EXISTS, "e", 2)
        assert not holds(g, ast.EXISTS, "e", 4)

    def test_prop(self, g):
        assert holds(g, ast.PropTest("p", "v"), "a", 2)
        assert not holds(g, ast.PropTest("p", "v"), "a", 3)  # undefined there
        assert not holds(g, ast.PropTest("p", "w"), "a", 1)

    def test_lt(self, g):
        assert holds(g, ast.LtTest(3), "a", 2)
        assert not holds(g, ast.LtTest(3), "a", 3)

    def test_boolean_connectives(self, g):
        t = ast.AndTest(ast.NODE, ast.NotTest(ast.ExistsTest()))
        assert holds(g, t, "a", 5)  # a does not exist at 5
        assert not holds(g, t, "a", 4)
        assert holds(g, ast.OrTest(ast.LtTest(0), ast.NODE), "a", 4)

    def test_path_condition(self, g):
        # ?(F/(knows ∧ ∃)): an existing 'knows' edge starts here
        t = ast.PathTest(ast.seq(ast.F, ast.AndTest(ast.LabelTest("knows"), ast.EXISTS)))
        assert holds(g, t, "a", 2)
        assert not holds(g, t, "a", 4)  # edge gone at 4
        assert not holds(g, t, "b", 2)  # b is the target, F starts at src

    def test_test_relation_is_diagonal(self, g):
        rel = eval_path(g, ast.TestExpr(ast.EXISTS))
        assert all(o1 == o2 and t1 == t2 for o1, t1, o2, t2 in rel)
        assert len(rel) == 4 + 4 + 2  # a:[1,4], b:[2,5], e:[2,3]


class TestCombinators:
    def test_concat(self, g):
        rel = eval_path(g, ast.seq(ast.F, ast.F))
        assert ("a", 2, "b", 2) in rel

    def test_union(self, g):
        rel = eval_path(g, ast.union(ast.N, ast.P))
        assert ("a", 2, "a", 3) in rel and ("a", 2, "a", 1) in rel

    def test_repeat_exact(self, g):
        rel = eval_path(g, ast.Repeat(ast.N, 3, 3))
        assert rel == {(o, t, o, t + 3) for o in ("a", "b", "e") for t in (1, 2)}

    def test_repeat_zero_is_identity(self, g):
        rel = eval_path(g, ast.Repeat(ast.N, 0, 0))
        assert rel == {(o, t, o, t) for o in ("a", "b", "e") for t in range(1, 6)}

    def test_repeat_range(self, g):
        rel = eval_path(g, ast.Repeat(ast.N, 1, 2))
        assert ("a", 1, "a", 2) in rel and ("a", 1, "a", 3) in rel
        assert ("a", 1, "a", 4) not in rel

    def test_kleene_star(self, g):
        rel = eval_path(g, ast.Repeat(ast.N, 0, None))
        assert ("a", 1, "a", 5) in rel and ("a", 1, "a", 1) in rel
        assert ("a", 3, "a", 2) not in rel

    def test_star_with_exists_respects_gaps(self):
        # object exists [1,2] and [4,5]: (N/∃)* cannot cross the gap at 3
        data = ITPGData.build((1, 5), [("a", "L", [(1, 2), (4, 5)], {})], [])
        g2 = LocalTPG.from_data(data)
        rel = eval_path(g2, ast.Repeat(ast.seq(ast.N, ast.EXISTS), 0, None))
        assert ("a", 1, "a", 2) in rel
        assert ("a", 1, "a", 4) not in rel
        assert ("a", 4, "a", 5) in rel

    def test_room_unavailable_idiom(self):
        # the paper's (Room ∧ ¬∃)/(N/¬∃)[0,_]/(Room ∧ ∃) example
        data = ITPGData.build((1, 6), [("r", "Room", [(1, 1), (5, 6)], {})], [])
        g2 = LocalTPG.from_data(data)
        room = ast.LabelTest("Room")
        path = ast.seq(
            ast.AndTest(room, ast.NotTest(ast.EXISTS)),
            ast.Repeat(ast.seq(ast.N, ast.NotTest(ast.EXISTS)), 0, None),
            ast.seq(ast.N, ast.EXISTS),
        )
        rel = eval_path(g2, path)
        # from any unavailable time 2..4, reach the reopening at 5
        assert {(o1, t1, o2, t2) for o1, t1, o2, t2 in rel} == {
            ("r", t, "r", 5) for t in (2, 3, 4)
        }


class TestSubsetSumReduction:
    """Appendix D: (N[a1,a1]+N[0,0])/…/(N[an,an]+N[0,0]) reaches (v,0,v,S)
    iff some subset of A sums to S — an adversarial stress test of
    Repeat/Union against brute force."""

    @staticmethod
    def reduction(A):
        S_max = sum(A)
        data = ITPGData.build((0, S_max), [("v", "l", [(0, S_max)], {})], [])
        g = LocalTPG.from_data(data)
        path = ast.seq(
            *[
                ast.union(ast.Repeat(ast.N, a, a), ast.Repeat(ast.N, 0, 0))
                for a in A
            ]
        )
        return g, eval_path(g, path)

    @pytest.mark.parametrize("A", [(1, 2, 3), (2, 5, 7), (3, 3, 4), (1,)])
    def test_matches_bruteforce(self, A):
        _, rel = self.reduction(A)
        reachable = {t2 for o1, t1, o2, t2 in rel if t1 == 0}
        expected = set()
        for mask in range(2 ** len(A)):
            expected.add(sum(a for i, a in enumerate(A) if mask >> i & 1))
        assert reachable == expected


class TestBitPredicateReduction:
    """Appendix D (PSPACE proof, Step 1): the test
    r_i = ?(P[2^i,2^i][0,_]/(<2^i ∧ ¬<2^{i-1})) holds at (v,t) iff the i-th
    bit of t is 1 — exercises nested Repeat + PathTest."""

    @pytest.mark.parametrize("i", [1, 2, 3])
    def test_bit(self, i):
        n = 4
        data = ITPGData.build((0, 2**n - 1), [("v", "l", [(0, 2**n - 1)], {})], [])
        g = LocalTPG.from_data(data)
        r_i = ast.PathTest(
            ast.seq(
                ast.Repeat(ast.Repeat(ast.P, 2**i, 2**i), 0, None),
                ast.AndTest(ast.LtTest(2**i), ast.NotTest(ast.LtTest(2 ** (i - 1)))),
            )
        )
        for t in range(2**n):
            assert holds(g, r_i, "v", t) == bool(t >> (i - 1) & 1), (i, t)
