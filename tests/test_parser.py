"""Tests for the practical-syntax parser and its lowering to NavL[PC,NOI]."""
import pytest

from repro.trpq import ast
from repro.trpq.parser import ParseError, parse_match, parse_path
from repro.trpq.queries import QUERIES


class TestPathParsing:
    def test_axes(self):
        assert parse_path("FWD") == ast.F
        assert parse_path("BWD") == ast.B

    def test_temporal_steps_get_exists(self):
        # practical NEXT lowers to (N/∃) per Section V-A
        assert parse_path("NEXT") == ast.seq(ast.N, ast.EXISTS)
        assert parse_path("PREV") == ast.seq(ast.P, ast.EXISTS)

    def test_label_test_gets_exists(self):
        assert parse_path(":meets") == ast.TestExpr(
            ast.AndTest(ast.LabelTest("meets"), ast.EXISTS)
        )

    def test_concat(self):
        p = parse_path("FWD/:meets/FWD")
        assert isinstance(p, ast.Seq)
        assert len(p.parts) == 3

    def test_union_lower_precedence_than_concat(self):
        p = parse_path("FWD/:a/FWD + BWD/:b/BWD")
        assert isinstance(p, ast.Union)
        assert len(p.parts) == 2
        assert all(isinstance(b, ast.Seq) for b in p.parts)

    def test_parentheses(self):
        p = parse_path("(FWD + BWD)/NEXT")
        assert isinstance(p, ast.Seq)
        assert isinstance(p.parts[0], ast.Union)

    def test_kleene_star(self):
        p = parse_path("NEXT*")
        assert p == ast.Repeat(ast.seq(ast.N, ast.EXISTS), 0, None)

    def test_bounded_repeat(self):
        p = parse_path("NEXT[0,12]")
        assert p == ast.Repeat(ast.seq(ast.N, ast.EXISTS), 0, 12)

    def test_unbounded_repeat(self):
        p = parse_path("PREV[3,_]")
        assert p == ast.Repeat(ast.seq(ast.P, ast.EXISTS), 3, None)

    def test_repeat_of_group(self):
        p = parse_path("(FWD/:a/FWD)[1,2]")
        assert isinstance(p, ast.Repeat)
        assert (p.lo, p.hi) == (1, 2)

    def test_property_test_in_path(self):
        p = parse_path("{test = 'pos'}")
        assert p == ast.TestExpr(ast.PropTest("test", "pos"))

    def test_bad_token(self):
        with pytest.raises(ParseError):
            parse_path("FWD//BWD")

    def test_trailing_garbage(self):
        with pytest.raises(ParseError):
            parse_path("FWD BWD")

    def test_bad_indicator_order(self):
        with pytest.raises(ValueError):
            parse_path("NEXT[5,2]")


class TestMatchParsing:
    def test_single_pattern(self):
        q = parse_match("MATCH (x:Person) ON g")
        assert q.graph == "g"
        assert q.vars == ["x"]
        assert len(q.patterns) == 1
        p = q.patterns[0]
        assert (p.var, p.kind, p.label) == ("x", "node", "Person")

    def test_pattern_test_includes_node_label_exists(self):
        q = parse_match("MATCH (x:Person) ON g")
        t = q.patterns[0].test()
        assert "Node" in str(t) and "Person" in str(t) and "E!" in str(t)

    def test_property_conditions(self):
        q = parse_match("MATCH (x:Person {risk = 'low' AND time < '10'}) ON g")
        assert q.patterns[0].conds == (("risk", "=", "low"), ("time", "<", "10"))

    def test_time_equality_lowering(self):
        q = parse_match("MATCH (x {time = '3'}) ON g")
        t = str(q.patterns[0].test())
        assert "<4" in t and "<3" in t  # (<k+1 ∧ ¬<k)

    def test_edge_link_expansion(self):
        q = parse_match("MATCH (x)-[z:meets]->(y) ON g")
        # chain: x, F, z(edge), F, y
        assert len(q.patterns) == 3
        assert q.patterns[1].kind == "edge"
        assert q.patterns[1].var == "z"
        assert q.links == [ast.F, ast.F]
        assert q.vars == ["x", "z", "y"]

    def test_anonymous_edge_link(self):
        q = parse_match("MATCH (x)-[:visits]->(y) ON g")
        assert q.patterns[1].var is None
        assert q.vars == ["x", "y"]

    def test_path_link(self):
        q = parse_match("MATCH (x)-/PREV/-(y) ON g")
        assert len(q.links) == 1
        assert q.links[0] == ast.seq(ast.P, ast.EXISTS)

    def test_chained_links(self):
        q = parse_match("MATCH (x)-/PREV/-(y)-[:visits]->(z) ON g")
        assert q.vars == ["x", "y", "z"]
        assert len(q.links) == 3  # PREV, F, F

    def test_anonymous_endpoint(self):
        q = parse_match("MATCH (x)-/NEXT/-({test = 'pos'}) ON g")
        assert q.vars == ["x"]

    def test_newlines_and_spacing(self):
        q = parse_match(
            "MATCH (x:Person {risk = 'high'})-\n  /FWD/:meets/FWD/NEXT*/-"
            "(y:Person {test = 'pos'})\nON contact_tracing"
        )
        assert q.vars == ["x", "y"]
        assert q.graph == "contact_tracing"

    def test_unquoted_value_rejected(self):
        with pytest.raises(ParseError, match="quoted"):
            parse_match("MATCH (x {risk = low}) ON g")

    def test_missing_on_rejected(self):
        with pytest.raises(ParseError):
            parse_match("MATCH (x)")

    def test_trailing_input_rejected(self):
        with pytest.raises(ParseError, match="trailing"):
            parse_match("MATCH (x) ON g extra")

    def test_time_gt_rejected(self):
        with pytest.raises(ParseError):
            parse_match("MATCH (x {risk < 'low'}) ON g")

    @pytest.mark.parametrize("name", sorted(QUERIES))
    def test_all_paper_queries_parse(self, name):
        q = parse_match(QUERIES[name])
        assert q.graph == "contact_tracing"
        assert q.vars


class TestAst:
    def test_axis_validation(self):
        with pytest.raises(ValueError):
            ast.Axis("X")

    def test_repeat_validation(self):
        with pytest.raises(ValueError):
            ast.Repeat(ast.F, 3, 1)
        with pytest.raises(ValueError):
            ast.Repeat(ast.F, -1, None)

    def test_seq_flattens(self):
        p = ast.seq(ast.F, ast.seq(ast.B, ast.N))
        assert isinstance(p, ast.Seq) and len(p.parts) == 3

    def test_seq_lifts_tests(self):
        p = ast.seq(ast.NODE, ast.F)
        assert isinstance(p.parts[0], ast.TestExpr)

    def test_singleton_helpers(self):
        assert ast.seq(ast.F) == ast.F
        assert ast.union(ast.F) == ast.F

    def test_conj(self):
        t = ast.conj(ast.NODE, ast.LabelTest("P"), ast.EXISTS)
        assert isinstance(t, ast.AndTest)

    def test_str_roundtrip_smoke(self):
        p = ast.Repeat(ast.seq(ast.N, ast.EXISTS), 0, 12)
        assert "[0,12]" in str(p)

    def test_hashable(self):
        assert hash(ast.seq(ast.F, ast.B)) == hash(ast.seq(ast.F, ast.B))
