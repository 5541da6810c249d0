"""Contact-tracing generator: determinism, model invariants, Table I shape."""
import pytest

from repro.tpg import interval as iv
from repro.tpg.generator import G_LITE, contact_tracing, g_lite


@pytest.fixture(scope="module")
def small():
    return contact_tracing(persons=50, positivity=0.2, seed=3)


class TestDeterminism:
    def test_same_seed_same_graph(self):
        a = contact_tracing(persons=25, seed=11)
        b = contact_tracing(persons=25, seed=11)
        assert a.objects.equals(b.objects)
        assert a.exist.equals(b.exist)
        assert a.props.equals(b.props)

    def test_different_seed_differs(self):
        a = contact_tracing(persons=25, seed=1)
        b = contact_tracing(persons=25, seed=2)
        assert not a.exist.equals(b.exist)


class TestInvariants:
    def test_validates(self, small):
        small.validate()  # edge ⊆ endpoints, coalesced families, props ⊆ ξ

    def test_omega(self, small):
        assert small.omega == (1, 48)

    def test_labels(self, small):
        labels = set(small.objects["label"])
        assert labels <= {"Person", "Room", "visits", "meets"}
        assert "Person" in labels

    def test_meets_bidirectional(self, small):
        """The paper's meets edges are bi-directional: every directed meets
        edge has a reverse twin over the same interval."""
        edges = small.objects[small.objects["label"] == "meets"]
        fam = {}
        for eid, s, e in zip(small.exist["id"], small.exist["s"], small.exist["e"]):
            fam.setdefault(eid, []).append((s, e))
        pairs = {
            (r["src"], r["tgt"], tuple(sorted(fam[r["id"]])))
            for _, r in edges.iterrows()
        }
        assert pairs == {(t, s, f) for s, t, f in pairs}

    def test_risk_fixed_for_life(self, small):
        """risk never changes over a node's lifespan (paper Sec VII-A)."""
        risk = small.props[small.props["p"] == "risk"]
        for _, grp in risk.groupby("id"):
            assert grp["v"].nunique() == 1

    def test_test_pos_until_end_of_life(self, small):
        """once positive, positive for the remainder of the lifespan."""
        fam = {}
        for oid, s, e in zip(small.exist["id"], small.exist["s"], small.exist["e"]):
            fam.setdefault(oid, []).append((int(s), int(e)))
        pos = small.props[(small.props["p"] == "test") & (small.props["v"] == "pos")]
        for oid, grp in pos.groupby("id"):
            last_pos = max(int(e) for e in grp["e"])
            last_alive = max(e for _, e in fam[oid])
            assert last_pos == last_alive
            # and positivity is contiguous to the end (within existence)
            pos_fam = iv.coalesce(zip(grp["s"].astype(int), grp["e"].astype(int)))
            first_pos = pos_fam[0][0]
            tail = iv.intersect(fam[oid], [(first_pos, last_alive)])
            assert pos_fam == tail

    def test_positivity_rate(self):
        g = contact_tracing(persons=400, positivity=0.10, seed=0)
        pos_ids = set(
            g.props[(g.props["p"] == "test") & (g.props["v"] == "pos")]["id"]
        )
        # onset is uniform in Ω, so some selected persons never turn positive
        # within their lifespan; the realised rate is ≤ nominal and > 0.
        assert 0 < len(pos_ids) <= 0.15 * 400

    def test_room_validity_spans_visits(self, small):
        fam = {}
        for oid, s, e in zip(small.exist["id"], small.exist["s"], small.exist["e"]):
            fam.setdefault(oid, []).append((int(s), int(e)))
        visits = small.objects[small.objects["label"] == "visits"]
        for _, r in visits.iterrows():
            assert iv.covered_by(fam[r["id"]], fam[r["tgt"]])


class TestTable1Shape:
    def test_glite_ladder_monotone(self):
        """Table I shape: node and edge counts grow with person count, and
        edges grow superlinearly (the paper's co-presence quadratic)."""
        stats = [g_lite(n).stats() for n in ("G1", "G3", "G6")]
        persons = [G_LITE[n] for n in ("G1", "G3", "G6")]
        assert stats[0]["nodes"] < stats[1]["nodes"] < stats[2]["nodes"]
        assert stats[0]["edges"] < stats[1]["edges"] < stats[2]["edges"]
        # superlinear: edges/person grows along the ladder
        ratio = [s["edges"] / p for s, p in zip(stats, persons)]
        assert ratio[0] < ratio[2]

    def test_states_per_node_above_one(self, small):
        st = small.stats()
        assert st["temp_nodes"] > st["nodes"]

    def test_known_g1_stats(self):
        """Pin the G1-lite statistics (regression guard for determinism)."""
        st = g_lite("G1").stats()
        assert st == {"nodes": 36, "edges": 28, "temp_nodes": 59, "temp_edges": 28}
