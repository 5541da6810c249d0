"""Synthetic contact-tracing TPG generator (Section VII-A substitute).

The paper builds its graphs from the Ojagh et al. COVID-19 campus
trajectory dataset, coarsened to 5-minute windows (48 time points), with
100 ``Room`` nodes, ``visits`` edges from room presence, bi-directional
``meets`` edges from co-presence at the remaining 310 locations, 18% of
persons marked high-risk for life, and a 2–10% positivity rate with onset
uniform in the temporal domain and ``test='pos'`` for the remainder of the
node's lifespan.

That trajectory data is not available offline, so this module simulates the
trajectories directly (documented in DESIGN.md §3): each person gets a
Poisson number of visit events at Zipf-popular locations; everything
downstream (validity intervals, edges, properties) follows the paper's
recipe verbatim. The Zipf hotspots reproduce the paper's superlinear growth
of ``meets`` edges with person count (Table I).

Deterministic in ``seed``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from . import interval as iv
from .model import ITPGData

#: G-lite ladder: the paper's G1..G10 person counts divided by 50 (DESIGN.md §3).
G_LITE: dict[str, int] = {
    "G1": 20, "G2": 40, "G3": 80, "G4": 120, "G5": 160,
    "G6": 200, "G7": 500, "G8": 1000, "G9": 1500, "G10": 2000,
}


def contact_tracing(
    *,
    persons: int = 1000,
    rooms: int = 100,
    other_locations: int = 310,
    slots: int = 48,
    positivity: float = 0.05,
    high_risk: float = 0.18,
    mean_events: float = 3.0,
    room_share: float = 0.35,
    zipf_alpha: float = 0.9,
    seed: int = 0,
) -> ITPGData:
    """Generate an interval-timestamped contact-tracing TPG.

    Persons visit locations (rooms or meet-locations) in events of 1–4
    slots; a person's validity is the coalescence of their events; rooms'
    validity spans first entrance to last exit; ``visits``/``meets`` edges
    and risk/test properties follow the paper (see module docstring).
    """
    g = np.random.default_rng(seed)
    omega = (1, slots)

    # --- trajectory events: (person, loc_kind, loc, s, e) -----------------
    n_events = 1 + g.poisson(mean_events - 1, persons)
    pid = np.repeat(np.arange(persons), n_events)
    m = len(pid)
    # 2..16 slots (10-80 min): long enough that temporal-navigation windows
    # bind up to m≈16 within one validity island, as in the paper's Fig. 4.
    dur = 1 + g.geometric(0.35, m).clip(max=15)
    start = g.integers(1, slots + 1, m)
    end = np.minimum(start + dur - 1, slots)
    is_room = g.random(m) < room_share
    room_w = 1.0 / np.arange(1, rooms + 1) ** zipf_alpha
    loc_w = 1.0 / np.arange(1, other_locations + 1) ** zipf_alpha
    loc = np.where(
        is_room,
        g.choice(rooms, m, p=room_w / room_w.sum()),
        g.choice(other_locations, m, p=loc_w / loc_w.sum()),
    )
    ev = pd.DataFrame(
        {"pid": pid, "room": is_room, "loc": loc, "s": start, "e": end}
    )

    # --- person nodes: validity = coalesced events; risk/test props -------
    hi = g.random(persons) < high_risk
    pos = g.random(persons) < positivity
    t_pos = g.integers(1, slots + 1, persons)
    nodes: list[tuple] = []
    person_exist: dict[int, list[iv.Interval]] = {}
    for p, grp in ev.groupby("pid"):
        fam = iv.coalesce(zip(grp["s"].astype(int), grp["e"].astype(int)))
        person_exist[int(p)] = fam
        props: dict[str, list] = {
            "risk": [("high" if hi[p] else "low", s, e) for s, e in fam]
        }
        test_vals = []
        for s, e in fam:
            if pos[p]:
                tp = int(t_pos[p])
                if e < tp:
                    test_vals.append(("neg", s, e))
                elif s >= tp:
                    test_vals.append(("pos", s, e))
                else:
                    test_vals += [("neg", s, tp - 1), ("pos", tp, e)]
            else:
                test_vals.append(("neg", s, e))
        props["test"] = test_vals
        nodes.append((f"p{p}", "Person", fam, props))

    # --- room nodes: first entrance .. last exit --------------------------
    room_ev = ev[ev["room"]]
    room_span = room_ev.groupby("loc").agg(s=("s", "min"), e=("e", "max"))
    for r, row in room_span.iterrows():
        nodes.append((f"r{r}", "Room", [(int(row["s"]), int(row["e"]))], {}))

    # --- visits edges: one per room event ---------------------------------
    edges: list[tuple] = []
    for i, (_, r) in enumerate(room_ev.iterrows()):
        edges.append(
            (f"v{i}", f"p{int(r['pid'])}", f"r{int(r['loc'])}", "visits",
             [(int(r["s"]), int(r["e"]))], {})
        )

    # --- meets edges: co-presence runs at non-room locations --------------
    other = ev[~ev["room"]][["pid", "loc", "s", "e"]].reset_index(drop=True)
    if len(other):
        other = other.assign(
            t=[list(range(int(s), int(e) + 1)) for s, e in zip(other["s"], other["e"])]
        ).explode("t")[["pid", "loc", "t"]].drop_duplicates()
        pairs = other.merge(other, on=["loc", "t"], suffixes=("_a", "_b"))
        pairs = pairs[pairs["pid_a"] < pairs["pid_b"]]
        if len(pairs):
            # vectorised gaps-and-islands: coalesce consecutive co-presence
            # slots per (pair, location) into one meets run each.
            pairs = pairs.sort_values(["pid_a", "pid_b", "loc", "t"]).reset_index(drop=True)
            t = pairs["t"].astype(int)
            key_change = (
                pairs[["pid_a", "pid_b", "loc"]].ne(
                    pairs[["pid_a", "pid_b", "loc"]].shift()
                ).any(axis=1)
            )
            new_run = key_change | (t != t.shift() + 1)
            run = new_run.cumsum()
            runs = (
                pairs.assign(t=t, run=run)
                .groupby("run")
                .agg(
                    a=("pid_a", "first"),
                    b=("pid_b", "first"),
                    loc=("loc", "first"),
                    s=("t", "min"),
                    e=("t", "max"),
                )
            )
            k = 0
            for r in runs.itertuples(index=False):
                s, e = int(r.s), int(r.e)
                props = {"loc": [(f"loc{int(r.loc)}", s, e)]}
                # bi-directional meets (paper): one directed edge each way.
                edges.append((f"m{k}", f"p{int(r.a)}", f"p{int(r.b)}", "meets", [(s, e)], props))
                edges.append((f"m{k + 1}", f"p{int(r.b)}", f"p{int(r.a)}", "meets", [(s, e)], props))
                k += 2

    return ITPGData.build(omega, nodes, edges)


def g_lite(name: str, *, positivity: float = 0.05, seed: int = 0) -> ITPGData:
    """Build one rung of the G-lite ladder (e.g. ``g_lite('G10')``)."""
    return contact_tracing(persons=G_LITE[name], positivity=positivity, seed=seed)
