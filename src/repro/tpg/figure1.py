"""The paper's running-example contact-tracing TPG (Figure 1).

Reconstructed exactly from the constraints printed in the paper: the
appendix gives ξ(n2)={[1,9]}, σ(n2,risk)={(low,[1,4]),(high,[5,9])},
ξ(n3)={[1,7]}, ξ(e2)={[1,2]}; Section VI gives e1's two states
(loc=cafe [3,3], loc=park [5,6]); and the binding tables for
Q1–Q3, Q5–Q9, Q11 and Q12 pin down the rest (see DESIGN.md §4).
"""
from .model import ITPGData

OMEGA = (1, 11)


def figure1() -> ITPGData:
    """Build the Figure 1 TPG as an interval-timestamped graph."""
    nodes = [
        ("n1", "Person", [(1, 9)],
         {"name": [("Ann", 1, 9)], "risk": [("low", 1, 9)], "test": [("neg", 1, 9)]}),
        ("n2", "Person", [(1, 9)],
         {"name": [("Bob", 1, 9)],
          "risk": [("low", 1, 4), ("high", 5, 9)],
          "test": [("neg", 1, 9)]}),
        ("n3", "Person", [(1, 7)],
         {"name": [("Cat", 1, 7)], "risk": [("high", 1, 7)], "test": [("neg", 1, 7)]}),
        ("n4", "Room", [(1, 11)], {}),
        ("n5", "Room", [(1, 11)], {}),
        ("n6", "Person", [(2, 9)],
         {"name": [("Eve", 2, 9)],
          "risk": [("low", 2, 9)],
          "test": [("neg", 2, 8), ("pos", 9, 9)]}),
        ("n7", "Person", [(4, 9)],
         {"name": [("Dan", 4, 9)], "risk": [("high", 4, 9)], "test": [("neg", 4, 9)]}),
    ]
    edges = [
        ("e1", "n1", "n2", "meets", [(3, 3), (5, 6)],
         {"loc": [("cafe", 3, 3), ("park", 5, 6)]}),
        ("e2", "n2", "n3", "meets", [(1, 2)], {"loc": [("park", 1, 2)]}),
        ("e3", "n3", "n6", "meets", [(4, 4)], {}),
        ("e4", "n7", "n6", "meets", [(5, 6)], {}),
        ("e5", "n2", "n3", "cohabits", [(1, 7)], {}),
        ("e6", "n6", "n4", "visits", [(7, 8)], {}),
        ("e7", "n6", "n5", "visits", [(5, 6)], {}),
        ("e8", "n7", "n4", "visits", [(7, 8)], {}),
        ("e9", "n3", "n4", "visits", [(7, 7)], {}),
    ]
    return ITPGData.build(OMEGA, nodes, edges)
