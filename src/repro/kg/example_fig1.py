"""The worked example of Table I / Figure 1 (Angelopoulos mini-graph).

User 1 receives three movie recommendations explained by three paths with a
total length of 13 edges; the ST summary compresses them to a 6-edge tree
through "Theo Angelopoulos" and "Drama". Node ids follow the repo's
type-blocked layout (users, then items, then external entities).
"""
from repro.core.scenarios import SummaryRequest
from repro.graph.model import ETYPE_IE, ETYPE_UI, KG, NTYPE_EXT, NTYPE_ITEM, NTYPE_USER

NAMES = {
    0: "User 1",
    1: "User 2",
    2: "Landscape in the Mist",
    3: "The Travelling Players",
    4: "Eternity and a Day",  # Item A
    5: "Ulysses' Gaze",
    6: "The Beekeeper",  # Item B
    7: "The Weeping Meadow",
    8: "The Dust of Time",
    9: "The Suspended Step of the Stork",  # Item C
    10: "Drama",
    11: "Theo Angelopoulos",
}
NTYPES = {0: NTYPE_USER, 1: NTYPE_USER, 10: NTYPE_EXT, 11: NTYPE_EXT}
NTYPES.update({i: NTYPE_ITEM for i in range(2, 10)})

USER_1, ITEM_A, ITEM_B, ITEM_C = 0, 4, 6, 9

# The three explanation paths of Table I (13 edges total).
PATH_A = (0, 2, 1, 3, 10, 4)
PATH_B = (0, 5, 11, 6)
PATH_C = (0, 7, 11, 8, 10, 9)
PATHS = (PATH_A, PATH_B, PATH_C)

# Knowledge-graph edges: every path edge, plus the background genre edge
# "The Beekeeper — Drama" visible in Figure 1's grey graph (all these films
# are dramas); it is what lets the summary bridge Theo's movies to Drama.
_EXTRA = [(6, 10)]


def build_example(spark) -> KG:
    """The Figure 1 mini knowledge-based graph."""
    edges = []
    seen = set()
    for p in PATHS:
        for a, b in zip(p, p[1:]):
            key = (min(a, b), max(a, b))
            if key in seen:
                continue
            seen.add(key)
            if NTYPES[a] == NTYPE_USER or NTYPES[b] == NTYPE_USER:
                etype, w = ETYPE_UI, 5.0
            else:
                etype, w = ETYPE_IE, 0.0
            edges.append((a, b, w, etype))
    for a, b in _EXTRA:
        edges.append((a, b, 0.0, ETYPE_IE))
    nodes = spark.createDataFrame(
        sorted((i, t) for i, t in NTYPES.items()), "id: long, ntype: string"
    )
    edf = spark.createDataFrame(edges, "src: long, dst: long, weight: double, etype: string")
    return KG(nodes=nodes, edges=edf)


def example_request() -> SummaryRequest:
    """User 1's user-centric summarization task (items A, B, C at k=1..3)."""
    return SummaryRequest(
        sid="user:1",
        scenario="user-centric",
        centers=(USER_1,),
        targets=((1, ITEM_A), (2, ITEM_B), (3, ITEM_C)),
        paths=((1, PATH_A), (2, PATH_B), (3, PATH_C)),
    )
