"""The benchmark Datalog programs of Section 6.2, verbatim.

Each constant is a ``.datalog`` source string in this repo's dialect;
``parse_program`` turns it into an AST. EDB relations (inputs) per
program:

- TC / SG:      ``arc(x, y)``
- REACH:        ``arc(x, y)``, ``id(y)`` (the source vertex)
- CC:           ``arc(x, y)``
- SSSP:         ``arc(x, y, d)`` (weighted), ``id(y)`` (the source)
- AA:           ``addressOf``, ``assign``, ``load``, ``store`` (binary)
- CSPA:         ``assign``, ``dereference`` (binary)
- CSDA:         ``nullEdge``, ``arc`` (binary)

The CSPA text in the paper's PDF is garbled by extraction; the rule set
below is the canonical Graspan/[25] formulation the paper references
(value flow / memory alias / value alias mutual recursion), which keeps
the structural properties the paper discusses: mutual recursion and
nonlinear rules with large per-iteration deltas.
"""
from repro.datalog.parser import parse_program

TRANSITIVE_CLOSURE = """
tc(x, y) :- arc(x, y).
tc(x, y) :- tc(x, z), arc(z, y).
"""

SAME_GENERATION = """
sg(x, y) :- arc(p, x), arc(p, y), x != y.
sg(x, y) :- arc(a, x), sg(a, b), arc(b, y).
"""

REACHABILITY = """
reach(y) :- id(y).
reach(y) :- reach(x), arc(x, y).
"""

CONNECTED_COMPONENTS = """
cc3(x, MIN(x)) :- arc(x, _).
cc3(y, MIN(z)) :- cc3(x, z), arc(x, y).
cc2(x, MIN(y)) :- cc3(x, y).
cc(x) :- cc2(_, x).
"""

SSSP = """
sssp2(y, MIN(0)) :- id(y).
sssp2(y, MIN(d1 + d2)) :- sssp2(x, d1), arc(x, y, d2).
sssp(x, MIN(d)) :- sssp2(x, d).
"""

ANDERSEN = """
pointsTo(y, x) :- addressOf(y, x).
pointsTo(y, x) :- assign(y, z), pointsTo(z, x).
pointsTo(y, w) :- load(y, x), pointsTo(x, z), pointsTo(z, w).
pointsTo(z, w) :- store(y, x), pointsTo(y, z), pointsTo(x, w).
"""

CSPA = """
valueFlow(y, x) :- assign(y, x).
valueFlow(x, y) :- assign(x, z), memoryAlias(z, y).
valueFlow(x, y) :- valueFlow(x, z), valueFlow(z, y).
memoryAlias(x, w) :- dereference(y, x), valueAlias(y, z), dereference(z, w).
valueAlias(x, y) :- valueFlow(z, x), valueFlow(z, y).
valueAlias(x, y) :- valueFlow(z, x), memoryAlias(z, w), valueFlow(w, y).
valueFlow(x, x) :- assign(x, y).
valueFlow(x, x) :- assign(y, x).
memoryAlias(x, x) :- assign(y, x).
memoryAlias(x, x) :- assign(x, y).
"""

CSDA = """
null(x, y) :- nullEdge(x, y).
null(x, y) :- null(x, w), arc(w, y).
"""

# Example 2 of the paper: complement of transitive closure, the
# stratified-negation exercise used in tests.
NEGATED_TC = """
tc(x, y) :- arc(x, y).
tc(x, y) :- tc(x, z), arc(z, y).
node(x) :- arc(x, y).
node(y) :- arc(x, y).
ntc(x, y) :- node(x), node(y), !tc(x, y).
"""

# Rule r3 of Section 3.3: non-recursive aggregation over TC.
TC_COUNT = """
tc(x, y) :- arc(x, y).
tc(x, y) :- tc(x, z), arc(z, y).
gtc(x, COUNT(y)) :- tc(x, y).
"""

#: name -> (source text, ordered EDB relation names)
PROGRAMS: dict[str, tuple[str, tuple[str, ...]]] = {
    "tc": (TRANSITIVE_CLOSURE, ("arc",)),
    "sg": (SAME_GENERATION, ("arc",)),
    "reach": (REACHABILITY, ("arc", "id")),
    "cc": (CONNECTED_COMPONENTS, ("arc",)),
    "sssp": (SSSP, ("arc", "id")),
    "andersen": (ANDERSEN, ("addressOf", "assign", "load", "store")),
    "cspa": (CSPA, ("assign", "dereference")),
    "csda": (CSDA, ("nullEdge", "arc")),
    "negated_tc": (NEGATED_TC, ("arc",)),
    "tc_count": (TC_COUNT, ("arc",)),
}


def get_program(name: str):
    """Parse and return the named benchmark program."""
    text, _ = PROGRAMS[name]
    return parse_program(text)


def get_edbs(name: str) -> tuple[str, ...]:
    """EDB relation names (input tables) of the named program."""
    return PROGRAMS[name][1]
