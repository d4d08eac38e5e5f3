"""Regular path query substrate: NFA templates + product-graph construction."""
from repro.rpq.automaton import Automaton, q1, q2, q3  # noqa: F401
from repro.rpq.product import product_edges  # noqa: F401
