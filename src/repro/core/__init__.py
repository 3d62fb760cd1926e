"""repro.core — the paper's primary contribution surface.

GraphScope Flex's contribution is the *composition*: GRIN-decoupled
storage, one IR with two engines, pluggable analytics models, and a
decoupled learning pipeline, assembled LEGO-style by flexbuild.  This
package re-exports that surface so user code mirrors the paper's
component diagram (Fig. 3).
"""
from repro.flexbuild import (  # noqa: F401
    REGISTRY,
    WORKLOAD2,
    WORKLOAD5,
    IncompatibleStack,
    Stack,
    flexbuild,
)
from repro.query.catalog import Catalog  # noqa: F401
from repro.query.cypher import parse_cypher  # noqa: F401
from repro.query.gaia import GaiaExecutor  # noqa: F401
from repro.query.gremlin import G, parse_gremlin  # noqa: F401
from repro.query.hiactor import HiActorEngine  # noqa: F401
from repro.query.planner import compile_plan  # noqa: F401
from repro.storage.gart import GartStore  # noqa: F401
from repro.storage.graphar import GraphArStore, write_graphar  # noqa: F401
from repro.storage.grin import GraphStore, Trait  # noqa: F401
from repro.storage.vineyard import VineyardStore  # noqa: F401
