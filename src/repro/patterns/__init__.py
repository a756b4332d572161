"""Pattern specs and distributed pattern-instance enumeration (PDS, §7)."""
from repro.patterns.base import (  # noqa: F401
    Pattern,
    c3_star,
    clique,
    diamond,
    edge,
    generic,
    star,
    triangle,
    two_triangle,
)
