"""The demo's SAQL query catalog (paper §III)."""
from .demo_queries import (  # noqa: F401
    PAPER_QUERIES,
    demo_queries,
    paper_query,
)
