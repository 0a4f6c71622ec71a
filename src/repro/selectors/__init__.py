"""Feature selectors. Importing this package populates the ranker registry."""
from repro.selectors import embedded, filters, relief, sparse_regression  # noqa: F401
from repro.selectors.base import RANKERS, applicable, rank_scores  # noqa: F401
