"""Kumar et al. Tuple-Ratio (TR) decision rule [42].

TR = n_S / n_R, where n_S is the number of training examples in the base
table and n_R the size of the foreign table's join-key domain (its number
of distinct key values). The VC-dimension analysis of [42] says a foreign
table is "safe to avoid" when TR exceeds a threshold tau — the foreign
key itself already embeds everything the join could add.

ARDA uses the rule two ways (paper §7, Table 4):
* standalone: keep only tables that *fail* the rule (TR <= tau) and join
  them with no feature selection, and
* as a prefilter before RIFS, trading a little accuracy for speed.

``n_R`` is computed with a distributed ``countDistinct`` per candidate.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

__all__ = ["tuple_ratio", "tr_filter"]


def tuple_ratio(n_base: int, foreign: DataFrame, key_cols: list[str]) -> float:
    n_r = foreign.select(*key_cols).distinct().count()
    return float(n_base) / max(1, n_r)


@dataclass
class TRDecision:
    name: str
    ratio: float
    keep: bool


def tr_filter(n_base: int, candidates, tables: dict[str, DataFrame],
              tau: float) -> list[TRDecision]:
    """Apply the rule to every candidate join; ``keep`` means TR <= tau
    (the table may still help and survives into the join plan)."""
    out = []
    for cand in candidates:
        r = tuple_ratio(n_base, tables[cand.table], cand.foreign_keys)
        out.append(TRDecision(cand.table, r, r <= tau))
    return out
