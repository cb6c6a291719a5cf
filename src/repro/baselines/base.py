"""Uniform method protocol for the search harness.

Every retrieval method — FCM variants and all baselines — implements:

* ``prepare_query(extracted)``: one-off query-side preprocessing;
* ``encode_table(table)``: repository-side encoding (done once per table,
  amortised over all queries inside a Spark partition);
* ``score(query_prep, table_enc)``: the relevance estimate Rel'(V, T).

Instances must be picklable (numpy only) so the harness can broadcast
them to executors.
"""
from __future__ import annotations

from typing import Any

from repro.chartsim.extractor import ExtractedQuery
from repro.core.data import LakeTable


class Method:
    name: str = "base"

    def prepare_query(self, eq: ExtractedQuery) -> Any:
        raise NotImplementedError

    def encode_table(self, table: LakeTable) -> Any:
        raise NotImplementedError

    def score(self, query_prep: Any, table_enc: Any) -> float:
        raise NotImplementedError

    def score_raw(self, eq: ExtractedQuery, table: LakeTable) -> float:
        """Convenience end-to-end scoring (tests / tiny scale)."""
        return self.score(self.prepare_query(eq), self.encode_table(table))
