"""Table 3 benchmark: OTCD response time for all 20 selected queries at
SF=0.1 (the workload whose result counts Table 3 reports)."""
import pytest

from repro.core.otcd import otcd_query
from repro.experiments.queries import selected_queries
from repro.experiments.tables import query_tel

SF = 0.1
_QUERIES = selected_queries(sf=SF)


@pytest.mark.parametrize("qid", [q.qid for q in _QUERIES])
def test_otcd_query(benchmark, qid):
    q = _QUERIES[qid - 1]
    tel = query_tel(q, sf=SF)
    res = benchmark.pedantic(
        otcd_query, args=(tel, q.k, q.Ts, q.Te), rounds=3, iterations=1
    )
    benchmark.group = q.dataset
    benchmark.extra_info["results"] = len(res.cores)
    assert len(res.cores) >= 1
