"""Figure 8 / Section 5.2 — per-query CVs and the 23-query RQA."""
from benchmarks._util import save
from repro.experiments import fig08_qcsa


def test_fig08(benchmark):
    per_query, summary = benchmark.pedantic(fig08_qcsa.run, rounds=1, iterations=1)
    kept = per_query[per_query["class"] == "CSQ"]["query"].tolist()
    save("fig08_summary", summary, extra="kept queries: " + ", ".join(kept))
    save("fig08_per_query_cv", per_query)
    assert summary.n_queries.iloc[0] == 104
