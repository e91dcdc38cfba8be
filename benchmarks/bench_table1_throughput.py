"""Table 1 — per-query ingestion rate & throughput (paper §3.1/§3.2).

One benchmark per query. Each run pushes a pre-generated SNCB event
stream (~43 K events: 1 h at 2 Hz × 6 trains) through the full query
pipeline in 20 K-event micro-batches and times the processing loop;
``extra_info`` records events/s and MB/s next to the paper's numbers.
Regenerate the EXPERIMENTS.md table with:

    pytest benchmarks/bench_table1_throughput.py --benchmark-only -q

or ``python jobs/table1_throughput.py`` for the formatted table.
"""
import pytest

from repro.core.throughput import (
    ALL_QUERIES,
    PAPER_TABLE1,
    build_events,
    make_processor,
)
from repro.nebula.engine import split_batches
from repro.sncb.events import event_size_for_query

DURATION_S = 3600.0
DT = 0.5
BATCH_ROWS = 20_000

_EVENTS_CACHE: dict[str, object] = {}


def _events(qid):
    if qid not in _EVENTS_CACHE:
        _EVENTS_CACHE[qid] = build_events(qid, duration_s=DURATION_S, dt=DT)
    return _EVENTS_CACHE[qid]


@pytest.mark.parametrize("qid", ALL_QUERIES)
def test_table1_throughput(benchmark, spark, qid):
    pdf = _events(qid)
    batches = list(split_batches(pdf, BATCH_ROWS))
    old_parts = spark.conf.get("spark.sql.shuffle.partitions")
    spark.conf.set("spark.sql.shuffle.partitions", "8")

    def setup():
        # Fresh processor per round: Q7/Q8 carry operator state.
        proc = make_processor(spark, qid, duration_s=DURATION_S)
        return (proc,), {}

    def run(proc):
        total = 0
        for b in batches:
            total += proc(b)
        return total

    try:
        benchmark.pedantic(run, setup=setup, rounds=3, warmup_rounds=1)
    finally:
        spark.conf.set("spark.sql.shuffle.partitions", old_parts)

    n_events = len(pdf)
    mean_s = benchmark.stats.stats.mean
    eps = n_events / mean_s
    size = event_size_for_query(qid)
    paper_mb, paper_eps = PAPER_TABLE1[qid]
    benchmark.extra_info.update(
        {
            "n_events": n_events,
            "events_per_s": round(eps),
            "mb_per_s": round(eps * size / 1e6, 2),
            "event_size_b": size,
            "paper_events_per_s": paper_eps,
            "paper_mb_per_s": paper_mb,
        }
    )
