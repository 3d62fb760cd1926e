"""Table 1 — datasets used in synthetic workloads.

The paper's Table 1 inventories the evaluation datasets (|V|, |E|).
We regenerate each as a scaled synthetic equivalent (DESIGN.md §5 item
2) and print paper-vs-scaled sizes side by side.
"""
from benchmarks._bench_utils import record, timed

from repro.datasets import snb
from repro.datasets.graphalytics import SNB_PAPER_SIZES, table1_rows

BENCH_MAX_EDGES = 50_000
SNB_LITE_PERSONS = {"SNB-30": 1000, "SNB-300": 3000, "SNB-1000": 6000}


def test_table1_datasets(benchmark):
    def run():
        rows = table1_rows(max_edges=BENCH_MAX_EDGES)
        for r in rows:
            record(
                "Table 1: datasets (paper vs scaled synthetic)",
                abbr=r["abbr"],
                dataset=r["dataset"],
                paper_V=f"{r['paper_v']:,}",
                paper_E=f"{r['paper_e']:,}",
                scaled_V=f"{r['scaled_v']:,}",
                scaled_E=f"{r['scaled_e']:,}",
            )
        for name, (pv, pe) in SNB_PAPER_SIZES.items():
            pg = snb.snb_graph(n_persons=SNB_LITE_PERSONS[name], seed=42)
            record(
                "Table 1: datasets (paper vs scaled synthetic)",
                abbr=name,
                dataset="LDBC SNB datagen (lite)",
                paper_V=f"{pv:,}",
                paper_E=f"{pe:,}",
                scaled_V=f"{pg.num_vertices:,}",
                scaled_E=f"{pg.num_edges:,}",
            )
        return len(rows)

    n = benchmark.pedantic(run, rounds=1, iterations=1)
    assert n == 12
