"""pytest-benchmark targets — one per reproduced table/figure.

Each benchmark runs the corresponding ``jobs/`` harness in ``quick`` mode
(single round: the harnesses are internally repeated workloads, not
microbenchmarks) and records the produced table in ``extra_info`` so the
benchmark JSON doubles as an experiment artifact. The full-scale numbers
in EXPERIMENTS.md come from running the jobs without ``--quick``.
"""
import pytest

from jobs.fig2_pe_vs_hashes import run as fig2_run
from jobs.fig3_pe_vs_datachar import run as fig3_run
from jobs.fig4_pe_vs_adm import run as fig4_run
from jobs.fig5_time_vs_memory import run as fig5_run
from jobs.fig6_pe_vs_k import run as fig6_run
from jobs.fig7_indexing_cost import run as fig7_run
from jobs.fig8_update_cost import run as fig8_run
from jobs.table2_measure_sim import run as table2_run

ALL = {
    "table2_measure_sim": table2_run,
    "fig2_pe_vs_hashes": fig2_run,
    "fig3_pe_vs_datachar": fig3_run,
    "fig4_pe_vs_adm": fig4_run,
    "fig5_time_vs_memory": fig5_run,
    "fig6_pe_vs_k": fig6_run,
    "fig7_indexing_cost": fig7_run,
    "fig8_update_cost": fig8_run,
}


@pytest.mark.parametrize("name", list(ALL), ids=list(ALL))
def test_bench_table(benchmark, spark, name):
    run = ALL[name]
    table = benchmark.pedantic(
        lambda: run(spark, quick=True), rounds=1, iterations=1
    )
    assert len(table) > 0
    benchmark.extra_info["rows"] = table.to_dict(orient="records")
