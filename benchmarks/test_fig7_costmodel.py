"""Fig 7 benchmark: the cost-model switch under low suppkey selectivity."""
import json

from repro.experiments import save_results
from repro.experiments.figs import run_fig7


def test_fig7_costmodel_switch(spark, benchmark):
    out = benchmark.pedantic(lambda: run_fig7(spark), rounds=1, iterations=1)
    save_results("fig7", out)
    print("\nFig 7 paper vs measured:")
    print(json.dumps(out, indent=1))
    m = out["measured"]
    # at this scale relaxation converges within the first queries, so the
    # switch rarely needs to fire here (Fig 12 demonstrates it firing); the
    # claim that must hold: the cost model never loses to pure incremental,
    # and Daisy beats offline in this low-suppkey-selectivity regime
    assert m["daisy_cost_model"]["daisy"] <= m["incremental"]["daisy"] * 1.15
    assert m["daisy_cost_model"]["daisy"] < m["daisy_cost_model"]["offline"]
