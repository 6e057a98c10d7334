"""Fig 12 benchmark: mixed SP + SPJ workload with the cost-model switch."""
import json

from repro.experiments import save_results
from repro.experiments.figs import run_fig12


def test_fig12_mixed(spark, benchmark):
    out = benchmark.pedantic(lambda: run_fig12(spark), rounds=1, iterations=1)
    save_results("fig12", out)
    print("\nFig 12 paper vs measured:")
    print(json.dumps(out, indent=1))
    m = out["measured"]
    assert m["daisy_cost_model"]["switched_at"] is not None
    assert m["daisy_cost_model"]["seconds"] <= m["incremental"]["seconds"] * 1.15
