"""Fig 11 benchmark: SPJ workload over lineorder ⋈ supplier."""
import json

from repro.experiments import save_results
from repro.experiments.figs import run_fig11


def test_fig11_join(spark, benchmark):
    out = benchmark.pedantic(lambda: run_fig11(spark), rounds=1, iterations=1)
    save_results("fig11", out)
    print("\nFig 11 paper vs measured:")
    print(json.dumps(out, indent=1))
    m = out["measured"]
    assert m["daisy"] < m["offline"]
