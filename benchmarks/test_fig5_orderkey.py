"""Fig 5 benchmark: SP cost vs orderkey cardinality (rhs-filter workload)."""
import json

from repro.experiments import save_results
from repro.experiments.figs import run_fig5


def test_fig5_orderkey_selectivity(spark, benchmark):
    out = benchmark.pedantic(lambda: run_fig5(spark), rounds=1, iterations=1)
    save_results("fig5", out)
    print("\nFig 5 paper vs measured:")
    print(json.dumps(out, indent=1))
    for cfg, row in out["measured"].items():
        assert row["daisy"] < row["offline"], cfg  # Daisy wins at every cardinality
