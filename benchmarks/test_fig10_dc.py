"""Fig 10 benchmark: general DCs with inequality conditions."""
import json

from repro.experiments import save_results
from repro.experiments.figs import run_fig10


def test_fig10_dc(spark, benchmark):
    out = benchmark.pedantic(lambda: run_fig10(spark), rounds=1, iterations=1)
    save_results("fig10", out)
    print("\nFig 10 paper vs measured:")
    print(json.dumps(out, indent=1))
    m = out["measured"]
    # low-violation versions clean partially with high accuracy
    assert m["0.2%"]["accuracy_vs_offline"] >= 0.8
    # the 20% version's accuracy estimate triggers full cleaning → exact
    assert "full" in m["20%"]["modes"]
    assert m["20%"]["accuracy_vs_offline"] == 1.0
