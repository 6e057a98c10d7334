"""Fig 9 benchmark: increasing violation fractions."""
import json

from repro.experiments import save_results
from repro.experiments.figs import run_fig9


def test_fig9_violations(spark, benchmark):
    out = benchmark.pedantic(lambda: run_fig9(spark), rounds=1, iterations=1)
    save_results("fig9", out)
    print("\nFig 9 paper vs measured:")
    print(json.dumps(out, indent=1))
    rows = out["measured"]
    for cfg, row in rows.items():
        assert row["daisy"] < row["offline"], cfg
    # the offline cost grows with the number of erroneous groups
    assert rows["violations=80%"]["offline_passes"] > rows["violations=20%"]["offline_passes"]
