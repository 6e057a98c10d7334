"""Table 5 benchmark: accuracy of Holoclean / DaisyH / DaisyP per rule set."""
import json

from repro.experiments import save_results
from repro.experiments.table5 import run_table5


def test_table5_accuracy(spark, benchmark):
    out = benchmark.pedantic(lambda: run_table5(spark), rounds=1, iterations=1)
    save_results("table5", out)
    print("\nTable 5 (precision/recall/F1) paper vs measured:")
    print(json.dumps(out, indent=1))
    # shape assertions from the paper: DaisyP is clearly worst with φ1 alone,
    # everything is strong once φ2 (and φ3) are known
    m = out["measured"]
    assert m["phi1"]["daisyP"][2] < 0.7  # F1 well below the multi-rule regime
    for rs in ("phi1+phi2", "phi1+phi2+phi3"):
        for system in ("holoclean", "daisyH", "daisyP"):
            assert m[rs][system][2] >= 0.9
