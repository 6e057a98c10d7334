"""Table 6 benchmark: response time vs number of rules."""
import json

from repro.experiments import save_results
from repro.experiments.table6 import run_table6


def test_table6_rules(spark, benchmark):
    out = benchmark.pedantic(lambda: run_table6(spark), rounds=1, iterations=1)
    save_results("table6", out)
    print("\nTable 6 (seconds) paper vs measured:")
    print(json.dumps(out, indent=1))
    m = out["measured"]
    for rs in m:
        assert m[rs]["daisy"] <= m[rs]["full"]  # Daisy ≤ full cleaning
    # response time grows with the number of rules for the Spark cleaners
    assert m["phi1+phi2+phi3"]["full"] > m["phi1"]["full"]
