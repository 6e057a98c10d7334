"""spark-submit entrypoint reproducing the paper's Fig12 workload (DESIGN.md §5)."""
import sys, pathlib
sys.path.insert(0, str(pathlib.Path(__file__).resolve().parent))
from _common import emit, get_spark
from repro.experiments.figs import run_fig12

if __name__ == "__main__":
    emit("fig12", run_fig12(get_spark("daisy-fig12")))
