"""spark-submit entrypoint: Table XI: graph quality vs iterations.

Regenerates the paper-table reproduction (see DESIGN.md section 4 and
EXPERIMENTS.md). Usage: ``spark-submit jobs/table11_graph_quality.py`` or
``python jobs/table11_graph_quality.py``. Extra sizing knobs can be edited below.
"""
from _common import main
from repro.eval.tables import table11_graph_quality

if __name__ == "__main__":
    main(table11_graph_quality, 'Table XI: graph quality vs iterations')
