"""spark-submit entrypoint: Fig.10 ablation: graph variants + multi-vector opt.

Regenerates the paper-table reproduction (see DESIGN.md section 4 and
EXPERIMENTS.md). Usage: ``spark-submit jobs/ablation_graphs.py`` or
``python jobs/ablation_graphs.py``. Extra sizing knobs can be edited below.
"""
from _common import main
from repro.eval.tables import ablation_graphs

if __name__ == "__main__":
    main(ablation_graphs, 'Fig.10 ablation: graph variants + multi-vector opt')
