"""spark-submit entrypoint: Table XII + Fig.6: l sweep / MUST vs MR efficiency.

Regenerates the paper-table reproduction (see DESIGN.md section 4 and
EXPERIMENTS.md). Usage: ``spark-submit jobs/table12_l_sweep.py`` or
``python jobs/table12_l_sweep.py``. Extra sizing knobs can be edited below.
"""
from _common import main
from repro.eval.tables import table12_l_sweep

if __name__ == "__main__":
    main(table12_l_sweep, 'Table XII + Fig.6: l sweep / MUST vs MR efficiency')
