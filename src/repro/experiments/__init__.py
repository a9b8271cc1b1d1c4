"""Evaluation-section reproductions (one module per paper table, plus
the HiBench comparison behind Figures 4–5 and the §6.5 ablations).
Each module exposes a ``run(...)`` returning plain data structures and
a ``format_table(...)`` printing rows shaped like the paper's."""
