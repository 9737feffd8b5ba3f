"""Stream substrate: synthetic stock-tick stream and statistics estimation.

The paper evaluates on a proprietary NASDAQ tick archive (EODData);
:mod:`repro.streams.stock` generates the synthetic substitute described in
DESIGN.md §4, and :mod:`repro.streams.estimation` measures the arrival
rates and predicate selectivities the planners consume — the paper's
"preprocessing stage" (§7.2).
"""
