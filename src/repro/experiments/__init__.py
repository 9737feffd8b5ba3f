"""Experiment harnesses reproducing the paper's evaluation (§7).

One function per table (DESIGN.md §5 maps each to a paper figure);
``repro.experiments.report`` renders the rows the figures plot.
"""
