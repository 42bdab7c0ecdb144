"""Experiment harnesses reproducing the paper's evaluation artifacts.

One module per artifact: ``table2`` (running-time table), ``fig1``
(tiny-graph optimality), ``fig23`` (effectiveness trajectories),
``fig45`` (ε sweeps). ``graphs`` defines the synthetic graph suite that
stands in for the paper's datasets (DESIGN.md §5), with the paper's
measured numbers recorded alongside for EXPERIMENTS.md.
"""
