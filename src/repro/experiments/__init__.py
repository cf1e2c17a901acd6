"""Experiment harnesses reproducing the numbers behind Figs. 6–12."""
