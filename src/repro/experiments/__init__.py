"""Experiment harnesses: one function per evaluation table of the paper.

Each harness regenerates its table over the profile-matched synthetic
datasets and returns a pandas DataFrame whose rows mirror the paper's
layout; ``paper_numbers`` holds the published values so EXPERIMENTS.md
can put them side by side. ``jobs/`` exposes each harness as a
spark-submit entrypoint.
"""
