"""Evaluation: the paper's quality measures and the crowdsourcing loop."""
