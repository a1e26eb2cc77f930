"""Baseline error finders the paper compares against (§8.1):
the hand-crafted model assertions of Kang et al. [11] and uncertainty
sampling from the active-learning literature.
"""
