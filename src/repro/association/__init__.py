"""Observation-association substrate: IOU, within-frame bundling
(paper §4: *observation bundles*), and cross-frame tracking (*tracks*).
"""
