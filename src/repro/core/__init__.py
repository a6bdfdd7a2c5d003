"""The paper's contribution: fairness-aware maximal biclique enumeration.

Pruning (FCore/CFCore and bi-side variants), branch-and-bound enumeration
(FairBCEM, FairBCEM++, BFairBCEM, BFairBCEM++, NSF/BNSF baselines,
proportion variants), and the Spark-distributed enumeration layer.
"""
