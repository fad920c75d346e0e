"""MGD training on compressed mini-batches (paper §2, §5.3).

- :mod:`repro.ml.losses` — numerically-stable loss/activation primitives
- :mod:`repro.ml.models` — LR, linear SVM, feed-forward NN, one-vs-rest;
  all gradient math goes through the format op interface (Table 1)
- :mod:`repro.ml.mgd`    — shuffle-once mini-batch construction and the
  fixed-epoch MGD driver
"""
