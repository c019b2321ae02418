"""The DeepJoin model: fine-tunable column encoder + training loop.

``deepjoin``  — PLM-lite backbone + trainable head (attention pooling +
              2-layer projection); batched ("GPU") and per-column
              ("CPU") encode paths; distributed encoding via Spark.
``train``     — multiple-negatives-ranking loss with in-batch negatives
              (§ 4.2), cell-shuffle augmentation (§ 4.1), numpy Adam.
``mlp``       — the siamese MLP regression baseline of the experiments.
"""
from repro.model.deepjoin import DeepJoinModel  # noqa: F401
from repro.model.train import TrainConfig, prepare_pairs, train  # noqa: F401
from repro.model.mlp import MLPBaseline  # noqa: F401
