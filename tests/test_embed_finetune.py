"""Fine-tuning trainer: loss decreases, early stopping, separation."""
import numpy as np
import pytest

from repro.core.metrics import pair_accuracy
from repro.embed.finetune import train_finetuned


@pytest.fixture(scope="module")
def toy_pairs():
    """Trivially separable synthetic task: same-prefix = unionable."""
    rng = np.random.default_rng(0)
    vocab_a = [f"ax{i}" for i in range(30)]
    vocab_b = [f"bz{i}" for i in range(30)]

    def tup(vocab):
        return " ".join(rng.choice(vocab, size=4))

    pairs, labels = [], []
    for _ in range(300):
        if rng.random() < 0.5:
            v = vocab_a if rng.random() < 0.5 else vocab_b
            pairs.append((tup(v), tup(v)))
            labels.append(1)
        else:
            pairs.append((tup(vocab_a), tup(vocab_b)))
            labels.append(0)
    y = np.array(labels)
    return pairs[:200], y[:200], pairs[200:250], y[200:250], pairs[250:], y[250:]


class TestTrainer:
    def test_val_loss_decreases(self, toy_pairs):
        tr, ytr, va, yva, _, _ = toy_pairs
        _, hist = train_finetuned(tr, ytr, va, yva, max_epochs=10, patience=10)
        assert hist.val_loss[-1] < hist.val_loss[0]

    def test_learns_separation(self, toy_pairs):
        tr, ytr, va, yva, te, yte = toy_pairs
        model, _ = train_finetuned(tr, ytr, va, yva, max_epochs=15, patience=10)
        acc = pair_accuracy(model.predict_unionable(te), yte)
        assert acc >= 0.9

    def test_early_stopping_bounds_epochs(self, toy_pairs):
        tr, ytr, va, yva, _, _ = toy_pairs
        _, hist = train_finetuned(tr, ytr, va, yva, max_epochs=50, patience=2)
        assert hist.stopped_epoch <= 50
        assert len(hist.train_loss) == hist.stopped_epoch

    def test_deterministic_given_seed(self, toy_pairs):
        tr, ytr, va, yva, te, _ = toy_pairs
        m1, _ = train_finetuned(tr, ytr, va, yva, max_epochs=3, seed=5)
        m2, _ = train_finetuned(tr, ytr, va, yva, max_epochs=3, seed=5)
        assert np.allclose(m1.embed_texts([te[0][0]]), m2.embed_texts([te[0][0]]))

    def test_bert_base_supported(self, toy_pairs):
        tr, ytr, va, yva, _, _ = toy_pairs
        model, _ = train_finetuned(tr, ytr, va, yva, base="bert", max_epochs=2)
        assert model.W.shape[0] == 512  # bert's bucket count

    def test_pair_distances_shape(self, toy_pairs):
        tr, ytr, va, yva, te, _ = toy_pairs
        model, _ = train_finetuned(tr, ytr, va, yva, max_epochs=2)
        d = model.pair_distances(te[:7])
        assert d.shape == (7,)
        assert np.all(np.isfinite(d))


class TestOnBenchmark:
    def test_dust_beats_pretrained(self, tiny_pairs, tiny_model):
        from repro.embed.models import make_model

        te, yte = tiny_pairs.test.pairs, tiny_pairs.test.labels
        acc_dust = pair_accuracy(tiny_model.predict_unionable(te), yte)
        m = make_model("roberta")
        a = m.embed_texts([p[0] for p in te])
        b = m.embed_texts([p[1] for p in te])
        cos = (a * b).sum(1) / np.maximum(
            np.linalg.norm(a, axis=1) * np.linalg.norm(b, axis=1), 1e-12
        )
        acc_raw = pair_accuracy(((1 - cos) < 0.7).astype(int), yte)
        assert acc_dust > acc_raw + 0.2

    def test_positive_pairs_closer_than_negative(self, tiny_pairs, tiny_model):
        te, yte = tiny_pairs.test.pairs, tiny_pairs.test.labels
        d = tiny_model.pair_distances(te)
        assert d[yte == 1].mean() < d[yte == 0].mean()
